package repro.apps

import repro.ml.Embeddings

/** Story tree formation (Sec. 4, Eq. 8–11): retrieve correlated events,
  * score pairwise similarity (phrase vectors + trigger vectors + entity
  * TF-IDF), cluster hierarchically, and lay the clusters out as time-ordered
  * branches of a tree.
  */
object StoryTree {

  /** An event as the story-tree machinery sees it. */
  final case class EventInfo(id: Long, phrase: Seq[String], entities: Seq[String],
                             trigger: Seq[String], time: Int)

  /** A formed story tree: branches are time-ordered chains of similar events. */
  final case class Tree(root: EventInfo, branches: Seq[Seq[EventInfo]])

  /** Retrieve events correlated with the seed: sharing ≥ 1 entity (the
    * criteria are flexible per the paper; this is its first suggestion).
    */
  def retrieveRelated(seed: EventInfo, all: Seq[EventInfo]): Seq[EventInfo] =
    all.filter(e => e.id != seed.id && e.entities.toSet.intersect(seed.entities.toSet).nonEmpty)

  /** Mean token vector of a phrase, as a sparse map. */
  private def phraseVec(tokens: Seq[String],
                        vecs: Map[String, Map[String, Double]]): Map[String, Double] = {
    val vs = tokens.flatMap(vecs.get)
    if (vs.isEmpty) Map.empty
    else {
      val sum = vs.flatten.groupBy(_._1).view.mapValues(_.map(_._2).sum / vs.size).toMap
      val n = math.sqrt(sum.values.map(v => v * v).sum)
      if (n == 0) sum else sum.view.mapValues(_ / n).toMap
    }
  }

  /** TF-IDF similarity between two entity sets (Eq. 11); with no corpus-wide
    * DF available for bare entity names, IDF is uniform (pure overlap cosine).
    */
  def entitySim(a: Seq[String], b: Seq[String]): Double = {
    if (a.isEmpty || b.isEmpty) return 0.0
    val inter = a.toSet.intersect(b.toSet).size
    inter / math.sqrt(a.toSet.size.toDouble * b.toSet.size)
  }

  /** Eq. 8: s = f_m (phrase cosine) + f_g (trigger cosine) + f_e (entity sim). */
  def similarity(e1: EventInfo, e2: EventInfo,
                 vecs: Map[String, Map[String, Double]]): Double = {
    val fm = Embeddings.cosine(phraseVec(e1.phrase, vecs), phraseVec(e2.phrase, vecs))
    val fg = if (e1.trigger == e2.trigger) 1.0
             else Embeddings.cosine(phraseVec(e1.trigger, vecs), phraseVec(e2.trigger, vecs))
    val fe = entitySim(e1.entities, e2.entities)
    fm + fg + fe
  }

  /** Average-linkage agglomerative clustering; merge while best pair ≥
    * `threshold`.
    */
  def hierarchicalCluster(events: Seq[EventInfo],
                          sim: (EventInfo, EventInfo) => Double,
                          threshold: Double): Seq[Seq[EventInfo]] = {
    var clusters = events.map(Seq(_)).toVector
    def avgSim(a: Seq[EventInfo], b: Seq[EventInfo]): Double =
      (for (x <- a; y <- b) yield sim(x, y)).sum / (a.size * b.size)
    var done = false
    while (!done && clusters.size > 1) {
      val pairs = for (i <- clusters.indices; j <- clusters.indices if i < j)
        yield (i, j, avgSim(clusters(i), clusters(j)))
      val (i, j, s) = pairs.maxBy(_._3)
      if (s >= threshold) {
        clusters = clusters.updated(i, clusters(i) ++ clusters(j)).patch(j, Nil, 1)
      } else done = true
    }
    clusters
  }

  /** Form the story tree for a seed event (Sec. 4's four steps). */
  def form(seed: EventInfo, all: Seq[EventInfo],
           vecs: Map[String, Map[String, Double]],
           threshold: Double = 1.2): Tree = {
    val related = seed +: retrieveRelated(seed, all)
    val clusters = hierarchicalCluster(related, similarity(_, _, vecs), threshold)
    val branches = clusters.map(_.sortBy(_.time)).sortBy(_.head.time)
    val root = related.minBy(_.time)
    Tree(root, branches)
  }
}
