package repro.apps

import repro.core.Normalize
import repro.nlp.Lang

/** Document tagging (Sec. 4, Eq. 12–14): tag a document with concepts it
  * does not necessarily contain, via its key entities and their parent
  * concepts; tag events/topics by longest-common-subsequence plus a semantic
  * match (the paper's Duet matcher is replaced by token-vector cosine — see
  * DESIGN.md substitutions).
  */
object DocTagging {

  /** Key entities of a document: dictionary entities mentioned in the body,
    * with mention counts (P(e|d) in Eq. 12 is the normalized count).
    */
  def keyEntities(body: Seq[String], dictionary: Seq[(Long, Seq[String])]): Seq[(Long, Double)] = {
    val counts = dictionary.flatMap { case (id, name) =>
      val c = body.indices.count(i => body.startsWith(name, i))
      if (c > 0) Some(id -> c.toDouble) else None
    }
    val total = counts.map(_._2).sum
    if (total == 0) Seq.empty else counts.map { case (id, c) => (id, c / total) }
  }

  /** Matching-based concept tagging: candidates are parent concepts of the
    * key entities; coherence = TF-IDF similarity between the doc title and
    * the concept's context-enriched representation (its top clicked titles).
    */
  def tagConcepts(title: Seq[String], body: Seq[String],
                  dictionary: Seq[(Long, Seq[String])],
                  parentConcepts: Map[Long, Seq[Long]],
                  conceptRep: Map[Long, Seq[String]],
                  df: Map[String, Int], nDocs: Int,
                  minScore: Double = 0.05): Seq[(Long, Double)] = {
    val ents = keyEntities(body, dictionary)
    val cands = ents.flatMap { case (eid, pe) =>
      parentConcepts.getOrElse(eid, Seq.empty).map(c => (c, pe))
    }
    cands.groupBy(_._1).toSeq.map { case (cid, grp) =>
      val coherence = Normalize.tfidfCosine(title, conceptRep.getOrElse(cid, Seq.empty), df, nDocs)
      (cid, coherence * (1.0 + grp.map(_._2).sum))
    }.filter(_._2 >= minScore).sortBy(-_._2)
  }

  /** Probabilistic inference fallback (Eq. 12–14) when the ontology has no
    * parent concept for the key entities: infer concepts from the context
    * words around each entity.
    *
    * @param concepts (conceptId, phrase)
    * @param window   context window standing in for "same sentence"
    */
  def inferConcepts(body: Seq[String], dictionary: Seq[(Long, Seq[String])],
                    concepts: Seq[(Long, Seq[String])],
                    window: Int = 5): Seq[(Long, Double)] = {
    val ents = keyEntities(body, dictionary)
    val nameOf = dictionary.toMap
    // P(c|x): uniform over concepts containing context token x (Eq. 14)
    val conceptsOf: Map[String, Seq[Long]] =
      concepts.flatMap { case (id, p) => p.map(_ -> id) }
        .groupBy(_._1).view.mapValues(_.map(_._2)).toMap
    val scores = collection.mutable.Map[Long, Double]().withDefaultValue(0.0)
    for ((eid, pe) <- ents) {
      val name = nameOf(eid)
      val positions = body.indices.filter(i => body.startsWith(name, i))
      val ctx = positions.flatMap { i =>
        body.slice(math.max(0, i - window), math.min(body.size, i + name.size + window))
      }.filterNot(t => Lang.isStop(t) || Lang.isPunct(t) || name.contains(t))
      if (ctx.nonEmpty) {
        val pxe = ctx.groupBy(identity).view.mapValues(_.size.toDouble / ctx.size) // P(x|e)
        for ((x, px) <- pxe; cs = conceptsOf.getOrElse(x, Seq.empty); c <- cs)
          scores(c) += (1.0 / cs.size) * px * pe // Eq. 13–14 plugged into Eq. 12
      }
    }
    scores.toSeq.filter(_._2 > 0).sortBy { case (id, s) => (-s, id) }
  }

  /** Token-level longest common subsequence length. */
  def lcsLen(a: Seq[String], b: Seq[String]): Int = {
    val dp = Array.fill(a.size + 1, b.size + 1)(0)
    for (i <- 1 to a.size; j <- 1 to b.size)
      dp(i)(j) = if (a(i - 1) == b(j - 1)) dp(i - 1)(j - 1) + 1
                 else math.max(dp(i - 1)(j), dp(i)(j - 1))
    dp(a.size)(b.size)
  }

  /** Cosine similarity of token-count vectors — the semantic matcher
    * substituting the Duet network.
    */
  def semanticSim(a: Seq[String], b: Seq[String]): Double = {
    val ca = a.groupBy(identity).view.mapValues(_.size.toDouble).toMap
    val cb = b.groupBy(identity).view.mapValues(_.size.toDouble).toMap
    val dot = ca.map { case (t, v) => v * cb.getOrElse(t, 0.0) }.sum
    val na = math.sqrt(ca.values.map(v => v * v).sum)
    val nb = math.sqrt(cb.values.map(v => v * v).sum)
    if (na == 0 || nb == 0) 0.0 else dot / (na * nb)
  }

  /** Tag events/topics: LCS over (title + first body clause) above a
    * fraction of the phrase length AND positive semantic match (Sec. 4).
    */
  def tagEvents(title: Seq[String], body: Seq[String],
                eventPhrases: Seq[(Long, Seq[String])],
                lcsFrac: Double = 0.6, simThreshold: Double = 0.25): Seq[(Long, Double)] = {
    val firstClause = body.takeWhile(t => !Lang.isPunct(t))
    val target = title ++ firstClause
    eventPhrases.flatMap { case (id, phrase) =>
      val lcs = lcsLen(phrase, target).toDouble / math.max(1, phrase.size)
      val sim = semanticSim(phrase, target)
      if (lcs >= lcsFrac && sim >= simThreshold) Some((id, lcs + sim)) else None
    }.sortBy(-_._2)
  }
}
