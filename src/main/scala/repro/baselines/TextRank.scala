package repro.baselines

import repro.nlp.Lang

/** TextRank keyword extraction (Mihalcea & Tarau 2004) — concept/event
  * mining baseline. Builds an undirected co-occurrence graph (window 2) over
  * the cluster's content tokens, runs PageRank, takes the top-k keywords and
  * concatenates them in their order of first appearance (the protocol the
  * paper uses for this baseline, Sec. 5.2).
  */
object TextRank {

  def keywords(texts: Seq[Seq[String]], topK: Int = 5, damping: Double = 0.85,
               iters: Int = 30): Seq[String] = {
    val contents = texts.map(Lang.contentTokens)
    val vocab = contents.flatten.distinct.toVector
    if (vocab.isEmpty) return Seq.empty
    val idx = vocab.zipWithIndex.toMap
    val nbrs = Array.fill(vocab.size)(collection.mutable.Set[Int]())
    for (t <- contents; w <- t.sliding(2) if w.size == 2; a = idx(w(0)); b = idx(w(1)) if a != b) {
      nbrs(a) += b; nbrs(b) += a
    }
    var score = Array.fill(vocab.size)(1.0)
    for (_ <- 0 until iters) {
      val next = Array.fill(vocab.size)(1 - damping)
      for (i <- vocab.indices; j <- nbrs(i) if nbrs(j).nonEmpty)
        next(i) += damping * score(j) / nbrs(j).size
      score = next
    }
    vocab.indices.sortBy(-score(_)).take(topK).map(vocab)
  }

  /** Extract a phrase: top-k keywords ordered by first appearance. */
  def extract(texts: Seq[Seq[String]], topK: Int = 5): Seq[String] = {
    val kws = keywords(texts, topK).toSet
    val flat = texts.flatten
    flat.distinct.filter(kws)
  }
}
