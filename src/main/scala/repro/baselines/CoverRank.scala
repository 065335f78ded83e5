package repro.baselines

import repro.nlp.Lang

/** CoverRank (Sec. 3.1, event candidate construction; baseline in Table 6):
  * split document titles into subtitles at punctuation, keep those within a
  * length band, score each by the number of unique non-stop query tokens it
  * covers, tie-break by click weight, and return the top subtitle.
  */
object CoverRank {

  /** Split a title into punctuation-delimited subtitles. */
  def subtitles(title: Seq[String]): Seq[Seq[String]] = {
    val out = Seq.newBuilder[Seq[String]]
    var cur = Vector.empty[String]
    for (t <- title) {
      if (Lang.isPunct(t)) { if (cur.nonEmpty) out += cur; cur = Vector.empty }
      else cur = cur :+ t
    }
    if (cur.nonEmpty) out += cur
    out.result()
  }

  /** Rank all subtitles of a cluster.
    *
    * @param queries weighted query token sequences (weight = click mass)
    * @param titles  weighted title token sequences
    * @param lenLo   minimum subtitle token count (paper: 6 chars, ours: 3 tokens)
    * @param lenHi   maximum subtitle token count (paper: 20 chars, ours: 10 tokens)
    */
  def rank(queries: Seq[(Seq[String], Double)], titles: Seq[(Seq[String], Double)],
           lenLo: Int = 3, lenHi: Int = 10): Seq[(Seq[String], Int, Double)] = {
    val qTokens = queries.flatMap(_._1).filterNot(Lang.isStop).toSet
    val cands = for {
      (title, w) <- titles
      sub <- subtitles(title)
      if sub.size >= lenLo && sub.size <= lenHi
    } yield {
      val cover = sub.filterNot(Lang.isStop).distinct.count(qTokens)
      (sub, cover, w)
    }
    cands.sortBy { case (s, cover, w) => (-cover, -w, s.mkString(" ")) }
  }

  /** Top-ranked subtitle = the candidate event phrase. */
  def extract(queries: Seq[(Seq[String], Double)], titles: Seq[(Seq[String], Double)],
              lenLo: Int = 3, lenHi: Int = 10): Seq[String] =
    rank(queries, titles, lenLo, lenHi).headOption.map(_._1).getOrElse(Seq.empty)

  /** Top-k queries + subtitles (feed for the TextRank event baseline). */
  def topTexts(queries: Seq[(Seq[String], Double)], titles: Seq[(Seq[String], Double)],
               k: Int = 2): Seq[Seq[String]] = {
    val topQ = queries.sortBy(-_._2).take(k).map(_._1)
    val topS = rank(queries, titles).take(k).map(_._1)
    topQ ++ topS
  }
}
