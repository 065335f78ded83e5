package repro.nlp

/** Deterministic rule-based dependency parser over the synthetic language.
  *
  * Stands in for the syntactic parser GIANT uses when constructing the
  * Query-Title Interaction Graph (Algorithm 2, line 9). The QTIG only needs
  * typed (governor, dependent) arcs between non-adjacent-or-adjacent tokens;
  * these right-headed NP + simple-clause rules supply exactly that signal.
  */
object DepParser {

  /** A dependency arc: governor index, dependent index, relation label. */
  final case class Dep(gov: Int, dep: Int, label: String)

  /** Dependency relation labels produced by this parser. */
  val Labels: Vector[String] = Vector("amod", "compound", "nsubj", "dobj", "tmod", "lmod", "det")

  private def isNoun(pos: String): Boolean = pos == "NOUN" || pos == "PROPN"

  /** Parse one token sequence into dependency arcs.
    *
    * Rules (scanning left to right, punctuation splits clauses):
    *  - ADJ attaches to the nearest following noun (amod);
    *  - a noun directly followed by another noun compounds onto it (compound);
    *  - the last noun before a verb is its subject (nsubj);
    *  - the first plain noun after a verb is its object (dobj);
    *  - TIME tokens modify the nearest verb, else the last noun (tmod);
    *  - LOC tokens likewise (lmod);
    *  - stop words attach to the next content token (det).
    */
  def parse(tokens: Seq[String]): Seq[Dep] = {
    val pos = tokens.map(t => Lang.info(t).pos).toArray
    val ner = tokens.map(t => Lang.info(t).ner).toArray
    val n = tokens.length
    val deps = Seq.newBuilder[Dep]

    // clause boundaries at punctuation
    val clauseId = new Array[Int](n)
    var c = 0
    for (i <- 0 until n) { clauseId(i) = c; if (pos(i) == "PUNCT") c += 1 }
    def sameClause(i: Int, j: Int): Boolean = clauseId(i) == clauseId(j)

    def nextWhere(from: Int, p: Int => Boolean): Option[Int] =
      ((from + 1) until n).find(j => sameClause(from, j) && p(j))
    def prevWhere(from: Int, p: Int => Boolean): Option[Int] =
      ((from - 1) to 0 by -1).find(j => sameClause(from, j) && p(j))
    def nearestVerb(i: Int): Option[Int] = {
      val cands = (0 until n).filter(j => sameClause(i, j) && pos(j) == "VERB")
      if (cands.isEmpty) None else Some(cands.minBy(j => math.abs(j - i)))
    }

    for (i <- 0 until n) pos(i) match {
      case "ADJ" =>
        // attach to the head (last noun) of the following noun run
        nextWhere(i, j => isNoun(pos(j))).foreach { first =>
          var head = first
          while (head + 1 < n && sameClause(head, head + 1) && isNoun(pos(head + 1))) head += 1
          deps += Dep(head, i, "amod")
        }
      case "NOUN" | "PROPN" if ner(i) != "LOC" && ner(i) != "TIME" =>
        if (i + 1 < n && sameClause(i, i + 1) && isNoun(pos(i + 1))
            && ner(i + 1) != "LOC" && ner(i + 1) != "TIME")
          deps += Dep(i + 1, i, "compound")
        else {
          // head of its NP: subject if a verb follows, object if a verb precedes
          nextWhere(i, j => pos(j) == "VERB") match {
            case Some(v) => deps += Dep(v, i, "nsubj")
            case None =>
              prevWhere(i, j => pos(j) == "VERB")
                .foreach(v => deps += Dep(v, i, "dobj"))
          }
        }
      case "NUM" if ner(i) == "TIME" =>
        nearestVerb(i).orElse(prevWhere(i, j => isNoun(pos(j))))
          .foreach(g => deps += Dep(g, i, "tmod"))
      case "PROPN" if ner(i) == "LOC" =>
        nearestVerb(i).orElse(prevWhere(i, j => isNoun(pos(j))))
          .foreach(g => deps += Dep(g, i, "lmod"))
      case "STOP" =>
        nextWhere(i, j => pos(j) != "STOP" && pos(j) != "PUNCT")
          .foreach(j => deps += Dep(j, i, "det"))
      case _ => ()
    }
    deps.result().distinct
  }
}
