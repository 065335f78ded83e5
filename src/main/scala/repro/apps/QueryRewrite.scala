package repro.apps

/** Query understanding (Sec. 4): conceptualization and recommendation.
  *
  * If a query conveys a concept, rewrite it by appending each entity that
  * isA that concept ("q e_i"); if it conveys an entity, recommend the
  * entities correlated with it.
  */
object QueryRewrite {

  /** Ontology view the rewriter needs. */
  final case class Index(conceptPhrases: Seq[(Long, Seq[String])],
                         entityNames: Seq[(Long, Seq[String])],
                         entitiesOfConcept: Map[Long, Seq[Long]],
                         correlated: Map[Long, Seq[Long]]) {
    lazy val entityNameById: Map[Long, Seq[String]] = entityNames.toMap
  }

  /** The longest concept phrase contained in the query, if any. */
  def detectConcept(query: Seq[String], idx: Index): Option[(Long, Seq[String])] =
    idx.conceptPhrases.filter { case (_, p) => p.nonEmpty && query.containsSlice(p) }
      .sortBy { case (id, p) => (-p.size, id) }.headOption

  /** The entity whose name is contained in the query, longest name first. */
  def detectEntity(query: Seq[String], idx: Index): Option[(Long, Seq[String])] =
    idx.entityNames.filter { case (_, n) => n.nonEmpty && query.containsSlice(n) }
      .sortBy { case (id, n) => (-n.size, id) }.headOption

  /** Conceptualized rewrites: "q e_i" for each instance entity of the
    * detected concept.
    */
  def rewrite(query: Seq[String], idx: Index, maxRewrites: Int = 5): Seq[Seq[String]] =
    detectConcept(query, idx).toSeq.flatMap { case (cid, _) =>
      idx.entitiesOfConcept.getOrElse(cid, Seq.empty)
        .flatMap(idx.entityNameById.get)
        .take(maxRewrites)
        .map(name => query ++ name)
    }

  /** Entity recommendation: correlated entities of the detected entity. */
  def recommend(query: Seq[String], idx: Index, maxRecs: Int = 5): Seq[Seq[String]] =
    detectEntity(query, idx).toSeq.flatMap { case (eid, _) =>
      idx.correlated.getOrElse(eid, Seq.empty)
        .flatMap(idx.entityNameById.get)
        .take(maxRecs)
    }
}
