package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.{Embeddings, LogReg}
import repro.nlp.Lang

/** Attention linking (Sec. 3.2): construct the isA / involve / correlate
  * edges of the Attention Ontology. Each strategy mirrors the paper's
  * action-driven construction; relational steps are DataFrame aggregations.
  */
object Linking {

  /** Edge kinds. */
  val IsA = "isA"; val Involve = "involve"; val Correlate = "correlate"

  final case class Edge(src: Long, dst: Long, kind: String, how: String)

  // ------------------------------------------------------------------
  // Attention ↔ category (isA via click co-occurrence, P(g|p) > δ_g)
  // ------------------------------------------------------------------

  /** P(g|p) per (attention node, category) from the clicked docs' categories.
    *
    * @param nodeDocs DataFrame (node_id: Long, doc_id: Long)
    * @param docs     DataFrame with (doc_id, category)
    * @return DataFrame (node_id, category, p)
    */
  def categoryAffinity(nodeDocs: DataFrame, docs: DataFrame): DataFrame = {
    val joined = nodeDocs.join(docs.select("doc_id", "category"), "doc_id")
    val totals = joined.groupBy("node_id").agg(count(lit(1)) as "n_total")
    joined.groupBy("node_id", "category").agg(count(lit(1)) as "n_cat")
      .join(totals, "node_id")
      .select(col("node_id"), col("category"), (col("n_cat") / col("n_total")) as "p")
  }

  def categoryEdges(nodeDocs: DataFrame, docs: DataFrame, deltaG: Double = 0.3,
                    categoryId: String => Long): Seq[Edge] = {
    import org.apache.spark.sql.Row
    categoryAffinity(nodeDocs, docs).where(col("p") > deltaG)
      .collect().toSeq.map { case Row(nodeId: Long, cat: String, _) =>
        Edge(nodeId, categoryId(cat), IsA, "attention-category")
      }
  }

  // ------------------------------------------------------------------
  // Attention ↔ attention
  // ------------------------------------------------------------------

  /** Concept isA concept when one phrase is a proper suffix of the other. */
  def suffixIsA(concepts: Seq[(Long, Seq[String])]): Seq[Edge] = {
    val byPhrase = concepts.groupBy(_._2)
    concepts.flatMap { case (id, phrase) =>
      (1 until phrase.size).flatMap { i =>
        byPhrase.getOrElse(phrase.drop(i), Seq.empty)
          .map { case (pid, _) => Edge(id, pid, IsA, "concept-suffix") }
      }
    }.distinct
  }

  /** Event isA topic: same pattern with the entity slot abstracted —
    * exactly the grouping CPD produced.
    */
  def eventTopicIsA(topics: Seq[(Long, Derivation.DerivedTopic)]): Seq[Edge] =
    topics.flatMap { case (tid, t) =>
      t.eventNodeIds.map(eid => Edge(eid, tid, IsA, "event-topic"))
    }

  /** Concept involve topic: the concept phrase is contained in the topic
    * phrase (ordered containment).
    */
  def conceptTopicInvolve(concepts: Seq[(Long, Seq[String])],
                          topics: Seq[(Long, Seq[String])]): Seq[Edge] =
    for {
      (tid, tp) <- topics
      (cid, cp) <- concepts
      if cp.nonEmpty && tp.containsSlice(cp) && cp != tp
    } yield Edge(tid, cid, Involve, "topic-concept")

  // ------------------------------------------------------------------
  // Concept ↔ entity (isA via auto-labeled classifier, Fig. 4)
  // ------------------------------------------------------------------

  /** Feature vector for a (concept, entity) candidate pair.
    *
    * @param coClickDocs   #concept-clicked docs mentioning the entity
    * @param totalDocs     #concept-clicked docs
    * @param headNearCount #docs where the entity occurs within `window` of a
    *                      concept head token
    * @param sessionCount  #user sessions issuing concept then entity query
    */
  def pairFeatures(coClickDocs: Int, totalDocs: Int, headNearCount: Int,
                   sessionCount: Int): Array[Double] = Array(
    coClickDocs.toDouble / math.max(1, totalDocs),
    math.log1p(coClickDocs.toDouble),
    headNearCount.toDouble / math.max(1, totalDocs),
    math.log1p(sessionCount.toDouble))

  val PairFeatureDim = 4

  /** Does `entity` appear within `window` tokens of any of `heads` in `body`? */
  def headNear(body: Seq[String], entity: Seq[String], heads: Seq[String], window: Int = 4): Boolean = {
    val entIdx = body.indices.filter(i => body.startsWith(entity, i))
    val headIdx = body.indices.filter(i => heads.contains(body(i)))
    entIdx.exists(e => headIdx.exists(h => math.abs(h - e) <= window))
  }

  /** Train the concept–entity classifier from auto-constructed examples
    * (Fig. 4) and score candidate pairs.
    *
    * @param trainPairs (features, label)
    * @param candidates (conceptNodeId, entityId, features)
    */
  def conceptEntityIsA(trainPairs: Seq[(Array[Double], Boolean)],
                       candidates: Seq[(Long, Long, Array[Double])],
                       threshold: Double = 0.5): (LogReg, Seq[Edge]) = {
    val model = LogReg.train(trainPairs, PairFeatureDim)
    val edges = candidates.collect {
      case (cid, eid, f) if model.predict(f, threshold) =>
        Edge(eid, cid, IsA, "entity-concept")
    }
    (model, edges)
  }

  // ------------------------------------------------------------------
  // Event/topic ↔ entities, triggers, locations (involve via GCTSP-Net)
  // ------------------------------------------------------------------

  /** Involve edges from 4-class element recognition output.
    *
    * @param eventNodeId the event node
    * @param elements    token → predicted class (GCTSPNet.classifyElements)
    * @param entityIdOf  entity token-seq → entity node id (KB dictionary)
    * @param nodeIdOf    fresh node id allocator for trigger/location nodes
    */
  def eventInvolve(eventNodeId: Long, phrase: Seq[String], elements: Map[String, Int],
                   entityIdOf: Seq[String] => Option[Long],
                   nodeIdOf: (String, String) => Long): Seq[Edge] = {
    val entTokens = phrase.filter(t => elements.get(t).contains(GCTSPNet.ClsEntity))
    val trigTokens = phrase.filter(t => elements.get(t).contains(GCTSPNet.ClsTrigger))
    val locTokens = phrase.filter(t => elements.get(t).contains(GCTSPNet.ClsLocation))
    val entEdge = entityIdOf(entTokens).map(eid => Edge(eventNodeId, eid, Involve, "event-entity"))
    val trigEdge = if (trigTokens.nonEmpty)
      Some(Edge(eventNodeId, nodeIdOf("trigger", trigTokens.mkString(" ")), Involve, "event-trigger"))
    else None
    val locEdges = locTokens.map(l => Edge(eventNodeId, nodeIdOf("location", l), Involve, "event-location"))
    entEdge.toSeq ++ trigEdge.toSeq ++ locEdges
  }

  // ------------------------------------------------------------------
  // Entity ↔ entity (correlate via hinge-loss embeddings)
  // ------------------------------------------------------------------

  /** Entity co-occurrence counts in doc bodies, as a DataFrame aggregation.
    *
    * @param docEntities DataFrame (doc_id, entity_id) of mentions
    * @return DataFrame (a, b, n) with a < b
    */
  def entityCooccurrence(docEntities: DataFrame): DataFrame = {
    val l = docEntities.toDF("doc_id", "a")
    val r = docEntities.toDF("doc_id", "b")
    l.join(r, "doc_id").where(col("a") < col("b"))
      .groupBy("a", "b").agg(count(lit(1)) as "n")
  }

  /** Train embeddings on frequent co-occurring pairs and emit correlate
    * edges for candidates whose learned distance is below `maxDist`.
    */
  def correlateEdges(entityIds: Seq[Long], coPairs: Seq[(Long, Long, Long)],
                     minCount: Long = 2, maxDist: Double = 1.5,
                     dim: Int = 16, seed: Long = 17): (Embeddings.Model, Seq[Edge]) = {
    val positives = coPairs.collect { case (a, b, n) if n >= minCount => (a, b) }
    val model = Embeddings.train(entityIds, positives, dim = dim, seed = seed)
    val edges = positives.collect {
      case (a, b) if model.distance(a, b) <= maxDist =>
        Seq(Edge(a, b, Correlate, "entity-entity"), Edge(b, a, Correlate, "entity-entity"))
    }.flatten
    (model, edges)
  }
}
