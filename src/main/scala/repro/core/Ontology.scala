package repro.core

import org.apache.spark.sql.SparkSession
import repro.data.{ClickLogGen, OntoGen}
import repro.eval.Datasets
import repro.eval.Datasets.MiningExample
import repro.graph.QTIG
import repro.ml.{RGCN, RGCNTrainer}
import repro.nlp.Lang

/** Attention Ontology assembly: the full GIANT pipeline (Sec. 3) from click
  * log to linked ontology, plus gold-referenced evaluation of node and edge
  * quality (Tables 1–4).
  *
  * Entities are treated as a dictionary input (the paper sources them from
  * existing knowledge bases rather than mining them); their node ids are the
  * generator's entity ids.
  */
object Ontology {

  final case class Node(id: Long, kind: String, phrase: Seq[String])

  /** Node id ranges per kind (gold entity ids live at 2e8). */
  val CategoryBase = 0L
  val ConceptNodeBase = 1000000L
  val EventNodeBase = 2000000L
  val SuffixNodeBase = 3000000L
  val TopicNodeBase = 4000000L
  val AuxNodeBase = 5000000L // triggers & locations

  final case class Built(nodes: Seq[Node], edges: Seq[Linking.Edge],
                         conceptNodes: Seq[Normalize.AttentionNode],
                         eventNodes: Seq[Normalize.AttentionNode],
                         topics: Seq[(Long, Derivation.DerivedTopic)],
                         categoryIdOf: Map[String, Long]) {
    def countByKind: Map[String, Long] =
      nodes.groupBy(_.kind).view.mapValues(_.size.toLong).toMap
    def edgeCountByKind: Map[String, Long] =
      edges.groupBy(_.kind).view.mapValues(_.size.toLong).toMap
  }
}

/** End-to-end pipeline driver. */
object GiantPipeline {

  import Ontology._

  final case class TrainedModels(conceptMiner: RGCN.Params, eventMiner: RGCN.Params,
                                 elementClassifier: RGCN.Params)

  final case class Result(onto: OntoGen.GoldOntology, log: ClickLogGen.ClickLog,
                          corpus: Datasets.Corpus, models: TrainedModels,
                          built: Built)

  /** QTIG of one example's cluster. */
  def qtigOf(ex: MiningExample): QTIG.Graph =
    QTIG.build(ex.queries.map(_.tokens), ex.titles.map(_.tokens))

  /** Train the three GCTSP-Net heads on the train splits (Spark-distributed). */
  def trainModels(spark: SparkSession, corpus: Datasets.Corpus,
                  epochs: Int, seed: Long = 13): TrainedModels = {
    val sc = spark.sparkContext
    def binaryGraphs(xs: Seq[MiningExample]): Seq[RGCN.EncodedGraph] =
      xs.map { ex => GCTSPNet.encode(qtigOf(ex), GCTSPNet.binaryLabels(ex.gold)) }
    def elementGraphs(xs: Seq[MiningExample]): Seq[RGCN.EncodedGraph] =
      xs.map { ex =>
        GCTSPNet.encode(qtigOf(ex),
          GCTSPNet.elementLabels(ex.goldEntity, ex.goldTrigger, ex.goldLocation))
      }
    val tc = RGCNTrainer.TrainConfig(epochs = epochs, seed = seed)
    val cmdTrain = corpus.train(corpus.cmd)
    val emdTrain = corpus.train(corpus.emd)
    val conceptMiner = RGCNTrainer.train(spark,
      sc.parallelize(binaryGraphs(cmdTrain), 16), GCTSPNet.config(2), tc)
    val eventMiner = RGCNTrainer.train(spark,
      sc.parallelize(binaryGraphs(emdTrain), 16), GCTSPNet.config(2), tc)
    val elementClassifier = RGCNTrainer.train(spark,
      sc.parallelize(elementGraphs(emdTrain), 16), GCTSPNet.config(GCTSPNet.ElementClasses), tc)
    TrainedModels(conceptMiner, eventMiner, elementClassifier)
  }

  /** Mine phrases for every cluster with the trained models (Algorithm 1). */
  def minePhrases(spark: SparkSession, corpus: Datasets.Corpus,
                  models: TrainedModels): (Seq[Normalize.MinedPhrase], Seq[Normalize.MinedPhrase]) = {
    val sc = spark.sparkContext
    def mine(xs: Seq[MiningExample], params: RGCN.Params): Seq[Normalize.MinedPhrase] = {
      val bc = sc.broadcast(params.flat)
      val cfg = params.cfg
      val out = sc.parallelize(xs, 16).map { ex =>
        val g = qtigOf(ex)
        val p = new RGCN.Params(cfg, bc.value)
        val phrase = GCTSPNet.minePhrase(g, p)
        Normalize.MinedPhrase(ex.seed, phrase, ex.isEvent,
          ex.titles.map(_.tokens), ex.docIds, ex.attnId)
      }.collect().toSeq
      bc.destroy()
      out
    }
    (mine(corpus.cmd, models.conceptMiner), mine(corpus.emd, models.eventMiner))
  }

  /** Assemble and link the ontology from mined phrases. */
  def assemble(spark: SparkSession, onto: OntoGen.GoldOntology,
               log: ClickLogGen.ClickLog, corpus: Datasets.Corpus,
               models: TrainedModels,
               minedConcepts: Seq[Normalize.MinedPhrase],
               minedEvents: Seq[Normalize.MinedPhrase]): Built = {
    import spark.implicits._

    // --- nodes ---
    val conceptNodes = Normalize.normalize(minedConcepts, idBase = ConceptNodeBase)
    val eventNodes = Normalize.normalize(minedEvents, idBase = EventNodeBase)
    val categoryIdOf = Lang.Categories.map(_.name).zipWithIndex
      .map { case (n, i) => n -> (CategoryBase + i + 1) }.toMap
    val entityNodes = onto.entities.map(e => Node(e.id, "entity", e.name))

    // CSD parent concepts (DataFrame aggregation)
    val conceptDf = conceptNodes.map(n => (n.id, n.phrase)).toDF("id", "phrase")
    val existingPhrases = conceptNodes.map(_.phrase).toSet
    val suffixNodes = Derivation.commonSuffixes(spark, conceptDf)
      .collect().toSeq
      .map(r => r.getSeq[String](0))
      .filterNot(existingPhrases)
      .sortBy(_.mkString(" "))
      .zipWithIndex
      .map { case (s, i) => Node(SuffixNodeBase + i + 1, "concept", s) }

    // element recognition on event clusters (for CPD + involve edges)
    val exampleBySeed = (corpus.cmd ++ corpus.emd).map(x => x.seed -> x).toMap
    val elementsOf: Map[Long, Map[String, Int]] = eventNodes.map { n =>
      val ex = exampleBySeed(n.seeds.head)
      n.id -> GCTSPNet.classifyElements(qtigOf(ex), models.elementClassifier)
    }.toMap

    // --- concept-entity isA (Fig. 4 auto-labeled classifier) ---
    val docById = log.docRows.map(d => d.doc_id -> d).toMap
    val entityByName = onto.entities.map(e => e.name -> e).toMap
    val queryById = log.queryRows.map(q => q.query_id -> q).toMap

    def mentions(body: Seq[String], name: Seq[String]): Boolean =
      body.indices.exists(i => body.startsWith(name, i))

    // per concept node: docs, mentioned entities, head tokens
    val conceptDocs: Map[Long, Seq[ClickLogGen.DocRow]] =
      conceptNodes.map(n => n.id -> n.docIds.flatMap(docById.get)).toMap
    val headTokensOf: Map[Long, Seq[String]] = conceptNodes.map { n =>
      n.id -> n.phrase.filter(t => Lang.info(t).pos == "NOUN")
    }.toMap

    // session counts: concept seed query followed by an entity query
    val seedToConcept = conceptNodes.flatMap(n => n.seeds.map(_ -> n.id)).toMap
    val sessionPairs: Map[(Long, Long), Int] = {
      val byUser = log.sessions.collect().groupBy(_.getLong(0))
      byUser.values.flatMap { rows =>
        val sorted = rows.sortBy(_.getInt(1)).map(_.getLong(2))
        sorted.sliding(2).collect {
          case Array(q1, q2) =>
            for {
              cid <- seedToConcept.get(q1)
              q2row <- queryById.get(q2) if q2row.kind == "entity"
              ent <- entityByName.get(q2row.tokens)
            } yield (cid, ent.id)
        }.flatten
      }.groupBy(identity).view.mapValues(_.size).toMap
    }

    def features(cid: Long, ent: OntoGen.GoldEntity,
                 extraBody: Option[Seq[String]]): Array[Double] = {
      val docs = conceptDocs(cid)
      val bodies = docs.map(_.body) ++ extraBody.toSeq
      val co = bodies.count(mentions(_, ent.name))
      val near = bodies.count(b => Linking.headNear(b, ent.name, headTokensOf(cid)))
      Linking.pairFeatures(co, bodies.size, near, sessionPairs.getOrElse((cid, ent.id), 0))
    }

    val rng = new scala.util.Random(99)
    // positives: consecutive (concept, entity) sessions with a mentioning doc
    val positives = sessionPairs.keys.toSeq.sortBy(identity).flatMap { case (cid, eid) =>
      val ent = onto.entityById(eid)
      if (conceptDocs(cid).exists(d => mentions(d.body, ent.name)))
        Some((features(cid, ent, None), true))
      else None
    }
    // negatives: same-category non-member entity inserted at a random doc position
    val negatives = sessionPairs.keys.toSeq.sortBy(identity).flatMap { case (cid, _) =>
      val node = conceptNodes.find(_.id == cid).get
      val cat = exampleBySeed(node.seeds.head).category
      val cands = onto.entities.filter(e => e.category == cat &&
        !conceptDocs(cid).exists(d => mentions(d.body, e.name)))
      if (cands.isEmpty || conceptDocs(cid).isEmpty) None
      else {
        val neg = cands(rng.nextInt(cands.size))
        val body = conceptDocs(cid)(rng.nextInt(conceptDocs(cid).size)).body
        val at = rng.nextInt(body.size + 1)
        val inserted = body.take(at) ++ neg.name ++ body.drop(at)
        Some((features(cid, neg, Some(inserted)), false))
      }
    }

    // candidates: (concept, entity) pairs with at least one mentioning doc
    val candidates = for {
      n <- conceptNodes
      ent <- onto.entities
      if conceptDocs(n.id).exists(d => mentions(d.body, ent.name))
    } yield (n.id, ent.id, features(n.id, ent, None))

    val (_, ceEdges) =
      if (positives.nonEmpty && negatives.nonEmpty)
        Linking.conceptEntityIsA(positives ++ negatives, candidates)
      else (null, Seq.empty[Linking.Edge])

    // --- CPD topics (need entity → ancestor-concept phrases) ---
    val conceptPhraseById: Map[Long, Seq[String]] =
      (conceptNodes.map(n => n.id -> n.phrase) ++ suffixNodes.map(n => n.id -> n.phrase)).toMap
    val entityConcepts: Map[Seq[String], Seq[Seq[String]]] = {
      val direct = ceEdges.groupBy(_.src).map { case (eid, es) =>
        eid -> es.map(e => conceptPhraseById(e.dst))
      }
      // The entity dictionary (the paper's KB input) carries coarse
      // instance-of links to base (bare-head) concepts, as real KBs do;
      // the classifier above supplies the fine-grained derived memberships.
      onto.entities.map { e =>
        val kbBase = e.conceptIds.flatMap(onto.conceptById.get)
          .filter(_.parentId.isEmpty).map(_.tokens)
        val mined = direct.getOrElse(e.id, Seq.empty)
        val withAncestors = mined.flatMap { p =>
          p +: (1 until p.size).map(p.drop).filter(Derivation.isNounPhrase)
        }
        e.name -> (withAncestors ++ kbBase).distinct
      }.toMap
    }
    val derivedTopics = Derivation.commonPatterns(
      eventNodes.map(n => (n.id, n.phrase)), entityConcepts)
    val topics = derivedTopics.zipWithIndex.map { case (t, i) => (TopicNodeBase + i + 1, t) }
    val topicNodes = topics.map { case (id, t) => Node(id, "topic", t.phrase) }

    // --- edges ---
    val eventDocIds = eventNodes.map(n => n.id -> n.docIds).toMap
    val nodeDocsDf = (conceptNodes.map(n => n.id -> n.docIds) ++
      eventNodes.map(n => n.id -> n.docIds) ++
      topics.map { case (id, t) => id -> t.eventNodeIds.flatMap(eventDocIds.getOrElse(_, Seq.empty)) })
      .flatMap { case (id, ds) => ds.map(d => (id, d)) }
      .toDF("node_id", "doc_id")
    val catEdges = Linking.categoryEdges(nodeDocsDf, log.docs, 0.3, categoryIdOf)

    val allConceptPairs = conceptNodes.map(n => (n.id, n.phrase)) ++
      suffixNodes.map(n => (n.id, n.phrase))
    val sufEdges = Linking.suffixIsA(allConceptPairs)
    val etEdges = Linking.eventTopicIsA(topics)
    val tcEdges = Linking.conceptTopicInvolve(allConceptPairs,
      topics.map { case (id, t) => (id, t.phrase) })

    // involve edges from element recognition
    var auxId = AuxNodeBase
    val auxNodeOf = collection.mutable.Map[(String, String), Long]()
    def nodeIdOf(kind: String, label: String): Long =
      auxNodeOf.getOrElseUpdate((kind, label), { auxId += 1; auxId })
    val invEdges = eventNodes.flatMap { n =>
      Linking.eventInvolve(n.id, n.phrase, elementsOf(n.id),
        name => entityByName.get(name).map(_.id), nodeIdOf)
    }
    val auxNodes = auxNodeOf.toSeq.sortBy(_._2).map { case ((kind, label), id) =>
      Node(id, kind, label.split(" ").toSeq)
    }

    // correlate edges from doc-body entity co-occurrence (DataFrame agg)
    val docEntities = log.docRows.flatMap { d =>
      onto.entities.filter(e => mentions(d.body, e.name)).map(e => (d.doc_id, e.id))
    }.toDF("doc_id", "entity_id")
    val coPairs = Linking.entityCooccurrence(docEntities)
      .collect().toSeq.map(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
    val (_, corrEdges) = Linking.correlateEdges(onto.entities.map(_.id), coPairs)

    val categoryNodes = categoryIdOf.toSeq.sortBy(_._2).map { case (n, id) => Node(id, "category", Seq(n)) }
    val allNodes = categoryNodes ++
      conceptNodes.map(n => Node(n.id, "concept", n.phrase)) ++ suffixNodes ++
      eventNodes.map(n => Node(n.id, "event", n.phrase)) ++ topicNodes ++
      entityNodes ++ auxNodes
    val allEdges = (catEdges ++ sufEdges ++ etEdges ++ tcEdges ++ ceEdges ++ invEdges ++ corrEdges).distinct

    Built(allNodes, allEdges, conceptNodes, eventNodes, topics, categoryIdOf)
  }

  /** Run everything end to end. */
  def run(spark: SparkSession, ontoParams: OntoGen.Params,
          logParams: ClickLogGen.Params = ClickLogGen.Params(),
          epochs: Int = 60): Result = {
    val onto = OntoGen.generate(ontoParams)
    val log = ClickLogGen.generate(spark, onto, logParams)
    val corpus = Datasets.build(spark, onto, log)
    val models = trainModels(spark, corpus, epochs)
    val (mc, me) = minePhrases(spark, corpus, models)
    val built = assemble(spark, onto, log, corpus, models, mc, me)
    Result(onto, log, corpus, models, built)
  }
}
