package repro.core

import repro.SparkSpec
import repro.data.{ClickLogGen, OntoGen}
import repro.eval.Tables

/** End-to-end pipeline integration: generate → walk → mine → normalize →
  * derive → link → evaluate, at test scale. Exercises everything behind
  * Tables 1–4.
  */
class PipelineSpec extends SparkSpec {

  private lazy val scale = Tables.Scale(nConcepts = 70, nEvents = 45, epochs = 40, seed = 21)
  private lazy val (res, report) = Tables.tables1and2(spark, scale)

  test("ontology contains all five node kinds") {
    val kinds = res.built.countByKind
    for (k <- Seq("category", "concept", "event", "topic", "entity"))
      assert(kinds.getOrElse(k, 0L) > 0, s"missing $k nodes: $kinds")
  }

  test("node count ordering matches the paper: entity > concept > event > topic > category") {
    val k = res.built.countByKind
    assert(k("entity") > k("concept"), k.toString)
    assert(k("concept") > k("event") || k("concept") > k("topic"), k.toString)
    assert(k("event") > k("topic"), k.toString)
    assert(k("topic") >= 1 && k("category") == 12, k.toString)
  }

  test("all three edge kinds are produced") {
    val e = res.built.edgeCountByKind
    for (k <- Seq("isA", "involve", "correlate"))
      assert(e.getOrElse(k, 0L) > 0, s"missing $k edges: $e")
  }

  test("mined concept nodes mostly recover gold phrases") {
    assert(report.conceptPhraseAccuracy > 0.6,
      f"concept phrase accuracy ${report.conceptPhraseAccuracy}%.3f")
  }

  test("mined event nodes mostly recover gold phrases") {
    assert(report.eventPhraseAccuracy > 0.4,
      f"event phrase accuracy ${report.eventPhraseAccuracy}%.3f")
  }

  test("edge accuracies are high (paper: 95%+/95%+/99%+)") {
    for (s <- report.edgeStats) {
      info(f"${s.kind}: n=${s.count} acc=${s.accuracy}%.3f")
      assert(s.accuracy > 0.7, f"${s.kind} accuracy ${s.accuracy}%.3f too low")
    }
  }

  test("normalization merges duplicate clusters: fewer nodes than clusters") {
    assert(res.built.conceptNodes.size <= res.corpus.cmd.size)
    assert(res.built.eventNodes.size <= res.corpus.emd.size)
  }

  test("every concept node carries provenance (seeds, docs, gold attns)") {
    for (n <- res.built.conceptNodes) {
      assert(n.seeds.nonEmpty && n.goldAttns.nonEmpty)
    }
  }

  test("showcase tables are non-empty (Tables 3 and 4)") {
    val t3 = Tables.table3(res)
    val t4 = Tables.table4(res)
    assert(t3.nonEmpty, "no concept showcases")
    assert(t4.nonEmpty, "no event/topic showcases")
    for (c <- t3) assert(c.instances.nonEmpty)
  }

  test("edges reference existing nodes") {
    val ids = res.built.nodes.map(_.id).toSet
    for (e <- res.built.edges) {
      assert(ids.contains(e.src), s"dangling src in $e")
      assert(ids.contains(e.dst), s"dangling dst in $e")
    }
  }

  test("node ids are unique across kinds") {
    val ids = res.built.nodes.map(_.id)
    assert(ids.distinct.size == ids.size)
  }
}
