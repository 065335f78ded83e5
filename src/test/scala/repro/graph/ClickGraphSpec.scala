package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.{ClickLogGen, OntoGen}

class ClickGraphSpec extends SparkSpec {
  import spark.implicits._

  private lazy val clicks = Seq(
    (1L, 10L, 4L), (1L, 11L, 6L), (2L, 10L, 2L), (2L, 12L, 2L), (3L, 12L, 5L)
  ).toDF("query_id", "doc_id", "cnt")

  test("transport probabilities P(d|q) match DuckDB (Eq. 1)") {
    val (pDq, _) = ClickGraph.transportProbs(clicks)
    Oracle.assertEquivalent(
      pDq.select($"query_id", $"doc_id", round($"p", 6) as "p"),
      """SELECT CAST(query_id AS BIGINT) AS query_id, CAST(doc_id AS BIGINT) AS doc_id,
        |       ROUND(SUM(CAST(cnt AS BIGINT)) * 1.0
        |             / SUM(SUM(CAST(cnt AS BIGINT))) OVER (PARTITION BY query_id), 6) AS p
        |FROM clicks GROUP BY query_id, doc_id""".stripMargin,
      "clicks" -> clicks)
  }

  test("transport probabilities P(q|d) match DuckDB (Eq. 2)") {
    val (_, pQd) = ClickGraph.transportProbs(clicks)
    Oracle.assertEquivalent(
      pQd.select($"query_id", $"doc_id", round($"p", 6) as "p"),
      """SELECT CAST(query_id AS BIGINT) AS query_id, CAST(doc_id AS BIGINT) AS doc_id,
        |       ROUND(SUM(CAST(cnt AS BIGINT)) * 1.0
        |             / SUM(SUM(CAST(cnt AS BIGINT))) OVER (PARTITION BY doc_id), 6) AS p
        |FROM clicks GROUP BY query_id, doc_id""".stripMargin,
      "clicks" -> clicks)
  }

  test("P(d|q) sums to 1 per query") {
    val (pDq, _) = ClickGraph.transportProbs(clicks)
    val sums = pDq.groupBy("query_id").agg(sum("p") as "s").collect()
    sums.foreach(r => assert(math.abs(r.getDouble(1) - 1.0) < 1e-9))
  }

  test("random walk from a seed stays in its connected component") {
    val seeds = Seq(Tuple1(1L)).toDF("query_id")
    val (qv, dv) = ClickGraph.randomWalk(clicks, seeds)
    val qs = qv.select("query_id").as[Long].collect().toSet
    val ds = dv.select("doc_id").as[Long].collect().toSet
    // query 3 shares doc 12 with query 2, which shares doc 10 with query 1
    assert(qs.contains(1L) && qs.contains(2L))
    assert(ds.contains(10L) && ds.contains(11L))
  }

  test("random walk visit mass decreases with distance") {
    val seeds = Seq(Tuple1(1L)).toDF("query_id")
    val (qv, _) = ClickGraph.randomWalk(clicks, seeds)
    val m = qv.collect().map(r => r.getLong(1) -> r.getDouble(2)).toMap
    assert(m(1L) > m(2L))
  }

  test("mostlyContent filter") {
    assert(ClickGraph.mostlyContent(Seq("famous", "runner")))
    assert(ClickGraph.mostlyContent(Seq("the", "famous", "runner")))
    assert(!ClickGraph.mostlyContent(Seq("what", "are", "the", "runner")))
    assert(!ClickGraph.mostlyContent(Seq.empty))
  }

  test("clusters group each attention's queries and docs together") {
    val onto = OntoGen.generate(OntoGen.Params(nDerivedConcepts = 25, nEvents = 15, seed = 4))
    val log = ClickLogGen.generate(spark, onto, ClickLogGen.Params(seed = 5))
    val rows = ClickGraph.clusters(spark, log.queries, log.docs, log.clicks).collect()
    assert(rows.nonEmpty)
    val dAttn = log.docRows.map(d => d.doc_id -> d.gold_attn).toMap
    // purity: most docs in a cluster belong to the seed's attention
    val purities = rows.map { c =>
      if (c.docIds.isEmpty) 1.0
      else c.docIds.count(d => dAttn(d) == c.gold_attn).toDouble / c.docIds.size
    }
    assert(purities.sum / purities.length > 0.8,
      f"mean cluster purity ${purities.sum / purities.length}%.3f too low")
    // every cluster has at least one query and doc, sorted by weight
    rows.foreach { c =>
      assert(c.queries.nonEmpty && c.titles.nonEmpty)
      assert(c.queries.map(_.w).sliding(2).forall { case Seq(a, b) => a >= b; case _ => true })
    }
  }

  test("cluster count equals number of content-bearing attention seed queries") {
    val onto = OntoGen.generate(OntoGen.Params(nDerivedConcepts = 25, nEvents = 15, seed = 4))
    val log = ClickLogGen.generate(spark, onto, ClickLogGen.Params(seed = 5))
    val rows = ClickGraph.clusters(spark, log.queries, log.docs, log.clicks).collect()
    // every attention query seeds a cluster (Algorithm 1 walks from each q);
    // the content filter applies to cluster *members*, not seeds
    val seeds = log.queryRows.count(_.kind == "attention")
    assert(rows.length <= seeds)
    assert(rows.length > seeds / 2)
  }
}
