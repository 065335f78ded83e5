package repro.eval

import repro.SparkSpec
import repro.data.{ClickLogGen, OntoGen}

class DatasetsSpec extends SparkSpec {

  private lazy val onto = OntoGen.generate(OntoGen.Params(nDerivedConcepts = 40, nEvents = 25, seed = 6))
  private lazy val log = ClickLogGen.generate(spark, onto, ClickLogGen.Params(seed = 7))
  private lazy val corpus = Datasets.build(spark, onto, log)

  test("one CMD example per derived concept") {
    assert(corpus.cmd.size == onto.derivedConcepts.size)
    assert(corpus.cmd.map(_.attnId).distinct.size == corpus.cmd.size)
  }

  test("one EMD example per event") {
    assert(corpus.emd.size == onto.events.size)
  }

  test("gold phrases come from the generator") {
    for (ex <- corpus.cmd) assert(onto.conceptById(ex.attnId).tokens == ex.gold)
    for (ex <- corpus.emd) assert(onto.eventById(ex.attnId).tokens == ex.gold)
  }

  test("gold tokens all appear in the cluster texts (phrase is extractable)") {
    val bad = corpus.cmd.filterNot { ex =>
      val all = (ex.queries.map(_.tokens) ++ ex.titles.map(_.tokens)).flatten.toSet
      ex.gold.forall(all)
    }
    assert(bad.size <= corpus.cmd.size / 10, s"${bad.size} concept examples missing gold tokens")
  }

  test("split is deterministic and roughly 80/10/10") {
    val all = corpus.cmd ++ corpus.emd
    val bySplit = all.groupBy(_.split).view.mapValues(_.size).toMap
    assert(bySplit.keySet.subsetOf(Set("train", "dev", "test")))
    assert(bySplit("train").toDouble / all.size > 0.6)
    assert(bySplit.getOrElse("test", 0) > 0)
    for (ex <- all) assert(Datasets.splitOf(ex.attnId) == ex.split)
  }

  test("event examples carry gold elements") {
    for (ex <- corpus.emd) {
      assert(ex.goldEntity.nonEmpty && ex.goldTrigger.nonEmpty)
      assert(ex.gold.containsSlice(ex.goldEntity))
      assert(ex.gold.containsSlice(ex.goldTrigger))
      ex.goldLocation.foreach(l => assert(ex.gold.contains(l)))
    }
  }

  test("queries and titles are weight-ordered, top query overlaps gold for nearly all") {
    val all = corpus.cmd ++ corpus.emd
    for (ex <- all) {
      assert(ex.queries.nonEmpty && ex.titles.nonEmpty)
      assert(ex.queries.map(_.w).sliding(2).forall { case Seq(a, b) => a >= b; case _ => true })
    }
    val overlapping = all.count(ex =>
      ex.queries.head.tokens.toSet.intersect(ex.gold.toSet).nonEmpty)
    assert(overlapping.toDouble / all.size > 0.9,
      s"only $overlapping/${all.size} top queries overlap their gold phrase")
  }
}
