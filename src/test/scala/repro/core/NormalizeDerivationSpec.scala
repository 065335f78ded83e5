package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.SparkSpec
import repro.core.Normalize.MinedPhrase

class NormalizeSpec extends AnyFunSuite {

  private def mp(seed: Long, tokens: Seq[String], titles: Seq[Seq[String]] = Seq.empty,
                 isEvent: Boolean = false) =
    MinedPhrase(seed, tokens, isEvent, titles, Seq(seed * 10), seed * 100)

  test("identical phrases with shared context merge into one node") {
    val t = Seq(Seq("review", "famous", "runner"))
    val nodes = Normalize.normalize(Seq(mp(1, Seq("famous", "runner"), t), mp(2, Seq("famous", "runner"), t)))
    assert(nodes.size == 1)
    assert(nodes.head.seeds == Seq(1L, 2L))
    assert(nodes.head.goldAttns.toSet == Set(100L, 200L))
  }

  test("same token set in different order merges (non-stop set criterion)") {
    val t = Seq(Seq("famous", "runner", "review"))
    val nodes = Normalize.normalize(Seq(
      mp(1, Seq("famous", "runner"), t), mp(2, Seq("runner", "famous"), t)))
    assert(nodes.size == 1)
    // representative phrase is the most frequent variant (tie → lexicographic)
    assert(nodes.head.variants.size == 2)
  }

  test("different token sets do not merge") {
    val nodes = Normalize.normalize(Seq(
      mp(1, Seq("famous", "runner")), mp(2, Seq("classic", "runner"))))
    assert(nodes.size == 2)
  }

  test("same tokens with disjoint contexts stay separate (TF-IDF criterion)") {
    val nodes = Normalize.normalize(Seq(
      mp(1, Seq("famous", "runner"), Seq(Seq("review", "marathon", "guide"))),
      mp(2, Seq("famous", "runner"), Seq(Seq("ranking", "sitcom", "recap")))),
      deltaM = 0.9)
    assert(nodes.size == 2)
  }

  test("events and concepts never merge") {
    val nodes = Normalize.normalize(Seq(
      mp(1, Seq("famous", "runner")), mp(2, Seq("famous", "runner"), isEvent = true)))
    assert(nodes.size == 2)
    assert(nodes.map(_.kind).toSet == Set("concept", "event"))
  }

  test("empty phrases are dropped") {
    assert(Normalize.normalize(Seq(mp(1, Seq.empty))).isEmpty)
  }

  test("node ids start above idBase and are unique") {
    val nodes = Normalize.normalize(Seq(
      mp(1, Seq("a1", "runner")), mp(2, Seq("classic", "runner"))), idBase = 500)
    assert(nodes.forall(_.id > 500))
    assert(nodes.map(_.id).distinct.size == nodes.size)
  }

  test("tfidfCosine of identical bags is ~1") {
    val df = Map("a" -> 1, "b" -> 1)
    assert(math.abs(Normalize.tfidfCosine(Seq("a", "b"), Seq("a", "b"), df, 2) - 1.0) < 1e-9)
  }
}

class DerivationSpec extends SparkSpec {
  import spark.implicits._

  test("isNounPhrase accepts ADJ*NOUN+ and rejects entities/verbs/stops") {
    assert(Derivation.isNounPhrase(Seq("famous", "runner")))
    assert(Derivation.isNounPhrase(Seq("crime", "series")))
    assert(!Derivation.isNounPhrase(Seq("zorvex", "runner")))
    assert(!Derivation.isNounPhrase(Seq("famous", "wins")))
    assert(!Derivation.isNounPhrase(Seq("the", "runner")))
    assert(!Derivation.isNounPhrase(Seq("famous"))) // bare ADJ is headless
    assert(!Derivation.isNounPhrase(Seq.empty))
  }

  test("commonSuffixes finds shared noun-phrase suffixes with support") {
    val df = Seq(
      (1L, Seq("famous", "crime", "series")),
      (2L, Seq("classic", "crime", "series")),
      (3L, Seq("luxury", "suv"))).toDF("id", "phrase")
    val out = Derivation.commonSuffixes(spark, df, minCount = 2).collect()
      .map(r => r.getSeq[String](0) -> r.getLong(1)).toMap
    assert(out(Seq("crime", "series")) == 2)
    assert(out(Seq("series")) == 2)
    assert(!out.contains(Seq("suv")))
  }

  test("commonSuffixes counts distinct concepts, not rows") {
    val df = Seq(
      (1L, Seq("famous", "runner")),
      (1L, Seq("famous", "runner"))).toDF("id", "phrase")
    val out = Derivation.commonSuffixes(spark, df, minCount = 2).collect()
    assert(out.isEmpty)
  }

  test("eventPattern collapses entity runs into one slot") {
    assert(Derivation.eventPattern(Seq("zorvex", "kaldo", "wins", "award")) ==
      Seq("<E>", "wins", "award"))
  }

  test("commonPatterns derives a topic from events sharing pattern + concept") {
    val events = Seq(
      (10L, Seq("zorvexa", "holds", "concert", "2018")),
      (11L, Seq("malkarb", "holds", "concert", "london")))
    val entityConcepts = Map(
      Seq("zorvexa") -> Seq(Seq("pop", "singer"), Seq("singer")),
      Seq("malkarb") -> Seq(Seq("singer")))
    val topics = Derivation.commonPatterns(events, entityConcepts)
    assert(topics.size == 1)
    assert(topics.head.phrase == Seq("singer", "holds", "concert"))
    assert(topics.head.eventNodeIds.toSet == Set(10L, 11L))
  }

  test("commonPatterns picks the most fine-grained common concept") {
    val events = Seq(
      (10L, Seq("zorvexa", "retires")),
      (11L, Seq("malkarb", "retires")))
    val entityConcepts = Map(
      Seq("zorvexa") -> Seq(Seq("famous", "runner"), Seq("runner")),
      Seq("malkarb") -> Seq(Seq("famous", "runner"), Seq("runner")))
    val topics = Derivation.commonPatterns(events, entityConcepts)
    assert(topics.head.phrase == Seq("famous", "runner", "retires"))
  }

  test("commonPatterns requires shared concept ancestry") {
    val events = Seq(
      (10L, Seq("zorvexa", "retires")),
      (11L, Seq("malkarb", "retires")))
    val entityConcepts = Map(
      Seq("zorvexa") -> Seq(Seq("runner")),
      Seq("malkarb") -> Seq(Seq("singer")))
    assert(Derivation.commonPatterns(events, entityConcepts).isEmpty)
  }

  test("commonPatterns requires minimum support") {
    val events = Seq((10L, Seq("zorvexa", "retires")))
    val entityConcepts = Map(Seq("zorvexa") -> Seq(Seq("runner")))
    assert(Derivation.commonPatterns(events, entityConcepts, minSupport = 2).isEmpty)
  }
}
