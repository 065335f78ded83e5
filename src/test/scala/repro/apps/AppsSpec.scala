package repro.apps

import org.scalatest.funsuite.AnyFunSuite

class DocTaggingSpec extends AnyFunSuite {

  private val dict = Seq(1L -> Seq("zorvex"), 2L -> Seq("malkar"), 3L -> Seq("belfin"))

  test("keyEntities finds mentioned entities with normalized frequency") {
    val body = Seq("zorvex", "guide", "zorvex", "malkar")
    val ke = DocTagging.keyEntities(body, dict).toMap
    assert(math.abs(ke(1L) - 2.0 / 3) < 1e-9)
    assert(math.abs(ke(2L) - 1.0 / 3) < 1e-9)
    assert(!ke.contains(3L))
  }

  test("tagConcepts tags a parent concept the doc never mentions") {
    val title = Seq("review", "famous", "runner")
    val body = Seq("zorvex", "famous", "runner", "guide")
    val tags = DocTagging.tagConcepts(title, body, dict,
      parentConcepts = Map(1L -> Seq(100L)),
      conceptRep = Map(100L -> Seq("famous", "runner", "review", "marathon")),
      df = Map("famous" -> 1, "runner" -> 1), nDocs = 10)
    assert(tags.nonEmpty && tags.head._1 == 100L)
  }

  test("tagConcepts yields nothing without key entities") {
    val tags = DocTagging.tagConcepts(Seq("review"), Seq("guide"), dict,
      Map(1L -> Seq(100L)), Map(100L -> Seq("famous")), Map.empty, 10)
    assert(tags.isEmpty)
  }

  test("inferConcepts falls back to context words (Eq. 12-14)") {
    val body = Seq("zorvex", "famous", "runner", "overview")
    val tags = DocTagging.inferConcepts(body, dict,
      concepts = Seq((100L, Seq("famous", "runner")), (200L, Seq("luxury", "suv"))))
    assert(tags.nonEmpty)
    assert(tags.head._1 == 100L)
    assert(!tags.exists(_._1 == 200L))
  }

  test("lcsLen computes token-level LCS") {
    assert(DocTagging.lcsLen(Seq("a", "b", "c"), Seq("a", "x", "b", "c")) == 3)
    assert(DocTagging.lcsLen(Seq("a"), Seq("b")) == 0)
    assert(DocTagging.lcsLen(Seq.empty, Seq("a")) == 0)
  }

  test("semanticSim is 1 for identical and 0 for disjoint token bags") {
    assert(math.abs(DocTagging.semanticSim(Seq("a", "b"), Seq("b", "a")) - 1.0) < 1e-9)
    assert(DocTagging.semanticSim(Seq("a"), Seq("b")) == 0.0)
  }

  test("tagEvents tags when LCS and semantic match both clear thresholds") {
    val title = Seq("zorvex", "explodes", "moscow")
    val body = Seq("recap", "|", "guide")
    val events = Seq((50L, Seq("zorvex", "explodes", "moscow", "2018")),
      (60L, Seq("malkar", "retires")))
    val tags = DocTagging.tagEvents(title, body, events)
    assert(tags.map(_._1) == Seq(50L))
  }
}

class StoryTreeSpec extends AnyFunSuite {
  import StoryTree._

  private val e1 = EventInfo(1, Seq("zorvex", "wins", "finals"), Seq("zorvex"), Seq("wins"), 10)
  private val e2 = EventInfo(2, Seq("zorvex", "wins", "finals", "2018"), Seq("zorvex"), Seq("wins"), 20)
  private val e3 = EventInfo(3, Seq("zorvex", "signs", "roster"), Seq("zorvex"), Seq("signs"), 30)
  private val e4 = EventInfo(4, Seq("malkar", "retires"), Seq("malkar"), Seq("retires"), 40)

  private val vecs = repro.ml.Embeddings.tokenVectors(Seq(
    e1.phrase, e2.phrase, e3.phrase, e4.phrase))

  test("retrieveRelated requires a shared entity") {
    val rel = retrieveRelated(e1, Seq(e2, e3, e4))
    assert(rel.map(_.id) == Seq(2L, 3L))
  }

  test("similarity is higher for same-trigger same-entity events") {
    val s12 = similarity(e1, e2, vecs)
    val s13 = similarity(e1, e3, vecs)
    assert(s12 > s13)
  }

  test("hierarchical clustering groups near-duplicates") {
    // threshold between the two measured similarities separates the pairs
    val thr = (similarity(e1, e2, vecs) + similarity(e1, e3, vecs)) / 2
    val clusters = hierarchicalCluster(Seq(e1, e2, e3), similarity(_, _, vecs), thr)
    val c12 = clusters.find(_.exists(_.id == 1))
    assert(c12.exists(_.exists(_.id == 2)))
    assert(!c12.exists(_.exists(_.id == 3)))
  }

  test("form orders branches and events by time, root is earliest") {
    val t = form(e1, Seq(e2, e3, e4), vecs, threshold = 2.0)
    assert(t.root.id == 1)
    for (b <- t.branches) assert(b.map(_.time) == b.map(_.time).sorted)
    assert(t.branches.map(_.head.time) == t.branches.map(_.head.time).sorted)
    // e4 shares no entity — not in the tree
    assert(!t.branches.flatten.exists(_.id == 4))
  }
}

class QueryRewriteSpec extends AnyFunSuite {
  import QueryRewrite._

  private val idx = Index(
    conceptPhrases = Seq((100L, Seq("famous", "runner")), (101L, Seq("runner"))),
    entityNames = Seq((1L, Seq("zorvex")), (2L, Seq("malkar")), (3L, Seq("belfin"))),
    entitiesOfConcept = Map(100L -> Seq(1L, 2L)),
    correlated = Map(1L -> Seq(2L, 3L)))

  test("detectConcept prefers the longest contained phrase") {
    assert(detectConcept(Seq("the", "famous", "runner"), idx).map(_._1) == Some(100L))
    assert(detectConcept(Seq("best", "runner"), idx).map(_._1) == Some(101L))
    assert(detectConcept(Seq("luxury", "suv"), idx).isEmpty)
  }

  test("rewrite appends instance entities to the query") {
    val rw = rewrite(Seq("famous", "runner"), idx)
    assert(rw == Seq(Seq("famous", "runner", "zorvex"), Seq("famous", "runner", "malkar")))
  }

  test("recommend returns correlated entities for an entity query") {
    assert(recommend(Seq("zorvex"), idx) == Seq(Seq("malkar"), Seq("belfin")))
  }

  test("no concept and no entity → no output") {
    assert(rewrite(Seq("luxury", "suv"), idx).isEmpty)
    assert(recommend(Seq("luxury", "suv"), idx).isEmpty)
  }
}
