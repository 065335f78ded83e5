package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class QTIGSpec extends AnyFunSuite {

  private val queries = Seq(Seq("what", "are", "the", "famous", "runner"))
  private val titles = Seq(Seq("review", "famous", "classic", "runner"),
    Seq("famous", "runner", "zorvex"))

  test("sos and eos are nodes 0 and 1") {
    val g = QTIG.build(queries, titles)
    assert(g.tokens(0) == QTIG.Sos && g.tokens(1) == QTIG.Eos)
  }

  test("tokens are merged across inputs") {
    val g = QTIG.build(queries, titles)
    assert(g.tokens.count(_ == "famous") == 1)
    assert(g.tokens.count(_ == "runner") == 1)
  }

  test("node insertion order follows input order (weight-sorted inputs first)") {
    val g = QTIG.build(queries, titles)
    // query tokens get the lowest ids after the markers
    assert(g.nodeOf("what").get < g.nodeOf("review").get)
  }

  test("adjacent tokens share a bi-directional seq edge") {
    val g = QTIG.build(queries, titles)
    val a = g.nodeOf("famous").get; val b = g.nodeOf("runner").get
    val fwd = g.edges.find(e => e._1 == a && e._2 == b)
    val bwd = g.edges.find(e => e._1 == b && e._2 == a)
    assert(fwd.exists(e => QTIG.Relations(e._3) == "seq_f"))
    assert(bwd.exists(e => QTIG.Relations(e._3) == "seq_b"))
  }

  test("only the first edge between a token pair is kept") {
    val g = QTIG.build(queries, titles)
    val pairs = g.edges.map(e => (math.min(e._1, e._2), math.max(e._1, e._2)))
    // each unordered pair appears exactly twice: forward + backward arc
    pairs.groupBy(identity).foreach { case (p, es) => assert(es.size == 2, s"pair $p") }
  }

  test("non-adjacent dependency creates a typed edge") {
    // in title 1, famous..runner are adjacent in title 2 (seq edge wins);
    // but 'classic' amod 'runner' is adjacent too. Use a query where adj and
    // noun are separated:
    val g = QTIG.build(Seq(Seq("famous", "football", "team")), Seq.empty)
    val a = g.nodeOf("famous").get
    val t = g.nodeOf("team").get
    val e = g.edges.find(e => e._1 == t && e._2 == a)
    assert(e.exists(x => QTIG.Relations(x._3) == "amod_f"),
      s"expected amod edge, got ${g.edges.map(e => (g.tokens(e._1), g.tokens(e._2), QTIG.Relations(e._3)))}")
  }

  test("texts keep per-input node sequences including markers") {
    val g = QTIG.build(queries, titles)
    assert(g.texts.size == 3)
    assert(g.texts.forall(t => t.head == 0 && t.last == 1))
    assert(g.nQueries == 1)
  }

  test("atspGraph connects sos to first positive and last positive to eos") {
    val g = QTIG.build(queries, titles)
    val fam = g.nodeOf("famous").get; val run = g.nodeOf("runner").get
    val adj = QTIG.atspGraph(g, Set(fam, run))
    assert(adj(0).contains(fam))
    assert(adj(run).contains(1))
  }

  test("atspGraph seq edges are unidirectional") {
    val g = QTIG.build(queries, titles)
    val fam = g.nodeOf("famous").get; val run = g.nodeOf("runner").get
    val adj = QTIG.atspGraph(g, Set(fam, run))
    assert(adj(fam).contains(run))
    assert(!adj.getOrElse(run, Map.empty[Int, Double]).contains(fam))
  }

  test("bfs distances: adjacent tokens at distance 1, with insertion at 2") {
    val g = QTIG.build(queries, titles)
    val fam = g.nodeOf("famous").get; val run = g.nodeOf("runner").get
    val adj = QTIG.atspGraph(g, Set(fam, run))
    val d = QTIG.bfsDistances(g.size, adj, Seq(fam))
    assert(d(fam)(run) == 1.0)
  }

  test("bfs distance through an inserted modifier is 2") {
    val g = QTIG.build(Seq.empty, Seq(Seq("famous", "classic", "runner")))
    val fam = g.nodeOf("famous").get; val run = g.nodeOf("runner").get
    val adj = QTIG.atspGraph(g, Set(fam, run))
    val d = QTIG.bfsDistances(g.size, adj, Seq(fam))
    assert(d(fam)(run) == 2.0)
  }

  test("relation vocabulary covers seq + both directions of each dep label") {
    assert(QTIG.NumRelations == 2 + repro.nlp.DepParser.Labels.size * 2)
  }

  test("empty cluster yields just the markers") {
    val g = QTIG.build(Seq.empty, Seq.empty)
    assert(g.size == 2 && g.edges.isEmpty)
  }
}
