package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.QTIG

class FeaturesSpec extends AnyFunSuite {

  test("feature vectors have the declared dimension") {
    for (t <- Seq("famous", "runner", "zorvex", "london", "2018", "what", QTIG.Sos))
      assert(Features.encode(t, 0).length == Features.Dim)
  }

  test("one-hot blocks: exactly one POS and one NER bit for ordinary tokens") {
    val f = Features.encode("famous", 3)
    assert(f.slice(0, 7).sum == 1.0) // POS block
    assert(f.slice(7, 11).sum == 1.0) // NER block
  }

  test("stop flag set only for stop words") {
    assert(Features.encode("what", 0)(11) == 1.0)
    assert(Features.encode("runner", 0)(11) == 0.0)
  }

  test("markers use the dedicated flag and no linguistic bits") {
    val f = Features.encode(QTIG.Sos, 0)
    assert(f.last == 1.0)
    assert(f.slice(0, 12).sum == 0.0)
  }

  test("seq-id buckets saturate") {
    val lo = Features.encode("runner", 0)
    val hi = Features.encode("runner", 1000)
    val hi2 = Features.encode("runner", 2000)
    assert(lo.toSeq != hi.toSeq)
    assert(hi.toSeq == hi2.toSeq)
  }

  test("char-count buckets distinguish short and long tokens") {
    assert(Features.encode("ka", 0).toSeq != Features.encode("zormalvexka", 0).toSeq)
  }

  test("encodeGraph encodes every node with its insertion order") {
    val g = QTIG.build(Seq(Seq("famous", "runner")), Seq(Seq("review", "famous")))
    val fs = Features.encodeGraph(g)
    assert(fs.length == g.size)
    assert(fs(0).last == 1.0 && fs(1).last == 1.0)
  }
}
