package repro.eval

import org.scalatest.funsuite.AnyFunSuite

class MetricsSpec extends AnyFunSuite {

  test("EM is 1 only on exact sequence match") {
    assert(Metrics.em(Seq("a", "b"), Seq("a", "b")) == 1.0)
    assert(Metrics.em(Seq("b", "a"), Seq("a", "b")) == 0.0)
    assert(Metrics.em(Seq("a"), Seq("a", "b")) == 0.0)
  }

  test("F1 of identical phrases is 1") {
    assert(Metrics.f1(Seq("a", "b", "c"), Seq("a", "b", "c")) == 1.0)
  }

  test("F1 is order-insensitive token overlap") {
    assert(Metrics.f1(Seq("b", "a"), Seq("a", "b")) == 1.0)
  }

  test("F1 of disjoint phrases is 0; empty prediction is 0") {
    assert(Metrics.f1(Seq("x"), Seq("a")) == 0.0)
    assert(Metrics.f1(Seq.empty, Seq("a")) == 0.0)
  }

  test("F1 partial overlap") {
    // pred {a,b}, gold {a,c}: p=r=0.5 → f1=0.5
    assert(math.abs(Metrics.f1(Seq("a", "b"), Seq("a", "c")) - 0.5) < 1e-9)
  }

  test("F1 respects multiplicity") {
    val f = Metrics.f1(Seq("a", "a"), Seq("a"))
    assert(math.abs(f - 2.0 / 3.0) < 1e-9)
  }

  test("phraseScores aggregates EM, F1 and coverage") {
    val (em, f1, cov) = Metrics.phraseScores(Seq(
      (Seq("a", "b"), Seq("a", "b")),
      (Seq.empty, Seq("a")),
      (Seq("a"), Seq("a", "b"))))
    assert(math.abs(em - 1.0 / 3) < 1e-9)
    assert(cov == 2.0 / 3)
    assert(f1 > 0.5 && f1 < 0.7)
  }

  test("classF1s: perfect predictions") {
    val (ma, mi, w) = Metrics.classF1s(Seq((0, 0), (1, 1), (2, 2), (3, 3)), 4)
    assert(ma == 1.0 && mi == 1.0 && w == 1.0)
  }

  test("classF1s: micro equals accuracy") {
    val pairs = Seq((0, 0), (0, 1), (1, 1), (1, 1))
    val (_, mi, _) = Metrics.classF1s(pairs, 2)
    assert(mi == 0.75)
  }

  test("classF1s: macro punishes a missing class") {
    // class 3 never predicted nor present → f1(3)=0 lowers the macro
    val pairs = Seq((0, 0), (1, 1), (2, 2))
    val (ma, mi, w) = Metrics.classF1s(pairs, 4)
    assert(ma == 0.75 && mi == 1.0 && w == 1.0)
  }

  test("classF1s: weighted ignores zero-support classes") {
    val pairs = Seq((0, 0), (0, 0), (1, 2))
    val (_, _, w) = Metrics.classF1s(pairs, 3)
    assert(w > 0.6 && w < 0.7) // class0 f1=1 support2, class1 f1=0 support1
  }
}
