package repro.nlp

import org.scalatest.funsuite.AnyFunSuite

class DepParserSpec extends AnyFunSuite {
  import DepParser._

  test("adjective attaches to the following noun") {
    val deps = parse(Seq("famous", "runner"))
    assert(deps.contains(Dep(1, 0, "amod")))
  }

  test("adjective skips another adjective to reach the noun") {
    val deps = parse(Seq("famous", "classic", "runner"))
    assert(deps.contains(Dep(2, 0, "amod")))
    assert(deps.contains(Dep(2, 1, "amod")))
  }

  test("noun compounds onto the next noun") {
    val deps = parse(Seq("football", "team"))
    assert(deps.contains(Dep(1, 0, "compound")))
  }

  test("subject noun attaches to the verb") {
    val deps = parse(Seq("zorvex", "wins", "championship"))
    assert(deps.contains(Dep(1, 0, "nsubj")))
    assert(deps.contains(Dep(1, 2, "dobj")))
  }

  test("time modifies the verb") {
    val deps = parse(Seq("zorvex", "wins", "championship", "2018"))
    assert(deps.contains(Dep(1, 3, "tmod")))
  }

  test("location modifies the verb") {
    val deps = parse(Seq("zorvex", "wins", "championship", "london"))
    assert(deps.contains(Dep(1, 3, "lmod")))
  }

  test("time with no verb attaches to the last noun") {
    val deps = parse(Seq("famous", "runner", "2018"))
    assert(deps.contains(Dep(1, 2, "tmod")))
  }

  test("stop word attaches to the next content token") {
    val deps = parse(Seq("what", "are", "the", "famous", "runner"))
    assert(deps.contains(Dep(3, 0, "det")))
    assert(deps.contains(Dep(3, 2, "det")))
  }

  test("punctuation splits clauses — no arcs across it") {
    val deps = parse(Seq("review", "|", "zorvex", "wins"))
    assert(!deps.exists(d => (d.gov < 2) != (d.dep < 2)),
      s"arc across punctuation: $deps")
  }

  test("all labels are from the declared label set") {
    val deps = parse(Seq("what", "are", "famous", "football", "team", "zorvex", "wins", "london", "2018"))
    assert(deps.forall(d => Labels.contains(d.label)))
  }

  test("parse of empty sequence is empty") {
    assert(parse(Seq.empty).isEmpty)
  }

  test("deterministic") {
    val s = Seq("famous", "runner", "wins", "championship")
    assert(parse(s) == parse(s))
  }
}
