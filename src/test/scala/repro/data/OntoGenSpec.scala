package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.nlp.Lang

class OntoGenSpec extends AnyFunSuite {

  private val onto = OntoGen.generate(OntoGen.Params(nDerivedConcepts = 50, nEvents = 30, seed = 1))

  test("generates the requested number of derived concepts") {
    assert(onto.derivedConcepts.size == 50)
  }

  test("generates the requested number of events") {
    assert(onto.events.size == 30)
  }

  test("derived concept tokens = modifiers ++ head") {
    for (c <- onto.derivedConcepts) {
      assert(c.tokens.endsWith(c.head))
      val mods = c.tokens.dropRight(c.head.size)
      assert(mods.nonEmpty && mods.forall(m => Lang.info(m).pos == "ADJ"), s"concept ${c.tokens}")
    }
  }

  test("base concepts have no parent, derived have a base parent") {
    for (c <- onto.concepts)
      if (c.parentId.isDefined) {
        val p = onto.conceptById(c.parentId.get)
        assert(p.parentId.isEmpty && p.tokens == c.head)
      } else assert(c.tokens == c.head)
  }

  test("concept phrases are unique") {
    val ts = onto.concepts.map(_.tokens)
    assert(ts.distinct.size == ts.size)
  }

  test("entities belong to their concept and its parent") {
    for (e <- onto.entities) {
      assert(e.conceptIds.nonEmpty)
      val derived = e.conceptIds.flatMap(onto.conceptById.get).filter(_.parentId.isDefined)
      assert(derived.nonEmpty)
      assert(derived.exists(c => e.conceptIds.contains(c.parentId.get)))
    }
  }

  test("entity names are unique and recognized as ENT") {
    val names = onto.entities.map(_.name)
    assert(names.distinct.size == names.size)
    for (n <- names; t <- n) assert(Lang.info(t).ner == "ENT")
  }

  test("event tokens embed entity then trigger") {
    for (ev <- onto.events) {
      assert(ev.tokens.startsWith(ev.entityTokens))
      assert(ev.tokens.slice(ev.entityTokens.size, ev.entityTokens.size + ev.trigger.size) == ev.trigger)
    }
  }

  test("event topic is consistent: topic phrase = head ++ trigger") {
    for (ev <- onto.events) {
      val t = onto.topicById(ev.topicId)
      assert(t.trigger == ev.trigger)
      assert(t.tokens == onto.conceptById(t.headConceptId).head ++ ev.trigger)
    }
  }

  test("event entity belongs to the topic's head concept") {
    for (ev <- onto.events) {
      val t = onto.topicById(ev.topicId)
      assert(onto.entityById(ev.entityId).conceptIds.contains(t.headConceptId))
    }
  }

  test("id spaces are disjoint") {
    assert(onto.concepts.forall(c => c.id > OntoGen.ConceptBase && c.id < OntoGen.EntityBase))
    assert(onto.entities.forall(e => e.id > OntoGen.EntityBase && e.id < OntoGen.EventBase))
    assert(onto.events.forall(e => e.id > OntoGen.EventBase && e.id < OntoGen.TopicBase))
    assert(onto.topics.forall(t => t.id > OntoGen.TopicBase))
  }

  test("gold correlate pairs are symmetric-canonical (a < b) and nonempty") {
    assert(onto.goldCorrelatePairs.nonEmpty)
    assert(onto.goldCorrelatePairs.forall { case (a, b) => a < b })
  }

  test("generation is deterministic in the seed") {
    val again = OntoGen.generate(OntoGen.Params(nDerivedConcepts = 50, nEvents = 30, seed = 1))
    assert(again.concepts == onto.concepts)
    assert(again.events == onto.events)
  }
}
