package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MatcherSpec extends AnyFunSuite {
  private val W = CommonVariables.Wildcard

  private def node(id: Int, parent: Int, tpl: Seq[String], sat: Double, depth: Int): TemplateNode =
    TemplateNode(id, parent, GroupKey(tpl.size, Nil), tpl.toIndexedSeq, sat, sat, depth, 1)

  private val model = new TemplateModel(Vector(
    node(0, -1, Seq("get", W, "done"), 0.7, 0),
    node(1, 0, Seq("get", "a", "done"), 1.0, 1),
    node(2, 0, Seq("get", W, "done"), 1.0, 1),
    node(3, -1, Seq("put", W), 1.0, 0),
  ))
  private val matcher = new CompiledMatcher(model)

  test("exact wildcard-free template wins over equal-saturation wildcard one") {
    assert(matcher.matchTokens(Array("get", "a", "done")).get.id == 1)
  }

  test("wildcard template matches unseen value") {
    assert(matcher.matchTokens(Array("get", "zz", "done")).get.id == 2)
  }

  test("length routes to the right template set") {
    assert(matcher.matchTokens(Array("put", "x")).get.id == 3)
  }

  test("no match returns None") {
    assert(matcher.matchTokens(Array("delete", "x", "now")).isEmpty)
    assert(matcher.matchTokens(Array("get")).isEmpty)
  }

  test("higher-saturation template is preferred") {
    // node 2 (sat 1.0) precedes node 0 (sat 0.7) with identical text
    assert(matcher.matchTokens(Array("get", "q", "done")).get.id == 2)
  }

  test("OnlineMatcher inserts a temporary singleton on miss") {
    val om = new OnlineMatcher(model)
    val n = om.matchOrInsert(Array("delete", "x", "now"))
    assert(n.temporary)
    assert(n.template == IndexedSeq("delete", "x", "now"))
    assert(n.effectiveSaturation == 1.0)
  }

  test("OnlineMatcher returns the same temporary for a repeated miss, counting it") {
    val om = new OnlineMatcher(model)
    val a = om.matchOrInsert(Array("delete", "x", "now"))
    val b = om.matchOrInsert(Array("delete", "x", "now"))
    assert(a.id == b.id)
    assert(b.count == 2)
  }

  test("OnlineMatcher temporaries get fresh distinct ids") {
    val om = new OnlineMatcher(model)
    val a = om.matchOrInsert(Array("miss", "one", "x"))
    val b = om.matchOrInsert(Array("miss", "two", "x"))
    assert(a.id != b.id)
    assert(a.id >= model.nextId && b.id >= model.nextId)
  }

  test("modelWithTemporaries includes collected misses") {
    val om = new OnlineMatcher(model)
    om.matchOrInsert(Array("miss", "one", "x"))
    val m2 = om.modelWithTemporaries
    assert(m2.size == model.size + 1)
  }

  test("updateModel clears temporaries and matches against the new model") {
    val om = new OnlineMatcher(model)
    om.matchOrInsert(Array("miss", "one", "x"))
    om.updateModel(model)
    assert(om.modelWithTemporaries.size == model.size)
  }

  test("matched hits do not create temporaries") {
    val om = new OnlineMatcher(model)
    om.matchOrInsert(Array("get", "a", "done"))
    assert(om.modelWithTemporaries.size == model.size)
  }
}
