package repro.core

import org.scalatest.funsuite.AnyFunSuite

class MergeSpec extends AnyFunSuite {
  private val W = CommonVariables.Wildcard
  private val cfg = ByteBrainConfig()

  private def node(id: Int, parent: Int, tpl: Seq[String], sat: Double, depth: Int,
                   count: Long = 1, gk: GroupKey = null): TemplateNode =
    TemplateNode(id, parent,
      if (gk == null) GroupKey(tpl.size, Nil) else gk,
      tpl.toIndexedSeq, sat, sat, depth, count)

  private val oldModel = new TemplateModel(Vector(
    node(0, -1, Seq("get", W, "done"), 0.5, 0, 10),
    node(1, 0, Seq("get", "a", "done"), 1.0, 1, 6),
    node(2, 0, Seq("get", "b", "done"), 1.0, 1, 4),
  ))

  test("templateSimilarity: identical templates are 1") {
    assert(Merge.templateSimilarity(IndexedSeq("a", "b"), IndexedSeq("a", "b")) == 1.0)
  }

  test("templateSimilarity: wildcard agrees with anything") {
    assert(Merge.templateSimilarity(IndexedSeq("a", W), IndexedSeq("a", "x")) == 1.0)
  }

  test("templateSimilarity: disjoint templates are 0") {
    assert(Merge.templateSimilarity(IndexedSeq("a", "b"), IndexedSeq("x", "y")) == 0.0)
  }

  test("templateSimilarity requires equal lengths") {
    assertThrows[IllegalArgumentException](
      Merge.templateSimilarity(IndexedSeq("a"), IndexedSeq("a", "b")))
  }

  test("merging an empty old model adopts the new one") {
    assert(Merge.merge(TemplateModel.empty, oldModel, cfg) eq oldModel)
  }

  test("merging an empty new model keeps the old one") {
    assert(Merge.merge(oldModel, TemplateModel.empty, cfg) eq oldModel)
  }

  test("similar new leaf merges into the old node, adding counts") {
    val newModel = new TemplateModel(Vector(
      node(0, -1, Seq("get", "a", "done"), 1.0, 0, 7)))
    val merged = Merge.merge(oldModel, newModel, cfg)
    assert(merged.size == oldModel.size)
    assert(merged.byId(1).count == 13) // 6 + 7
  }

  test("dissimilar new leaf attaches under the old group root") {
    val newModel = new TemplateModel(Vector(
      node(0, -1, Seq("put", "x", "now"), 1.0, 0, 3)))
    val merged = Merge.merge(oldModel, newModel, cfg)
    assert(merged.size == oldModel.size + 1)
    val added = merged.nodes.find(_.template == IndexedSeq("put", "x", "now")).get
    assert(added.parentId == 0)
    assert(!added.temporary)
  }

  test("an unseen group key adopts the whole new tree") {
    val gk = GroupKey(2, Nil)
    val newModel = new TemplateModel(Vector(
      node(0, -1, Seq("up", W), 0.6, 0, 5, gk),
      node(1, 0, Seq("up", "x"), 1.0, 1, 3, gk),
    ))
    val merged = Merge.merge(oldModel, newModel, cfg)
    assert(merged.size == oldModel.size + 2)
    val root = merged.nodes.find(_.template == IndexedSeq("up", W)).get
    val leaf = merged.nodes.find(_.template == IndexedSeq("up", "x")).get
    assert(leaf.parentId == root.id)
  }

  test("merge is idempotent for identical models") {
    val merged = Merge.merge(oldModel, oldModel, cfg)
    // every leaf of the new model merges into its identical old counterpart
    assert(merged.size == oldModel.size)
  }

  test("temporary singletons from online matching get merged in") {
    val om = new OnlineMatcher(oldModel)
    om.matchOrInsert(Array("put", "q", "now"))
    val withTemp = om.modelWithTemporaries
    val retrained = new TemplateModel(Vector(
      node(0, -1, Seq("put", W, "now"), 1.0, 0, 5)))
    val merged = Merge.merge(withTemp, retrained, cfg)
    // the retrained template is similar to the temporary (wildcard matches)
    assert(merged.nodes.exists(n => n.template == IndexedSeq("put", "q", "now")))
  }
}
