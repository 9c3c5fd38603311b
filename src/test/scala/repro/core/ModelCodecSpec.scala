package repro.core

import java.nio.file.Files
import org.scalatest.funsuite.AnyFunSuite

class ModelCodecSpec extends AnyFunSuite {
  private val W = CommonVariables.Wildcard

  private def node(id: Int, parent: Int, tpl: Seq[String], sat: Double, depth: Int): TemplateNode =
    TemplateNode(id, parent, GroupKey(tpl.size, tpl.take(1)), tpl.toIndexedSeq, sat,
      math.min(1.0, sat + 0.01), depth, id * 3L, temporary = id % 2 == 0)

  private val model = new TemplateModel(Vector(
    node(0, -1, Seq("a", W, "c"), 0.5, 0),
    node(1, 0, Seq("a", "b", "c"), 1.0, 1),
    node(2, -1, Seq("uni", "код", "日志"), 0.9, 0),
  ))

  test("serialize/deserialize roundtrip preserves every field") {
    val back = ModelCodec.deserialize(ModelCodec.serialize(model))
    assert(back.nodes == model.nodes)
  }

  test("roundtrip via file") {
    val f = Files.createTempFile("model", ".bin")
    try {
      ModelCodec.save(model, f)
      assert(ModelCodec.load(f).nodes == model.nodes)
    } finally Files.delete(f)
  }

  test("empty model roundtrips") {
    val back = ModelCodec.deserialize(ModelCodec.serialize(TemplateModel.empty))
    assert(back.size == 0)
  }

  test("sizeInBytes equals serialized length and grows with nodes") {
    assert(ModelCodec.sizeInBytes(model) == ModelCodec.serialize(model).length.toLong)
    assert(ModelCodec.sizeInBytes(model) > ModelCodec.sizeInBytes(TemplateModel.empty))
  }

  test("garbage input is rejected") {
    assertThrows[IllegalArgumentException](ModelCodec.deserialize(Array[Byte](1, 2, 3, 4, 5, 6, 7, 8)))
  }

  test("UTF-8 template tokens survive") {
    val back = ModelCodec.deserialize(ModelCodec.serialize(model))
    assert(back.byId(2).template == IndexedSeq("uni", "код", "日志"))
  }

  test("model size stores only templates — much smaller than raw text") {
    // a model over k templates must be ~O(k * template bytes), not O(logs)
    val big = new TemplateModel((0 until 100).map(i =>
      node(i, -1, Seq("tpl", i.toString, W), 1.0, 0)).toVector)
    assert(ModelCodec.sizeInBytes(big) < 100 * 200)
  }
}
