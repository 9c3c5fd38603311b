package repro.core

import java.io.{ByteArrayInputStream, ByteArrayOutputStream, DataInputStream, DataOutputStream}
import java.nio.charset.StandardCharsets
import java.nio.file.{Files, Path}

/** Compact binary model serialization.
  *
  * The paper stores each node's metadata (template text, saturation,
  * parent-child links) in an internal topic and reports per-topic model sizes
  * of a few MB (Table 5). This codec is both the persistence format for the
  * spark-submit jobs and the measuring stick for the Table 5 "Model Size"
  * column — only template texts are stored, never token statistics, which is
  * exactly the storage argument of §4.8.
  */
object ModelCodec {
  private val Magic = 0x42594252 // "BYBR"
  private val Version = 1

  def serialize(model: TemplateModel): Array[Byte] = {
    val bos = new ByteArrayOutputStream(1 << 16)
    val out = new DataOutputStream(bos)
    out.writeInt(Magic)
    out.writeInt(Version)
    out.writeInt(model.nodes.size)
    model.nodes.foreach { n =>
      out.writeInt(n.id)
      out.writeInt(n.parentId)
      out.writeInt(n.depth)
      out.writeLong(n.count)
      out.writeDouble(n.saturation)
      out.writeDouble(n.effectiveSaturation)
      out.writeBoolean(n.temporary)
      out.writeInt(n.groupKey.numTokens)
      out.writeInt(n.groupKey.prefix.size)
      n.groupKey.prefix.foreach(writeStr(out, _))
      out.writeInt(n.template.size)
      n.template.foreach(writeStr(out, _))
    }
    out.flush()
    bos.toByteArray
  }

  def deserialize(bytes: Array[Byte]): TemplateModel = {
    val in = new DataInputStream(new ByteArrayInputStream(bytes))
    require(in.readInt() == Magic, "not a ByteBrain model file")
    require(in.readInt() == Version, "unsupported model version")
    val n = in.readInt()
    val nodes = Vector.fill(n) {
      val id = in.readInt(); val parent = in.readInt(); val depth = in.readInt()
      val count = in.readLong(); val sat = in.readDouble(); val eff = in.readDouble()
      val temp = in.readBoolean()
      val numTokens = in.readInt()
      val prefix = Vector.fill(in.readInt())(readStr(in))
      val template = Vector.fill(in.readInt())(readStr(in))
      TemplateNode(id, parent, GroupKey(numTokens, prefix), template, sat, eff, depth, count, temp)
    }
    new TemplateModel(nodes)
  }

  def sizeInBytes(model: TemplateModel): Long = serialize(model).length.toLong

  def save(model: TemplateModel, path: Path): Unit = Files.write(path, serialize(model))
  def load(path: Path): TemplateModel = deserialize(Files.readAllBytes(path))

  private def writeStr(out: DataOutputStream, s: String): Unit = {
    val b = s.getBytes(StandardCharsets.UTF_8)
    out.writeInt(b.length); out.write(b)
  }
  private def readStr(in: DataInputStream): String = {
    val b = new Array[Byte](in.readInt())
    in.readFully(b)
    new String(b, StandardCharsets.UTF_8)
  }
}
