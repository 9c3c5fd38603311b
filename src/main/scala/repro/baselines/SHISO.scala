package repro.baselines

import scala.collection.mutable
import ParserUtil._

/** SHISO (Mizutani, SCC'13): incremental mining of log formats.
  *
  * Nodes of a bounded-fanout tree hold format templates; a new log descends
  * from the root, joining the first node whose similarity (Euclidean distance
  * over per-token character-class vectors) is under the threshold, adjusting
  * that node's format; otherwise it becomes a child of the current node if
  * fanout permits, else descends into the most similar child.
  */
final class SHISO(maxChildren: Int = 4, threshold: Double = 0.12) extends LogParser {
  override def name: String = "SHISO"

  private final class Node(var template: Array[String], val id: Int) {
    val children = mutable.ArrayBuffer.empty[Node]
  }

  override def parse(input: ParseInput): Array[Int] = {
    val root = new Node(Array.empty, -1)
    var nextId = 0
    val out = new Array[Int](input.tokens.length)

    var li = 0
    while (li < input.tokens.length) {
      val toks = input.tokens(li)
      var cur = root
      var placed = false
      while (!placed) {
        // try to join one of cur's children
        var best: Node = null
        var bestDist = Double.MaxValue
        cur.children.foreach { ch =>
          val d = classDistance(ch.template, toks)
          if (d < bestDist) { bestDist = d; best = ch }
        }
        if (best != null && bestDist <= threshold) {
          best.template =
            if (best.template.length == toks.length) mergeTemplate(best.template, toks)
            else best.template
          out(li) = best.id
          placed = true
        } else if (cur.children.size < maxChildren) {
          val node = new Node(toks.clone(), nextId)
          nextId += 1
          cur.children += node
          out(li) = node.id
          placed = true
        } else {
          cur = if (best != null) best else cur.children.head
        }
      }
      li += 1
    }
    out
  }

  /** Mean Euclidean distance of 4-dim character-class vectors per position;
    * length mismatch → maximal distance.
    */
  private def classDistance(a: Array[String], b: Array[String]): Double = {
    if (a.length != b.length) return Double.MaxValue / 2
    if (a.length == 0) return 0.0
    var acc = 0.0
    var i = 0
    while (i < a.length) {
      val va = classVec(a(i)); val vb = classVec(b(i))
      var d = 0.0
      var j = 0
      while (j < 4) { val x = va(j) - vb(j); d += x * x; j += 1 }
      acc += math.sqrt(d) / 2.0
      i += 1
    }
    acc / a.length
  }

  private def classVec(t: String): Array[Double] = {
    val v = new Array[Double](4)
    if (t == Wildcard || t.isEmpty) return v
    var i = 0
    while (i < t.length) {
      val c = t.charAt(i)
      if (Character.isLowerCase(c)) v(0) += 1
      else if (Character.isUpperCase(c)) v(1) += 1
      else if (Character.isDigit(c)) v(2) += 1
      else v(3) += 1
      i += 1
    }
    val n = t.length.toDouble
    var j = 0
    while (j < 4) { v(j) /= n; j += 1 }
    v
  }
}
