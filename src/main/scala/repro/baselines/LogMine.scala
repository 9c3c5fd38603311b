package repro.baselines

import scala.collection.mutable
import ParserUtil._

/** LogMine (Hamooni et al., CIKM'16): hierarchical fast pattern recognition.
  *
  * Level 0 clusters are exact duplicates; each subsequent level merges
  * clusters whose token distance is within a growing `maxDist` budget,
  * re-deriving templates by position-wise wildcarding (same-length merging —
  * the alignment step of the paper restricted to equal lengths, as the
  * toolkit does in practice). The iterative all-pairs merging is the
  * substantial cost the paper attributes to LogMine.
  */
final class LogMine(levels: Int = 2, maxDistStep: Double = 0.09) extends LogParser {
  override def name: String = "LogMine"

  override def parse(input: ParseInput): Array[Int] = {
    // level 0: dedup
    val level0 = mutable.LinkedHashMap.empty[List[String], mutable.ArrayBuffer[Int]]
    input.tokens.indices.foreach { i =>
      level0.getOrElseUpdate(input.tokens(i).toList, mutable.ArrayBuffer.empty) += i
    }

    var clusters: Vector[(Array[String], mutable.ArrayBuffer[Int])] =
      level0.iterator.map { case (k, v) => (k.toArray, v) }.toVector

    var level = 1
    while (level <= levels) {
      val maxDist = maxDistStep * level
      val merged = mutable.ArrayBuffer.empty[(Array[String], mutable.ArrayBuffer[Int])]
      clusters.foreach { case (tpl, idxs) =>
        var hit = -1
        var c = 0
        while (hit < 0 && c < merged.length) {
          val (mt, _) = merged(c)
          if (mt.length == tpl.length && dist(mt, tpl) <= maxDist) hit = c
          c += 1
        }
        if (hit >= 0) {
          val (mt, acc) = merged(hit)
          merged(hit) = (mergeTemplate(mt, tpl), acc)
          acc ++= idxs
        } else merged += ((tpl.clone(), idxs.clone()))
      }
      clusters = merged.toVector
      level += 1
    }

    val out = new Array[Int](input.tokens.length)
    clusters.zipWithIndex.foreach { case ((_, idxs), id) => idxs.foreach(out(_) = id) }
    out
  }

  /** Token distance: 1 − fraction of agreeing positions (wildcard agrees). */
  private def dist(a: Array[String], b: Array[String]): Double = {
    if (a.length == 0) return 0.0
    var same = 0; var i = 0
    while (i < a.length) {
      if (a(i) == b(i) || a(i) == Wildcard || b(i) == Wildcard) same += 1
      i += 1
    }
    1.0 - same.toDouble / a.length
  }
}
