package repro.baselines

import scala.collection.mutable

/** LFA (Nagappan & Vouk, MSR'10): log file abstraction by token frequency.
  *
  * For every line, each token's corpus frequency (at its position) is
  * compared with the line's own frequency distribution: tokens at or above
  * the line's frequency mid-point are constants, the rest variables. The
  * constant skeleton is the cluster key. Frequency mid-points misjudge
  * low-frequency templates, the weakness the paper cites for LFA.
  */
final class LFA extends LogParser {
  override def name: String = "LFA"

  override def parse(input: ParseInput): Array[Int] = {
    val freq = mutable.HashMap.empty[(Int, String), Int]
    input.tokens.foreach { toks =>
      var i = 0
      while (i < toks.length) {
        val k = (i, toks(i))
        freq.update(k, freq.getOrElse(k, 0) + 1)
        i += 1
      }
    }

    val ids = mutable.HashMap.empty[(Int, List[String]), Int]
    var nextId = 0
    val out = new Array[Int](input.tokens.length)

    var li = 0
    while (li < input.tokens.length) {
      val toks = input.tokens(li)
      val fs = toks.zipWithIndex.map { case (t, i) => freq((i, t)) }
      val skeleton =
        if (toks.isEmpty) List.empty[String]
        else {
          val lo = fs.min.toDouble; val hi = fs.max.toDouble
          val mid = (lo + hi) / 2.0
          toks.indices.map { i =>
            if (fs(i) >= mid) toks(i) else ParserUtil.Wildcard
          }.toList
        }
      val key = (toks.length, skeleton)
      out(li) = ids.getOrElseUpdate(key, { val i = nextId; nextId += 1; i })
      li += 1
    }
    out
  }
}
