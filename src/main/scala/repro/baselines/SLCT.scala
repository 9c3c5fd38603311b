package repro.baselines

import scala.collection.mutable

/** SLCT (Vaarandi, IPOM'03): Simple Logfile Clustering Tool.
  *
  * Pass 1 counts (position, word) frequencies; pairs at or above the support
  * threshold are *frequent*. Pass 2 builds each line's cluster candidate from
  * its frequent positional words; lines whose candidate meets the support
  * threshold form that cluster, the rest are outliers (grouped per length
  * here, as the toolkit does). Low-frequency templates never develop frequent
  * words and drown in the outlier buckets — the documented weakness.
  */
final class SLCT(relativeSupport: Double = 0.01) extends LogParser {
  override def name: String = "SLCT"

  override def parse(input: ParseInput): Array[Int] = {
    val n = input.tokens.length
    val support = math.max(2, math.ceil(relativeSupport * n).toInt)

    val freq = mutable.HashMap.empty[(Int, String), Int]
    input.tokens.foreach { toks =>
      var i = 0
      while (i < toks.length) {
        val k = (i, toks(i))
        freq.update(k, freq.getOrElse(k, 0) + 1)
        i += 1
      }
    }

    def candidate(toks: Array[String]): List[(Int, String)] = {
      val b = List.newBuilder[(Int, String)]
      var i = 0
      while (i < toks.length) {
        if (freq((i, toks(i))) >= support) b += ((i, toks(i)))
        i += 1
      }
      b.result()
    }

    val candCount = mutable.HashMap.empty[(Int, List[(Int, String)]), Int]
    input.tokens.foreach { toks =>
      val k = (toks.length, candidate(toks))
      candCount.update(k, candCount.getOrElse(k, 0) + 1)
    }

    val ids = mutable.HashMap.empty[Any, Int]
    var nextId = 0
    def idOf(key: Any): Int = ids.getOrElseUpdate(key, { val i = nextId; nextId += 1; i })

    val out = new Array[Int](n)
    var li = 0
    while (li < n) {
      val toks = input.tokens(li)
      val cand = candidate(toks)
      val key = (toks.length, cand)
      out(li) =
        if (cand.nonEmpty && candCount(key) >= support) idOf(key)
        else idOf(("outlier", toks.length))
      li += 1
    }
    out
  }
}
