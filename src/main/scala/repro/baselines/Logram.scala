package repro.baselines

import scala.collection.mutable
import ParserUtil._

/** Logram (Dai et al., TSE'20): parsing with n-gram dictionaries.
  *
  * Builds 2-gram and 3-gram frequency dictionaries over token sequences; a
  * token is dynamic when none of the 3-grams (falling back to 2-grams) it
  * participates in reaches the frequency threshold. The static skeleton is
  * the group key. Dictionary thresholds misfire when the same n-grams span
  * templates — Logram's sharp degradation on LogHub-2.0 in the paper.
  */
final class Logram(doubleThreshold: Int = 15, tripleThreshold: Int = 10) extends LogParser {
  override def name: String = "Logram"

  override def parse(input: ParseInput): Array[Int] = {
    val bi = mutable.HashMap.empty[(String, String), Int]
    val tri = mutable.HashMap.empty[(String, String, String), Int]
    input.tokens.foreach { toks =>
      var i = 0
      while (i + 1 < toks.length) {
        val k = (toks(i), toks(i + 1))
        bi.update(k, bi.getOrElse(k, 0) + 1)
        if (i + 2 < toks.length) {
          val k3 = (toks(i), toks(i + 1), toks(i + 2))
          tri.update(k3, tri.getOrElse(k3, 0) + 1)
        }
        i += 1
      }
    }

    def isStatic(toks: Array[String], i: Int): Boolean = {
      val n = toks.length
      var found3 = false
      var any3 = false
      var s = math.max(0, i - 2)
      while (s <= math.min(i, n - 3)) {
        any3 = true
        if (tri.getOrElse((toks(s), toks(s + 1), toks(s + 2)), 0) >= tripleThreshold) found3 = true
        s += 1
      }
      if (any3) found3
      else {
        // short line: fall back to 2-grams
        var found2 = false
        var any2 = false
        if (i > 0) {
          any2 = true
          if (bi.getOrElse((toks(i - 1), toks(i)), 0) >= doubleThreshold) found2 = true
        }
        if (i + 1 < n) {
          any2 = true
          if (bi.getOrElse((toks(i), toks(i + 1)), 0) >= doubleThreshold) found2 = true
        }
        !any2 || found2
      }
    }

    val ids = mutable.HashMap.empty[(Int, List[String]), Int]
    var nextId = 0
    val out = new Array[Int](input.tokens.length)

    var li = 0
    while (li < input.tokens.length) {
      val toks = input.tokens(li)
      val skeleton = toks.indices.map { i =>
        if (isStatic(toks, i)) toks(i) else Wildcard
      }.toList
      val key = (toks.length, skeleton)
      out(li) = ids.getOrElseUpdate(key, { val id = nextId; nextId += 1; id })
      li += 1
    }
    out
  }
}
