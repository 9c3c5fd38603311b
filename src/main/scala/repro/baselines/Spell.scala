package repro.baselines

import scala.collection.mutable
import ParserUtil._

/** Spell (Du & Li, ICDM'16): streaming parsing via Longest Common Subsequence.
  *
  * Each discovered message type is an LCS object; a new log joins the object
  * with the longest LCS when |LCS| ≥ τ·|log| (τ = 0.5 as published), and the
  * object's template shrinks to the LCS (gaps become wildcards). A simple
  * premerge by exact template match accelerates the common case, as in the
  * published implementation.
  */
final class Spell(tau: Double = 0.5) extends LogParser {
  override def name: String = "Spell"

  private final class LcsObject(var template: Vector[String], val id: Int)

  override def parse(input: ParseInput): Array[Int] = {
    val objects = mutable.ArrayBuffer.empty[LcsObject]
    // prelookup: exact constant-sequence hit
    val exact = mutable.HashMap.empty[List[String], LcsObject]
    val out = new Array[Int](input.tokens.length)

    var li = 0
    while (li < input.tokens.length) {
      val toks = input.tokens(li)
      val key = toks.toList
      exact.get(key) match {
        case Some(o) => out(li) = o.id
        case None =>
          var best: LcsObject = null
          var bestLen = 0
          objects.foreach { o =>
            val consts = o.template.count(_ != Wildcard)
            // pruning: an object can't beat bestLen with fewer constants
            if (consts > bestLen && consts >= tau * toks.length) {
              val l = lcsLen(o.template, toks)
              if (l > bestLen) { bestLen = l; best = o }
            }
          }
          if (best != null && bestLen >= tau * toks.length) {
            best.template = lcsTemplate(best.template, toks)
            out(li) = best.id
          } else {
            val o = new LcsObject(toks.toVector, objects.size)
            objects += o
            exact.put(key, o)
            out(li) = o.id
          }
      }
      li += 1
    }
    out
  }

  private def lcsLen(tpl: Vector[String], log: Array[String]): Int = {
    val a = tpl.filter(_ != Wildcard)
    val n = a.length; val m = log.length
    if (n == 0 || m == 0) return 0
    var prev = new Array[Int](m + 1)
    var cur = new Array[Int](m + 1)
    var i = 1
    while (i <= n) {
      var j = 1
      while (j <= m) {
        cur(j) = if (a(i - 1) == log(j - 1)) prev(j - 1) + 1 else math.max(prev(j), cur(j - 1))
        j += 1
      }
      val t = prev; prev = cur; cur = t
      i = i + 1
    }
    prev(m)
  }

  /** New template: tokens of the old template that participate in the LCS,
    * wildcards elsewhere (consecutive gaps collapse to one wildcard).
    */
  private def lcsTemplate(tpl: Vector[String], log: Array[String]): Vector[String] = {
    val a = tpl.filter(_ != Wildcard).toArray
    val common = lcsSeq(a, log).toSet
    val kept = a.filter(common.contains)
    // rebuild with single wildcards between kept runs
    val out = Vector.newBuilder[String]
    var ki = 0
    var lastWild = false
    log.foreach { t =>
      if (ki < kept.length && t == kept(ki)) { out += t; ki += 1; lastWild = false }
      else if (!lastWild) { out += Wildcard; lastWild = true }
    }
    out.result()
  }

  private def lcsSeq(a: Array[String], b: Array[String]): Vector[String] = {
    val dp = Array.ofDim[Int](a.length + 1, b.length + 1)
    var i = a.length - 1
    while (i >= 0) {
      var j = b.length - 1
      while (j >= 0) {
        dp(i)(j) = if (a(i) == b(j)) dp(i + 1)(j + 1) + 1 else math.max(dp(i + 1)(j), dp(i)(j + 1))
        j -= 1
      }
      i -= 1
    }
    val out = Vector.newBuilder[String]
    var x = 0; var y = 0
    while (x < a.length && y < b.length) {
      if (a(x) == b(y)) { out += a(x); x += 1; y += 1 }
      else if (dp(x + 1)(y) >= dp(x)(y + 1)) x += 1
      else y += 1
    }
    out.result()
  }
}
