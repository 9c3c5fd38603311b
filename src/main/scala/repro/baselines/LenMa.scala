package repro.baselines

import scala.collection.mutable
import ParserUtil._

/** LenMa (Shima, 2016): clustering by word-length vectors.
  *
  * Each cluster keeps a template and the vector of its tokens' character
  * lengths; a log joins the cluster with the highest cosine similarity of
  * length vectors (same token count, sim ≥ threshold), wildcarding mismatched
  * positions. Length vectors blur distinct messages whose words merely share
  * lengths — the weakness the paper notes.
  */
final class LenMa(threshold: Double = 0.9) extends LogParser {
  override def name: String = "LenMa"

  private final class Cluster(var template: Array[String], var lengths: Array[Double], val id: Int)

  override def parse(input: ParseInput): Array[Int] = {
    val byLen = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Cluster]]
    var nextId = 0
    val out = new Array[Int](input.tokens.length)

    var li = 0
    while (li < input.tokens.length) {
      val toks = input.tokens(li)
      val vec = toks.map(_.length.toDouble)
      val clusters = byLen.getOrElseUpdate(toks.length, mutable.ArrayBuffer.empty)
      var best: Cluster = null
      var bestSim = -1.0
      clusters.foreach { c =>
        // published LenMa also requires the positions whose word lengths
        // already agree with the template to carry the same tokens
        val s = cosine(c.lengths, vec)
        if (s > bestSim && tokensCompatible(c.template, toks)) { bestSim = s; best = c }
      }
      if (best != null && bestSim >= threshold) {
        best.template = mergeTemplate(best.template, toks)
        var i = 0
        while (i < vec.length) {
          if (best.template(i) == Wildcard) best.lengths(i) = 0.0
          i += 1
        }
        out(li) = best.id
      } else {
        val c = new Cluster(toks.clone(), vec, nextId)
        nextId += 1
        clusters += c
        out(li) = c.id
      }
      li += 1
    }
    out
  }

  /** LenMa's "exact token match" check: at positions where the template is
    * not yet a wildcard and the candidate token has the same character
    * length, the tokens themselves must match in at least half the cases.
    */
  private def tokensCompatible(tpl: Array[String], toks: Array[String]): Boolean = {
    var considered = 0
    var same = 0
    var i = 0
    while (i < tpl.length) {
      if (tpl(i) != Wildcard && tpl(i).length == toks(i).length) {
        considered += 1
        if (tpl(i) == toks(i)) same += 1
      }
      i += 1
    }
    considered == 0 || same * 2 >= considered
  }

  private def cosine(a: Array[Double], b: Array[Double]): Double = {
    var dot = 0.0; var na = 0.0; var nb = 0.0; var i = 0
    while (i < a.length) { dot += a(i) * b(i); na += a(i) * a(i); nb += b(i) * b(i); i += 1 }
    if (na == 0 || nb == 0) 0.0 else dot / math.sqrt(na * nb)
  }
}
