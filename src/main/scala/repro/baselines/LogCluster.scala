package repro.baselines

import scala.collection.mutable

/** LogCluster (Lin et al., ICSE-C'16): word-frequency-based log clustering.
  *
  * Each log becomes a weighted bag of words (weight = inverse document
  * frequency); agglomerative assignment joins the first cluster whose
  * representative vector has cosine similarity above the threshold. Because
  * word *order* is discarded, messages sharing word distributions collapse —
  * the weakness the paper calls out — but the method is very fast, matching
  * its role as the fastest baseline in §5.3.
  */
final class LogCluster(threshold: Double = 0.92) extends LogParser {
  override def name: String = "LogCluster"

  override def parse(input: ParseInput): Array[Int] = {
    val n = input.tokens.length
    val out = new Array[Int](n)

    // document frequency per token; Lin et al. weight *common* words up so
    // rare variable values do not dominate the vectors
    val df = mutable.HashMap.empty[String, Int]
    input.tokens.foreach { toks =>
      toks.toSet[String].foreach(t => df.update(t, df.getOrElse(t, 0) + 1))
    }
    def idf(t: String): Double = 0.1 + df.getOrElse(t, 1).toDouble / n

    // cluster representatives: sparse weighted bags
    val reps = mutable.ArrayBuffer.empty[mutable.HashMap[String, Double]]
    val repNorm = mutable.ArrayBuffer.empty[Double]

    var li = 0
    while (li < n) {
      val bag = mutable.HashMap.empty[String, Double]
      input.tokens(li).foreach { t =>
        bag.update(t, bag.getOrElse(t, 0.0) + idf(t))
      }
      val norm = math.sqrt(bag.valuesIterator.map(v => v * v).sum)

      var best = -1; var bestSim = -1.0
      var c = 0
      while (c < reps.length) {
        val r = reps(c)
        var dot = 0.0
        bag.foreach { case (t, w) => dot += w * r.getOrElse(t, 0.0) }
        val sim = if (norm == 0 || repNorm(c) == 0) 0.0 else dot / (norm * repNorm(c))
        if (sim > bestSim) { bestSim = sim; best = c }
        c += 1
      }
      if (best >= 0 && bestSim >= threshold) out(li) = best
      else {
        reps += bag
        repNorm += norm
        out(li) = reps.length - 1
      }
      li += 1
    }
    out
  }
}
