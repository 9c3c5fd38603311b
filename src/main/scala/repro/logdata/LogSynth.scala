package repro.logdata

import scala.collection.mutable
import scala.util.Random

import org.apache.spark.sql.{DataFrame, SparkSession}

/** Per-dataset generation knobs (see DESIGN.md §3 for the substitution
  * rationale). Template counts come straight from the paper's Table 1; the
  * structural knobs differentiate dataset difficulty the same way the real
  * corpora do.
  *
  * @param numTemplates   ground-truth template count (paper Table 1)
  * @param flavorWords    dataset-specific vocabulary mixed into templates
  * @param familyFraction fraction of templates generated as *families* —
  *                       variants sharing all tokens but one constant slot
  *                       (e.g. createUser/deleteUser); hard for parsers that
  *                       over-generalize similar lines
  * @param varDensity     expected fraction of slot positions per template
  * @param minLen/maxLen  token-count range of templates
  * @param zipfAlpha      skew of the template frequency distribution; rare
  *                       tail templates break frequency-mining baselines
  * @param listTemplates  number of templates with a variable-length list tail
  *                       (§7 limitation — costs every fixed-length parser)
  * @param unboundedSlotFraction fraction of slots with no value pool (fresh
  *                       value per record: UUID-like, defeats deduplication)
  */
final case class DatasetSpec(
    name: String,
    numTemplates: Int,
    flavorWords: Vector[String],
    familyFraction: Double = 0.3,
    varDensity: Double = 0.18,
    minLen: Int = 5,
    maxLen: Int = 14,
    zipfAlpha: Double = 1.1,
    listTemplates: Int = 1,
    unboundedSlotFraction: Double = 0.05,
    poolSize: Int = 30,
)

/** A generated corpus: raw lines plus the ground-truth template id per line. */
final case class GeneratedDataset(
    name: String,
    lines: Vector[String],
    truth: Vector[Int],
    templates: Vector[GroundTemplate],
) {
  def numLogs: Int = lines.size
  def numTemplates: Int = templates.size
  def sizeBytes: Long = lines.iterator.map(_.length.toLong + 1).sum

  def toDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    lines.zipWithIndex.map { case (l, i) => (i.toLong, l, truth(i)) }
      .toDF("log_id", "message", "truth_id")
  }
}

/** Deterministic synthetic log generator — the LogHub / LogHub-2.0 substitute. */
object LogSynth {

  /** Build the ground-truth template set for a spec (deterministic in seed). */
  def buildTemplates(spec: DatasetSpec, seed: Long): Vector[GroundTemplate] = {
    val rng = new Random(seed ^ spec.name.hashCode.toLong)
    val vocab = spec.flavorWords ++ Words.generic
    val out = mutable.ArrayBuffer.empty[GroundTemplate]

    // One shared pool size per template: slots render correlated values via a
    // common index (see GroundTemplate), so every slot's distinct count equals
    // the template's unique-line count — the statistical signature of a true
    // variable that §4.5's "likely variable" scoring keys on.
    def freshSlot(poolSize: Int): Tok.Slot = {
      val kind = SlotKind.all(rng.nextInt(SlotKind.all.size))
      if (rng.nextDouble() < spec.unboundedSlotFraction) Tok.Slot(kind, Vector.empty)
      else {
        val pool = mutable.LinkedHashSet.empty[String]
        var attempts = 0
        while (pool.size < poolSize && attempts < poolSize * 20) {
          pool += SlotKind.render(kind, rng)
          attempts += 1
        }
        Tok.Slot(kind, pool.toVector)
      }
    }

    def baseTokens(): Vector[Tok.T] = {
      val len = spec.minLen + rng.nextInt(spec.maxLen - spec.minLen + 1)
      val poolSize = 24 + rng.nextInt(math.max(1, spec.poolSize))
      val slotCount = math.max(0, math.min(len / 3,
        Math.round(len * spec.varDensity * (0.5 + rng.nextDouble())).toInt))
      val slotPositions = rng.shuffle((1 until len).toList).take(slotCount).toSet
      (0 until len).map { i =>
        if (slotPositions.contains(i)) freshSlot(poolSize)
        else Tok.Const(vocab(rng.nextInt(vocab.size)))
      }.toVector
    }

    while (out.size < spec.numTemplates) {
      val remaining = spec.numTemplates - out.size
      if (remaining >= 2 && rng.nextDouble() < spec.familyFraction) {
        // family: k variants of one base differing in a single constant slot.
        // The differing slot is biased toward the front of the message — real
        // families differ in an early verb ("Starting"/"Stopping",
        // "Received"/"Receiving"), which is also what lets prefix-routing
        // parsers like Drain tell them apart on the real corpora.
        val base = baseTokens()
        val constPositions = base.indices.filter(i => base(i).isInstanceOf[Tok.Const])
        val early = constPositions.filter(_ <= math.max(1, base.length / 3))
        val candidates = if (early.nonEmpty && rng.nextDouble() < 0.7) early else constPositions
        val fpos = candidates(rng.nextInt(candidates.size))
        val k = math.min(remaining, 2 + rng.nextInt(4))
        val variants = rng.shuffle(Words.actions ++ spec.flavorWords).distinct.take(k)
        variants.foreach { w =>
          out += GroundTemplate(out.size, base.updated(fpos, Tok.Const(w)))
        }
      } else {
        out += GroundTemplate(out.size, baseTokens())
      }
    }

    out.toVector
  }

  /** Zipf weights over templates: rank r gets 1/r^alpha (ranks shuffled so the
    * heavy templates are arbitrary, not the first-generated ones).
    */
  private def zipfCdf(n: Int, alpha: Double, rng: Random): Array[Double] = {
    val ranks = rng.shuffle((1 to n).toVector)
    val w = ranks.map(r => 1.0 / math.pow(r.toDouble, alpha)).toArray
    val total = w.sum
    val cdf = new Array[Double](n)
    var acc = 0.0
    var i = 0
    while (i < n) { acc += w(i) / total; cdf(i) = acc; i += 1 }
    cdf(n - 1) = 1.0
    cdf
  }

  /** Generate `numLogs` lines for a spec. Deterministic in (spec, seed). */
  def generate(spec: DatasetSpec, numLogs: Int, seed: Long = 7L): GeneratedDataset = {
    val fixed = buildTemplates(spec, seed)
    val rng = new Random(seed * 31 + spec.name.hashCode.toLong)
    val cdf = zipfCdf(fixed.size, spec.zipfAlpha, rng)

    // Variable-length list templates (§7) go to the Zipf tail: dynamic-list
    // print statements are rare in real corpora, and their tails render fresh
    // high-cardinality values (a printed list of ids, not an enum).
    val templates: Vector[GroundTemplate] =
      if (spec.listTemplates <= 0 || fixed.isEmpty) fixed
      else {
        val weight = cdf.indices.map(i => if (i == 0) cdf(0) else cdf(i) - cdf(i - 1))
        val lightest = weight.zipWithIndex.sortBy(_._1).take(spec.listTemplates).map(_._2).toSet
        fixed.map { t =>
          if (lightest.contains(t.id)) t.copy(listTail = Some(Tok.Slot(SlotKind.Id, Vector.empty)))
          else t
        }
      }

    val lines = Vector.newBuilder[String]
    val truth = Vector.newBuilder[Int]
    var i = 0
    while (i < numLogs) {
      val u = rng.nextDouble()
      var t = java.util.Arrays.binarySearch(cdf, u)
      if (t < 0) t = -t - 1
      if (t >= templates.size) t = templates.size - 1
      lines += templates(t).render(rng)
      truth += t
      i += 1
    }
    GeneratedDataset(spec.name, lines.result(), truth.result(), templates)
  }
}
