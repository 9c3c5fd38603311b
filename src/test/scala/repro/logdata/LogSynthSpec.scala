package repro.logdata

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{ByteBrainConfig, CommonVariables, Tokenizer}

class LogSynthSpec extends AnyFunSuite {
  private val spec = DatasetSpec("TestDs", 20, Vector("alpha", "beta", "gamma"))

  test("generation is deterministic in (spec, seed)") {
    val a = LogSynth.generate(spec, 500, 7)
    val b = LogSynth.generate(spec, 500, 7)
    assert(a.lines == b.lines && a.truth == b.truth)
  }

  test("different seeds give different corpora") {
    assert(LogSynth.generate(spec, 500, 1).lines != LogSynth.generate(spec, 500, 2).lines)
  }

  test("exactly numLogs lines with aligned truth ids") {
    val ds = LogSynth.generate(spec, 321, 7)
    assert(ds.lines.size == 321 && ds.truth.size == 321)
  }

  test("template catalog has the requested size") {
    assert(LogSynth.buildTemplates(spec, 7).size == 20)
  }

  test("truth ids index into the template catalog") {
    val ds = LogSynth.generate(spec, 400, 7)
    assert(ds.truth.forall(t => t >= 0 && t < ds.numTemplates))
  }

  test("most templates are exercised at 50x oversampling") {
    val ds = LogSynth.generate(spec, 1000, 7)
    assert(ds.truth.distinct.size > spec.numTemplates / 2)
  }

  test("zipf skew: the heaviest template dominates the median one") {
    val ds = LogSynth.generate(spec.copy(zipfAlpha = 1.2), 2000, 7)
    val counts = ds.truth.groupBy(identity).map(_._2.size).toSeq.sorted
    assert(counts.last > 5 * counts(counts.size / 2))
  }

  test("rendered lines match their template's fixed token count (plus list tails)") {
    val ds = LogSynth.generate(spec, 500, 7)
    val tok = new Tokenizer()
    ds.lines.zipWithIndex.foreach { case (l, i) =>
      val t = ds.templates(ds.truth(i))
      val n = tok.tokenize(CommonVariables.replace(l)).length
      if (t.listTail.isEmpty) assert(n == t.tokens.size, s"line '$l' vs template $t")
      else assert(n >= t.tokens.size + 1 && n <= t.tokens.size + 3)
    }
  }

  test("slot values are single tokens under the default tokenizer") {
    val tok = new Tokenizer()
    val rng = new scala.util.Random(3)
    SlotKind.all.foreach { kind =>
      (0 until 50).foreach { _ =>
        val v = SlotKind.render(kind, rng)
        assert(tok.tokenize(v).length == 1, s"$kind value '$v' splits")
      }
    }
  }

  test("correlated pools: a template's unique-line count stays near its pool size") {
    val s2 = spec.copy(familyFraction = 0.0, unboundedSlotFraction = 0.0, listTemplates = 0)
    val ds = LogSynth.generate(s2, 2000, 7)
    // heavy dedup: far fewer unique lines than lines (paper Fig. 4)
    assert(ds.lines.distinct.size < ds.lines.size / 2)
  }

  test("family templates share all but one token") {
    val templates = LogSynth.buildTemplates(spec.copy(familyFraction = 1.0, numTemplates = 10), 7)
    // at least one pair of templates differs in exactly one position
    val sameShape = for {
      a <- templates; b <- templates if a.id < b.id && a.tokens.size == b.tokens.size
      diff = a.tokens.zip(b.tokens).count { case (x, y) => x != y }
      if diff == 1
    } yield (a, b)
    assert(sameShape.nonEmpty)
  }

  test("sizeBytes counts line bytes") {
    val ds = LogSynth.generate(spec, 100, 7)
    assert(ds.sizeBytes == ds.lines.map(_.length + 1).sum.toLong)
  }

  test("ground-truth variable mask aligns with rendered slots") {
    val ds = LogSynth.generate(spec.copy(listTemplates = 0), 300, 7)
    val input = repro.baselines.ParseInput.of(ds, ByteBrainConfig())
    input.tokens.indices.take(100).foreach { i =>
      val mask = input.groundTruth.get.variableMask(i)
      assert(mask.length == input.tokens(i).length)
    }
  }
}
