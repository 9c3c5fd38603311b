package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.baselines.{LogParser, ParseInput}
import repro.logdata.{DatasetSpec, LogSynth}

class HarnessSpec extends AnyFunSuite {
  private val ds = LogSynth.generate(DatasetSpec("Tiny", 5, Vector("w1", "w2")), 200, 3)

  private final class Constant extends LogParser {
    override def name = "Const"
    override def parse(input: ParseInput): Array[Int] = Array.fill(input.lines.size)(0)
  }

  private final class Sleeper extends LogParser {
    override def name = "Sleeper"
    override def parse(input: ParseInput): Array[Int] = {
      Thread.sleep(60_000); Array.empty
    }
  }

  test("evaluate computes GA and timing for a finishing parser") {
    val r = Harness.evaluate(new Constant, ds, timeoutSec = 30)
    assert(r.finished)
    assert(r.ga >= 0.0 && r.ga <= 1.0)
    assert(r.seconds > 0 && r.numLogs == 200)
  }

  test("evaluate times out a stuck parser and reports not-finished") {
    val r = Harness.evaluate(new Sleeper, ds, timeoutSec = 1)
    assert(!r.finished)
    assert(r.ga == 0.0)
  }

  test("throughput = logs / adjusted seconds") {
    val r = MethodResult("m", "d", 1.0, 2.0, 4.0, 100, finished = true)
    assert(r.throughput == 25.0)
  }

  test("formatRow renders missing cells as backslash") {
    val row = Harness.formatRow("X", Seq(Some(0.5), None, Some(1.0)))
    assert(row.startsWith("X\t0.50\t\\\t1.00"))
    assert(row.endsWith("0.75±0.25"))
  }

  test("formatRow with all-missing shows backslash mean") {
    assert(Harness.formatRow("X", Seq(None, None)).endsWith("\\"))
  }
}
