package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{ByteBrain, ByteBrainConfig, ModelCodec}
import repro.logdata.{DatasetSpec, LogSynth}

/** Reproduces the paper's Table 5: production performance on TLS topics —
  * per-topic log volume, trained model size and training time. Production
  * traffic is unavailable (privacy), so each scenario is a synthetic topic
  * with the character the paper names (DESIGN.md §3): a simple high-duplication
  * text stream, two web-server access-log topics, and two Go-service topics.
  * Volumes are tens of MB rather than MB/s×seconds of a production stream;
  * the claims under test are shape claims: training completes in seconds and
  * the model is a few MB regardless of volume.
  */
class Table5Bench extends AnyFunSuite {

  private def spec(name: String, templates: Int, fam: Double, varDen: Double,
                   minLen: Int, maxLen: Int): DatasetSpec =
    DatasetSpec(name, templates, Vector("http", "GET", "POST", "status", "latency",
      "query", "shard", "index", "route", "handler", "search", "rank", "fetch"),
      familyFraction = fam, varDensity = varDen, minLen = minLen, maxLen = maxLen,
      listTemplates = 0)

  // (scenario, spec, lines, paper volume, paper model size, paper train time)
  private val scenarios = Seq(
    ("Text stream processing", spec("TextStream", 40, 0.1, 0.1, 6, 10), 120000,
      "189 MB/s", "3 MB", "0.91s"),
    ("Webserver access log", spec("AccessLogA", 400, 0.2, 0.25, 8, 14), 100000,
      "57.8 MB/s", "10 MB", "7.98s"),
    ("Webserver access log (2)", spec("AccessLogB", 120, 0.2, 0.25, 8, 14), 80000,
      "47.7 MB/s", "3 MB", "1.02s"),
    ("Go HTTP API server", spec("GoHttp", 250, 0.25, 0.2, 7, 13), 60000,
      "3.51 MB/s", "7 MB", "1.65s"),
    ("Go search server", spec("GoSearch", 250, 0.25, 0.2, 9, 15), 50000,
      "2.46 MB/s", "7 MB", "4.64s"),
  )

  test("Table 5: production-style topics — volume, model size, training time") {
    println("=== Table 5: performance on production-style topics (synthetic substitute) ===")
    println("Topic Scenario\tVolume\tModel Size\tTraining Time\tTrain MB/s\t(paper: volume/model/time)")
    val cfg = ByteBrainConfig()
    scenarios.foreach { case (label, sp, lines, pVol, pModel, pTime) =>
      val ds = LogSynth.generate(sp, lines, seed = 29)
      val mb = ds.sizeBytes / 1048576.0
      val t0 = System.nanoTime()
      val model = ByteBrain.trainLocal(ds.lines, cfg)
      val secs = (System.nanoTime() - t0) / 1e9
      val modelMb = ModelCodec.sizeInBytes(model) / 1048576.0
      println(f"$label\t$mb%.1f MB\t$modelMb%.2f MB\t$secs%.2fs\t${mb / secs}%.1f MB/s" +
        f"\t($pVol / $pModel / $pTime)")

      // the paper's shape claims
      assert(secs < 60.0, s"$label: training must complete in seconds, took $secs")
      assert(modelMb < 20.0, s"$label: model must be a few MB, was $modelMb")
      assert(ModelCodec.sizeInBytes(model) < ds.sizeBytes / 5,
        s"$label: model must be far smaller than the raw logs")
      assert(model.size > 0)
    }
  }

  test("Table 5 follow-up: most-precise template count is in the production band") {
    // paper §6: templates with saturation >= 0.9 typically number 1k–10k per
    // topic; our scaled topics sit proportionally lower but well above 10
    val ds = LogSynth.generate(scenarios(1)._2, 60000, seed = 29)
    val model = ByteBrain.trainLocal(ds.lines, ByteBrainConfig())
    val precise = model.nodes.count(_.effectiveSaturation >= 0.9)
    println(s"templates with saturation >= 0.9: $precise (paper band: 1,000-10,000 at full scale)")
    assert(precise > 100 && precise < 100000)
  }
}
