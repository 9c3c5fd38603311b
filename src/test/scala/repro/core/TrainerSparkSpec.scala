package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.eval.GroupingAccuracy
import repro.logdata.Datasets

/** Distributed training/matching/query over Spark, with DuckDB oracle checks
  * on every aggregation-shaped result (dedup counts, grouping histogram, GA).
  */
class TrainerSparkSpec extends SparkSpec {
  private val cfg = ByteBrainConfig()
  private lazy val ds = Datasets.loghub("HDFS")
  private lazy val logsDf: DataFrame = ds.toDF(spark).cache()

  import spark.implicits._

  test("dedup counts match DuckDB (paper §4.1.3)") {
    val sparkDedup = logsDf.groupBy($"message").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkDedup,
      "SELECT message, COUNT(*) AS cnt FROM logs GROUP BY message",
      "logs" -> logsDf.select("message"))
  }

  test("initial grouping histogram (token count) matches DuckDB (§4.2)") {
    val patterns = cfg.variablePatterns
    val regex = cfg.tokenizerRegex
    val lenUdf = udf { (msg: String) =>
      new Tokenizer(regex).tokenize(CommonVariables.replace(msg, patterns)).length
    }
    val tokenized = logsDf.select(lenUdf($"message").as("len"))
    val sparkHist = tokenized.groupBy($"len").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkHist,
      "SELECT len, COUNT(*) AS cnt FROM lens GROUP BY len",
      "lens" -> tokenized)
  }

  test("Spark training equals local training (same templates, counts, tree)") {
    val distributed = Trainer.train(spark, logsDf, cfg)
    val local = ByteBrain.trainLocal(ds.lines, cfg)
    def canon(m: TemplateModel) =
      m.nodes.map(n => (n.groupKey, n.templateText, n.depth, n.count, n.saturation)).toSet
    assert(canon(distributed) == canon(local))
  }

  test("matchDf matches every trained log to a template") {
    val model = Trainer.train(spark, logsDf, cfg)
    val matched = ByteBrain.matchDf(spark, model, logsDf, cfg).cache()
    assert(matched.where($"template_id" < 0).count() == 0)
    assert(matched.count() == ds.numLogs)
    val sats = matched.select(min($"saturation"), max($"saturation")).head()
    assert(sats.getDouble(0) >= 0.0 && sats.getDouble(1) <= 1.0)
  }

  test("match counts per template match DuckDB") {
    val model = Trainer.train(spark, logsDf, cfg)
    val matched = ByteBrain.matchDf(spark, model, logsDf, cfg)
      .select($"template_id".cast("string").as("tid")).cache()
    val sparkCounts = matched.groupBy($"tid").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      sparkCounts,
      "SELECT tid, COUNT(*) AS cnt FROM m GROUP BY tid",
      "m" -> matched)
  }

  test("GA via Spark aggregation equals the local GA and the DuckDB oracle") {
    val model = Trainer.train(spark, logsDf, cfg)
    val matched = ByteBrain.matchDf(spark, model, logsDf, cfg)
    val bc = spark.sparkContext.broadcast(model)
    val resolveUdf = udf((id: Int) => Query.resolve(bc.value, id, 0.9).id)
    val assignments = matched
      .select(resolveUdf($"template_id").as("pred"), $"truth_id".as("truth"))
      .cache()

    // Spark GA == local GA
    val sparkGa = GroupingAccuracy.computeDf(spark, assignments)
    val rows = assignments.collect()
    val localGa = GroupingAccuracy.compute(
      rows.map(_.getInt(0)).toIndexedSeq, rows.map(_.getInt(1)).toIndexedSeq)
    assert(math.abs(sparkGa - localGa) < 1e-12)

    // correct-log count re-derived in DuckDB SQL
    val sparkCorrect = {
      val pred = assignments.groupBy($"pred")
        .agg(count(lit(1)).as("psize"), countDistinct($"truth").as("nt"), first($"truth").as("t"))
      val ts = assignments.groupBy($"truth".as("t2")).agg(count(lit(1)).as("tsize"))
      pred.where($"nt" === 1).join(ts, $"t" === $"t2").where($"psize" === $"tsize")
        .agg(coalesce(sum($"psize"), lit(0L)).cast("long").as("correct"))
    }
    Oracle.assertEquivalent(
      sparkCorrect,
      """WITH p AS (SELECT pred, COUNT(*) AS psize, COUNT(DISTINCT truth) AS nt,
        |                  MIN(truth) AS t FROM a GROUP BY pred),
        |     ts AS (SELECT truth AS t2, COUNT(*) AS tsize FROM a GROUP BY truth)
        |SELECT CAST(COALESCE(SUM(psize), 0) AS BIGINT) AS correct
        |FROM p JOIN ts ON p.t = ts.t2 WHERE nt = 1 AND psize = tsize""".stripMargin,
      "a" -> assignments)
  }

  test("distributed GA on HDFS-lite reaches the paper's band") {
    val model = Trainer.train(spark, logsDf, cfg)
    val matched = ByteBrain.matchDf(spark, model, logsDf, cfg)
    val bc = spark.sparkContext.broadcast(model)
    val resolveUdf = udf((id: Int) => Query.resolve(bc.value, id, 0.9).id)
    val assignments = matched
      .select(resolveUdf($"template_id").as("pred"), $"truth_id".as("truth"))
    val ga = GroupingAccuracy.computeDf(spark, assignments)
    assert(ga > 0.85, f"GA=$ga%.3f")
  }

  test("queryDf resolves to coarser templates at low thresholds") {
    val model = Trainer.train(spark, logsDf, cfg)
    val matched = ByteBrain.matchDf(spark, model, logsDf, cfg)
    val coarse = ByteBrain.queryDf(spark, model, matched, 0.1)
    val fine = ByteBrain.queryDf(spark, model, matched, 1.0)
    val nCoarse = coarse.select(countDistinct($"query_template_id")).head().getLong(0)
    val nFine = fine.select(countDistinct($"query_template_id")).head().getLong(0)
    assert(nCoarse <= nFine)
    assert(nCoarse > 0)
  }

  test("sampling caps the trained volume on oversized topics (§3)") {
    val c = cfg.copy(sampleMaxLogs = 500)
    val model = Trainer.train(spark, logsDf, c)
    assert(model.nodes.filter(_.isRoot).map(_.count).sum <= 600) // fraction sampling jitter
  }
}
