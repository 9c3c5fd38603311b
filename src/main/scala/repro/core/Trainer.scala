package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

/** Flat, Encoder-friendly form of a template node emitted by executors;
  * ids are local to the initial group and re-based globally on the driver.
  */
final case class LocalNode(
    groupLen: Int,
    groupPrefix: Seq[String],
    localId: Int,
    parentLocalId: Int,
    template: Seq[String],
    saturation: Double,
    effectiveSaturation: Double,
    depth: Int,
    count: Long,
)

/** Offline training as a Spark job (paper §3 "Offline Training", §4.1–4.7).
  *
  * The dataflow mirrors the paper's pipeline, distributed over partitioned log
  * files:
  *
  *  1. common variable replacement — native `regexp_replace` chain (§4.1.2);
  *  2. tokenization — UDF over the message column (§4.1.1);
  *  3. deduplication — `groupBy(tokens).count()` (§4.1.3), the first shuffle;
  *  4. initial grouping by (token count, k-token prefix) — `groupByKey` (§4.2),
  *     the second shuffle;
  *  5. per-group hash encoding + hierarchical clustering inside
  *     `flatMapGroups` — groups are independent, so Spark parallelizes them
  *     across cores exactly as §3 "Parallel" describes;
  *  6. the collected nodes are re-based to global ids into a [[TemplateModel]].
  *
  * Exceptionally large topics are randomly sampled down to
  * `cfg.sampleMaxLogs` before training to bound memory (§3).
  */
object Trainer {

  def train(spark: SparkSession, logs: DataFrame, cfg: ByteBrainConfig,
            messageCol: String = "message"): TemplateModel = {
    import spark.implicits._

    val total = logs.count()
    val sampled =
      if (total > cfg.sampleMaxLogs)
        logs.sample(withReplacement = false, cfg.sampleMaxLogs.toDouble / total, cfg.seed)
      else logs

    val tokenizerRegex = cfg.tokenizerRegex
    val tokenizeUdf = udf { (s: String) =>
      new Tokenizer(tokenizerRegex).tokenize(if (s == null) "" else s).toSeq
    }

    val prepared: DataFrame = sampled
      .select(CommonVariables.replaceColumn(col(messageCol), cfg.variablePatterns).as("msg"))
      .select(tokenizeUdf($"msg").as("tokens"))
      .where(size($"tokens") > 0)

    val deduped: Dataset[(Seq[String], Long)] =
      if (cfg.dedup)
        prepared.groupBy($"tokens").agg(count(lit(1)).as("cnt"))
          .as[(Seq[String], Long)]
      else
        prepared.select($"tokens", lit(1L).as("cnt")).as[(Seq[String], Long)]

    val k = cfg.prefixTokens
    val localNodes: Seq[LocalNode] = deduped
      .groupByKey { case (tokens, _) => (tokens.length, tokens.take(k)) }
      .flatMapGroups { (key: (Int, Seq[String]), it: Iterator[(Seq[String], Long)]) =>
        val (len, prefix) = key
        val logs = it.map { case (tokens, cnt) =>
          UniqueLog(tokens.toArray, cnt)
        }.toIndexedSeq
        val gk = GroupKey(len, prefix)
        HierarchicalClustering.buildGroupTree(gk, logs, cfg).map { n =>
          LocalNode(len, prefix, n.id, n.parentId, n.template, n.saturation,
            n.effectiveSaturation, n.depth, n.count)
        }
      }
      .collect()
      .toSeq

    assemble(localNodes)
  }

  /** Re-base per-group local ids into one global id space (deterministic:
    * groups ordered by key, nodes by local id).
    */
  def assemble(localNodes: Seq[LocalNode]): TemplateModel = {
    val byGroup = localNodes.groupBy(n => (n.groupLen, n.groupPrefix.toList)).toSeq.sortBy(_._1.toString)
    var offset = 0
    val nodes = byGroup.flatMap { case ((len, prefix), ns) =>
      val sortedNs = ns.sortBy(_.localId)
      val base = offset
      offset += sortedNs.size
      sortedNs.map { n =>
        TemplateNode(
          id = base + n.localId,
          parentId = if (n.parentLocalId < 0) -1 else base + n.parentLocalId,
          groupKey = GroupKey(len, prefix),
          template = n.template.toIndexedSeq,
          saturation = n.saturation,
          effectiveSaturation = n.effectiveSaturation,
          depth = n.depth,
          count = n.count,
        )
      }
    }
    new TemplateModel(nodes.toVector)
  }
}
