package repro.core

import java.util.concurrent.{Callable, Executors, TimeUnit}
import scala.collection.mutable
import scala.jdk.CollectionConverters._

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** End-to-end ByteBrain facade.
  *
  * `train`/`matchDf` are the distributed Spark paths (the repro target);
  * `trainLocal`/`parseLocal` are driver-local equivalents used by the
  * per-dataset accuracy and throughput benches — the paper's own evaluation
  * harness is likewise single-machine (§5.3), with groups clustered on a
  * small thread pool (§3 "Parallel": 1–5 cores in production).
  */
object ByteBrain {

  // ---------------------------------------------------------------- local path

  /** Preprocess one message: common variable replacement + tokenization. */
  def preprocess(message: String, cfg: ByteBrainConfig, tokenizer: Tokenizer): Array[String] =
    tokenizer.tokenize(CommonVariables.replace(message, cfg.variablePatterns))

  /** Offline training on an in-memory batch (sample → dedup → group → cluster). */
  def trainLocal(messages: IterableOnce[String], cfg: ByteBrainConfig,
                 parallelism: Int = Runtime.getRuntime.availableProcessors()): TemplateModel = {
    val tokenizer = new Tokenizer(cfg.tokenizerRegex)
    trainLocalTokens(messages.iterator.map(preprocess(_, cfg, tokenizer)).toIndexedSeq,
      cfg, parallelism)
  }

  /** Training on already-preprocessed token sequences — the entry the
    * evaluation harness uses so preprocessing is paid exactly once.
    */
  def trainLocalTokens(tokensIn: IndexedSeq[Array[String]], cfg: ByteBrainConfig,
                       parallelism: Int = Runtime.getRuntime.availableProcessors()): TemplateModel =
    trainLocalWeighted(tokensIn.map(t => (t, 1L)), cfg, parallelism)

  /** Training on (tokens, multiplicity) rows — multiplicities arriving from
    * upstream raw-line deduplication fold into the §4.1.3 dedup.
    */
  def trainLocalWeighted(rowsIn: IndexedSeq[(Array[String], Long)], cfg: ByteBrainConfig,
                         parallelism: Int = Runtime.getRuntime.availableProcessors()): TemplateModel = {
    // §3: exceptionally large volumes are randomly sampled to bound memory —
    // counts are scaled with deterministic stochastic rounding so rows with
    // small multiplicities drop out proportionally instead of all surviving
    val totalIn = rowsIn.iterator.map(_._2).sum
    val sampled =
      if (totalIn <= cfg.sampleMaxLogs || rowsIn.isEmpty) rowsIn
      else {
        val scale = cfg.sampleMaxLogs.toDouble / totalIn
        rowsIn.flatMap { case (t, c) =>
          // murmur finalizer: FNV's raw high bits are not uniform enough
          var h = HashEncoder.hash64(t.mkString(" ") + cfg.seed)
          h ^= h >>> 33; h *= 0xff51afd7ed558ccdL
          h ^= h >>> 33; h *= 0xc4ceb9fe1a85ec53L
          h ^= h >>> 33
          val u = (h >>> 11).toDouble / (1L << 53).toDouble
          val c2 = math.floor(c * scale + u).toLong
          if (c2 <= 0) None else Some((t, c2))
        }
      }

    // dedup (§4.1.3) — or unit-count rows when the ablation disables it
    val counts = mutable.LinkedHashMap.empty[String, (Array[String], Long)]
    val rows = mutable.ArrayBuffer.empty[(Array[String], Long)]
    sampled.foreach { case (toks, cnt) =>
      if (toks.nonEmpty) {
        if (cfg.dedup) {
          val key = toks.mkString(" ")
          counts.updateWith(key) {
            case Some((t, c)) => Some((t, c + cnt))
            case None         => Some((toks, cnt))
          }
        } else rows += ((toks, cnt))
      }
    }
    val deduped: Iterator[(Array[String], Long)] =
      if (cfg.dedup) counts.valuesIterator else rows.iterator

    // initial grouping (§4.2)
    val groups = mutable.LinkedHashMap.empty[(Int, List[String]), mutable.ArrayBuffer[UniqueLog]]
    deduped.foreach { case (tokens, cnt) =>
      val key = (tokens.length, tokens.take(cfg.prefixTokens).toList)
      groups.getOrElseUpdate(key, mutable.ArrayBuffer.empty) += UniqueLog(tokens, cnt)
    }

    // per-group hierarchical clustering, groups in parallel (§3 "Parallel")
    val pool = Executors.newFixedThreadPool(math.max(1, parallelism))
    try {
      val tasks = groups.toSeq.map { case ((len, prefix), logs) =>
        new Callable[Seq[LocalNode]] {
          override def call(): Seq[LocalNode] = {
            val gk = GroupKey(len, prefix)
            HierarchicalClustering.buildGroupTree(gk, logs.toIndexedSeq, cfg).map { n =>
              LocalNode(len, prefix, n.id, n.parentId, n.template, n.saturation,
                n.effectiveSaturation, n.depth, n.count)
            }
          }
        }
      }
      val results = pool.invokeAll(tasks.asJava).asScala.toSeq.flatMap(_.get())
      Trainer.assemble(results)
    } finally {
      pool.shutdown()
      pool.awaitTermination(1, TimeUnit.MINUTES)
    }
  }

  /** Train + match a batch locally, returning the model and the matched
    * template id per input message (the grouping the GA metric scores).
    * Matching dedups the batch first — each unique log is matched once.
    */
  def parseLocal(messages: IndexedSeq[String], cfg: ByteBrainConfig,
                 parallelism: Int = Runtime.getRuntime.availableProcessors()): (TemplateModel, Array[Int]) = {
    val tokenizer = new Tokenizer(cfg.tokenizerRegex)
    parseLocalTokens(messages.map(preprocess(_, cfg, tokenizer)), cfg, parallelism)
  }

  /** Train + match over already-preprocessed token sequences. */
  def parseLocalTokens(tokens: IndexedSeq[Array[String]], cfg: ByteBrainConfig,
                       parallelism: Int = Runtime.getRuntime.availableProcessors()): (TemplateModel, Array[Int]) = {
    val model = trainLocalTokens(tokens, cfg, parallelism)
    val matcher = new OnlineMatcher(model)
    val cache = mutable.HashMap.empty[String, Int]
    val out = new Array[Int](tokens.length)
    var i = 0
    while (i < tokens.length) {
      val toks = tokens(i)
      out(i) = cache.getOrElseUpdate(toks.mkString(" "), matcher.matchOrInsert(toks).id)
      i += 1
    }
    (model, out)
  }

  /** The fast raw-line pipeline: deduplicate *raw* records first (§4.1.3),
    * then preprocess, train on and match only the unique lines. Log streams
    * are massively repetitive (paper Fig. 4), so this removes most of the
    * per-record regex/tokenization cost — a key part of ByteBrain's measured
    * throughput edge over per-line streaming parsers. Disabled by the
    * `dedup = false` ablation, which degrades to the per-line path.
    */
  def parseLocalRaw(lines: IndexedSeq[String], cfg: ByteBrainConfig,
                    parallelism: Int = Runtime.getRuntime.availableProcessors()): (TemplateModel, Array[Int]) = {
    if (!cfg.dedup) return parseLocal(lines, cfg, parallelism)

    val uniqIdxOf = new Array[Int](lines.length)
    val uniqLines = mutable.ArrayBuffer.empty[String]
    val counts = mutable.ArrayBuffer.empty[Long]
    val index = mutable.HashMap.empty[String, Int]
    var i = 0
    while (i < lines.length) {
      val id = index.getOrElseUpdate(lines(i), {
        uniqLines += lines(i); counts += 0L; uniqLines.size - 1
      })
      counts(id) += 1L
      uniqIdxOf(i) = id
      i += 1
    }

    val tokenizer = new Tokenizer(cfg.tokenizerRegex)
    val uniqTokens = uniqLines.map(preprocess(_, cfg, tokenizer)).toIndexedSeq
    val model = trainLocalWeighted(
      uniqTokens.zip(counts).filter(_._1.nonEmpty), cfg, parallelism)

    val matcher = new OnlineMatcher(model)
    val matchedPerUnique = uniqTokens.map { toks =>
      if (toks.isEmpty) -1 else matcher.matchOrInsert(toks).id
    }
    (model, uniqIdxOf.map(matchedPerUnique))
  }

  // ---------------------------------------------------------------- spark path

  /** Distributed training (see [[Trainer]]). */
  def train(spark: SparkSession, logs: DataFrame, cfg: ByteBrainConfig,
            messageCol: String = "message"): TemplateModel =
    Trainer.train(spark, logs, cfg, messageCol)

  /** Online matching as a Spark job: broadcast the compiled model and map
    * every log to (templateId, saturation, templateText). Unmatched logs get
    * templateId −1 (they would become temporary singletons in the service).
    */
  def matchDf(spark: SparkSession, model: TemplateModel, logs: DataFrame, cfg: ByteBrainConfig,
              messageCol: String = "message"): DataFrame = {
    val bc = spark.sparkContext.broadcast(new CompiledMatcher(model))
    val patterns = cfg.variablePatterns
    val regex = cfg.tokenizerRegex
    val matchUdf = udf { (msg: String) =>
      val toks = new Tokenizer(regex).tokenize(CommonVariables.replace(if (msg == null) "" else msg, patterns))
      bc.value.matchTokens(toks) match {
        case Some(n) => (n.id, n.effectiveSaturation, n.templateText)
        case None    => (-1, 0.0, null: String)
      }
    }
    logs.withColumn("_m", matchUdf(col(messageCol)))
      .withColumn("template_id", col("_m._1"))
      .withColumn("saturation", col("_m._2"))
      .withColumn("template", col("_m._3"))
      .drop("_m")
  }

  /** Query-time precision adjustment over a matched DataFrame: map each
    * matched template id to the coarsest ancestor meeting `threshold` (§3
    * "Query") using the broadcast parent chain.
    */
  def queryDf(spark: SparkSession, model: TemplateModel, matched: DataFrame,
              threshold: Double): DataFrame = {
    val bc = spark.sparkContext.broadcast(model)
    val resolveUdf = udf { (id: Int) =>
      if (id < 0) (-1, null: String)
      else {
        val n = Query.resolve(bc.value, id, threshold)
        (n.id, Query.mergeConsecutiveWildcards(n.template).mkString(" "))
      }
    }
    matched.withColumn("_q", resolveUdf(col("template_id")))
      .withColumn("query_template_id", col("_q._1"))
      .withColumn("query_template", col("_q._2"))
      .drop("_q")
  }
}
