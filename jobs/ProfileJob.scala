package repro.jobs

import repro.baselines.ParseInput
import repro.core._
import repro.logdata.Datasets

/** Phase-level timing breakdown of the local ByteBrain pipeline (debug aid).
  * Usage: ProfileJob [dataset] [loghub|loghub2]
  */
object ProfileJob {
  def main(args: Array[String]): Unit = {
    val name = if (args.nonEmpty) args(0) else "Thunderbird"
    val suite = if (args.length > 1) args(1) else "loghub2"
    val ds = if (suite == "loghub2") Datasets.loghub2(name) else Datasets.loghub(name)
    val cfg = ByteBrainConfig()

    def time[A](label: String)(f: => A): A = {
      val t0 = System.nanoTime(); val r = f
      println(f"$label%-24s ${(System.nanoTime() - t0) / 1e9}%.3fs")
      r
    }

    (0 until 3).foreach { round =>
      println(s"--- round $round (${ds.numLogs} logs)")
      val input = time("preprocess")(ParseInput.of(ds, cfg))
      val model = time("train")(ByteBrain.trainLocalTokens(input.tokens.toIndexedSeq, cfg))
      println(s"  model nodes=${model.size} maxDepth=${model.maxDepth} " +
        s"uniques=${input.tokens.map(_.mkString(" ")).distinct.size}")
      val matcher = time("compile matcher")(new CompiledMatcher(model))
      time("match") {
        val cache = scala.collection.mutable.HashMap.empty[String, Int]
        input.tokens.foreach { t =>
          cache.getOrElseUpdate(t.mkString(" "), matcher.matchTokens(t).map(_.id).getOrElse(-1))
        }
      }
    }
  }
}
