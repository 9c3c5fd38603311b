package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.logdata.Datasets

/** Reproduces the paper's Table 1: LogHub / LogHub-2.0 dataset statistics.
  *
  * Template counts are identical to the paper's by construction; line counts
  * for LogHub-2.0 are the documented 1/50 scale (clamped to [4k, 80k]) of the
  * paper's, with the paper's counts printed alongside for the diff.
  */
class Table1Bench extends AnyFunSuite {

  private def fmtSize(bytes: Long): String =
    if (bytes >= (1L << 20)) f"${bytes / 1048576.0}%.2f MB" else f"${bytes / 1024.0}%.2f KB"

  test("Table 1: dataset statistics (synthetic LogHub substitute)") {
    println("=== Table 1: LogHub and LogHub-2.0 dataset statistics (synthetic substitute) ===")
    println("Dataset\tLH#Logs\tLH-Size\tLH#Tpl\tLH2#Logs(scaled)\tLH2#Logs(paper)\tLH2-Size\tLH2#Tpl")
    Datasets.loghubNames.foreach { name =>
      val small = BenchCache.dataset(s"loghub:$name", Datasets.loghub(name))
      assert(small.numLogs == 2000)
      val (l2logs, l2paper, l2size, l2tpl) =
        if (Datasets.loghub2Names.contains(name)) {
          val big = BenchCache.dataset(s"loghub2:$name", Datasets.loghub2(name))
          (big.numLogs.toString, Datasets.loghub2PaperLogCount(name).toString,
            fmtSize(big.sizeBytes), big.numTemplates.toString)
        } else ("-", "-", "-", "-")
      println(s"$name\t${small.numLogs}\t${fmtSize(small.sizeBytes)}\t${small.numTemplates}" +
        s"\t$l2logs\t$l2paper\t$l2size\t$l2tpl")
    }
  }
}
