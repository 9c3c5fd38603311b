package repro.logdata

import org.scalatest.funsuite.AnyFunSuite

class DatasetsSpec extends AnyFunSuite {

  test("16 LogHub datasets (paper Table 1)") {
    assert(Datasets.loghubNames.size == 16)
  }

  test("14 LogHub-2.0 datasets (no Android/Windows, paper Table 1)") {
    assert(Datasets.loghub2Names.size == 14)
    assert(!Datasets.loghub2Names.contains("Android"))
    assert(!Datasets.loghub2Names.contains("Windows"))
  }

  test("LogHub template counts match the paper's Table 1") {
    val expected = Map(
      "Android" -> 166, "Apache" -> 6, "BGL" -> 120, "HDFS" -> 14, "HPC" -> 46,
      "Hadoop" -> 114, "HealthApp" -> 75, "Linux" -> 118, "Mac" -> 341,
      "OpenSSH" -> 27, "OpenStack" -> 43, "Proxifier" -> 8, "Spark" -> 36,
      "Thunderbird" -> 149, "Windows" -> 50, "Zookeeper" -> 50)
    expected.foreach { case (n, k) =>
      assert(Datasets.loghubSpec(n).numTemplates == k, s"$n")
    }
  }

  test("LogHub-2.0 template counts match the paper's Table 1") {
    val expected = Map(
      "Apache" -> 29, "BGL" -> 320, "HDFS" -> 46, "HPC" -> 74, "Hadoop" -> 236,
      "HealthApp" -> 156, "Linux" -> 338, "Mac" -> 626, "OpenSSH" -> 38,
      "OpenStack" -> 48, "Proxifier" -> 11, "Spark" -> 236,
      "Thunderbird" -> 1241, "Zookeeper" -> 89)
    expected.foreach { case (n, k) =>
      assert(Datasets.loghub2Spec(n).numTemplates == k, s"$n")
    }
  }

  test("LogHub datasets have the benchmark's 2000 lines") {
    assert(Datasets.loghub("Apache").numLogs == 2000)
  }

  test("LogHub-2.0 scaled line counts preserve the paper's size ordering") {
    val big = Seq("Thunderbird", "Spark", "HDFS", "BGL").map(Datasets.loghub2Logs)
    val small = Seq("Linux", "Proxifier", "Apache").map(Datasets.loghub2Logs)
    assert(big.min >= small.max)
    assert(Datasets.loghub2Logs("Thunderbird") == 80000)
    assert(Datasets.loghub2Logs("Linux") == 4000)
  }

  test("every LogHub dataset generates with its spec'd template count") {
    Datasets.loghubNames.foreach { n =>
      val ds = Datasets.loghub(n)
      assert(ds.numTemplates == Datasets.loghubSpec(n).numTemplates, n)
      assert(ds.numLogs == 2000, n)
    }
  }
}
