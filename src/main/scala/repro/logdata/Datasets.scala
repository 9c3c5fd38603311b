package repro.logdata

/** The synthetic LogHub / LogHub-2.0 catalog (substitute for the real
  * corpora — see DESIGN.md §3).
  *
  * Template counts are the paper's Table 1 values. LogHub datasets keep the
  * benchmark's 2,000 lines; LogHub-2.0 line counts are the paper's divided by
  * 50 and clamped to [4,000, 80,000] so benches stay laptop-scale while the
  * relative size ordering (Thunderbird/Spark/HDFS/BGL largest) is preserved.
  * Structural knobs (family fraction, variable density, skew) differentiate
  * dataset difficulty: Mac/Linux/Android are template-rich and family-heavy,
  * Apache/Proxifier are small and regular, matching the qualitative character
  * of the real datasets.
  */
object Datasets {

  private def flavor(words: String*): Vector[String] = words.toVector

  private val specs0: Map[String, DatasetSpec] = Map(
    "Android" -> DatasetSpec("Android", 166, flavor(
      "PowerManagerService", "WindowManager", "ActivityManager", "lock", "tag", "uid", "pid",
      "flg", "flags", "ws", "name", "android", "audioserver", "batteryservice", "wakelock"),
      familyFraction = 0.32, varDensity = 0.22, minLen = 6, maxLen = 14),
    "Apache" -> DatasetSpec("Apache", 6, flavor(
      "mod_jk", "child", "workerEnv", "init", "ok", "jk2_init", "found", "core", "properties"),
      familyFraction = 0.10, varDensity = 0.12, minLen = 5, maxLen = 9, listTemplates = 0),
    "BGL" -> DatasetSpec("BGL", 120, flavor(
      "ciod", "kernel", "instruction", "cache", "parity", "interrupt", "torus", "midplane",
      "generating", "correctable", "ddr", "L3", "EDRAM"),
      familyFraction = 0.25, varDensity = 0.2, minLen = 5, maxLen = 13),
    "HDFS" -> DatasetSpec("HDFS", 14, flavor(
      "dfs", "DataNode", "PacketResponder", "blk", "NameSystem", "replicated", "terminating",
      "receiving", "src", "dest", "InfoPort"),
      familyFraction = 0.20, varDensity = 0.2, minLen = 6, maxLen = 12, listTemplates = 0),
    "HPC" -> DatasetSpec("HPC", 46, flavor(
      "node", "psu", "fan", "temperature", "ambient", "backplane", "gige", "switch",
      "boot", "command", "console", "risboot"),
      familyFraction = 0.20, varDensity = 0.16, minLen = 4, maxLen = 10),
    "Hadoop" -> DatasetSpec("Hadoop", 114, flavor(
      "RMContainerAllocator", "TaskAttempt", "MRAppMaster", "attempt", "container",
      "progress", "reduce", "map", "shuffle", "jvm", "spill"),
      familyFraction = 0.28, varDensity = 0.2, minLen = 6, maxLen = 14),
    "HealthApp" -> DatasetSpec("HealthApp", 75, flavor(
      "Step", "standStepCount", "REPORT", "calculateCaloriesWithCache", "totalCalories",
      "onStandStepChanged", "flush", "sensor", "screen", "bulk"),
      familyFraction = 0.25, varDensity = 0.18, minLen = 4, maxLen = 10),
    "Linux" -> DatasetSpec("Linux", 118, flavor(
      "sshd", "pam_unix", "authentication", "failure", "rhost", "ruser", "kernel", "cpu",
      "scsi", "usb", "ext3", "cups", "ftpd", "xinetd"),
      familyFraction = 0.32, varDensity = 0.22, minLen = 5, maxLen = 13),
    "Mac" -> DatasetSpec("Mac", 341, flavor(
      "kernel", "corecaptured", "QQ", "Safari", "WindowServer", "sandboxd", "com.apple",
      "AirPort", "wifi", "symptomsd", "networkd", "deny", "violation", "CCFile"),
      familyFraction = 0.35, varDensity = 0.24, minLen = 5, maxLen = 15),
    "OpenSSH" -> DatasetSpec("OpenSSH", 27, flavor(
      "sshd", "pam_unix", "session", "authentication", "preauth", "invalid", "password",
      "publickey", "disconnect", "rhost"),
      familyFraction = 0.20, varDensity = 0.2, minLen = 5, maxLen = 11, listTemplates = 0),
    "OpenStack" -> DatasetSpec("OpenStack", 43, flavor(
      "nova", "compute", "instance", "image", "api", "osapi_compute", "metadata", "GET",
      "POST", "len", "vm", "spawning", "claim"),
      familyFraction = 0.20, varDensity = 0.2, minLen = 6, maxLen = 13),
    "Proxifier" -> DatasetSpec("Proxifier", 8, flavor(
      "proxy", "chrome.exe", "HTTPS", "open", "through", "lifetime", "bytes", "sec"),
      familyFraction = 0.10, varDensity = 0.2, minLen = 5, maxLen = 9, listTemplates = 0),
    "Spark" -> DatasetSpec("Spark", 36, flavor(
      "executor", "rdd_42", "broadcast", "MemoryStore", "BlockManager", "stage", "tid",
      "partition", "curMem", "free", "store"),
      familyFraction = 0.20, varDensity = 0.2, minLen = 6, maxLen = 12),
    "Thunderbird" -> DatasetSpec("Thunderbird", 149, flavor(
      "aborted", "pbs", "mom", "sadmin", "crond", "postfix", "automount", "dhclient",
      "gmetad", "rpc", "statd", "ib_sm", "sweep"),
      familyFraction = 0.28, varDensity = 0.2, minLen = 5, maxLen = 14),
    "Windows" -> DatasetSpec("Windows", 50, flavor(
      "CBS", "SQM", "package", "KB", "manifest", "servicing", "store", "trusted",
      "installer", "session", "flags"),
      familyFraction = 0.20, varDensity = 0.18, minLen = 5, maxLen = 12),
    "Zookeeper" -> DatasetSpec("Zookeeper", 50, flavor(
      "NIOServerCxn", "Factory", "zookeeper", "snapshot", "epoch", "election", "leader",
      "follower", "quorum", "cnxn", "myid"),
      familyFraction = 0.20, varDensity = 0.18, minLen = 5, maxLen = 12),
  )

  /** LogHub (small): 16 datasets × 2,000 lines (paper Table 1). */
  val loghubNames: Vector[String] = Vector(
    "Android", "Apache", "BGL", "HDFS", "HPC", "Hadoop", "HealthApp", "Linux", "Mac",
    "OpenSSH", "OpenStack", "Proxifier", "Spark", "Thunderbird", "Windows", "Zookeeper")

  /** LogHub-2.0: 14 datasets (no Android/Windows), paper template counts. */
  val loghub2Names: Vector[String] = Vector(
    "Apache", "BGL", "HDFS", "HPC", "Hadoop", "HealthApp", "Linux", "Mac",
    "OpenSSH", "OpenStack", "Proxifier", "Spark", "Thunderbird", "Zookeeper")

  private val loghub2Templates: Map[String, Int] = Map(
    "Apache" -> 29, "BGL" -> 320, "HDFS" -> 46, "HPC" -> 74, "Hadoop" -> 236,
    "HealthApp" -> 156, "Linux" -> 338, "Mac" -> 626, "OpenSSH" -> 38,
    "OpenStack" -> 48, "Proxifier" -> 11, "Spark" -> 236, "Thunderbird" -> 1241,
    "Zookeeper" -> 89)

  private val loghub2PaperLogs: Map[String, Long] = Map(
    "Apache" -> 51978L, "BGL" -> 4631261L, "HDFS" -> 11167740L, "HPC" -> 429988L,
    "Hadoop" -> 179993L, "HealthApp" -> 212394L, "Linux" -> 23921L, "Mac" -> 100314L,
    "OpenSSH" -> 638947L, "OpenStack" -> 207632L, "Proxifier" -> 21320L,
    "Spark" -> 16075117L, "Thunderbird" -> 16601745L, "Zookeeper" -> 74273L)

  /** Scaled LogHub-2.0 line count: paper / 50, clamped to [4000, 80000]. */
  def loghub2Logs(name: String): Int =
    math.min(80000L, math.max(4000L, loghub2PaperLogs(name) / 50L)).toInt

  def loghub2PaperLogCount(name: String): Long = loghub2PaperLogs(name)

  def loghubSpec(name: String): DatasetSpec = specs0(name)

  def loghub2Spec(name: String): DatasetSpec = {
    val base = specs0(name)
    // larger corpora surface more templates and more list/unbounded noise
    base.copy(
      numTemplates = loghub2Templates(name),
      listTemplates = math.max(base.listTemplates, loghub2Templates(name) / 150),
    )
  }

  /** Generate one LogHub (small) dataset: 2,000 lines. */
  def loghub(name: String, seed: Long = 7L): GeneratedDataset =
    LogSynth.generate(loghubSpec(name), 2000, seed)

  /** Generate one LogHub-2.0 dataset at the scaled line count. */
  def loghub2(name: String, seed: Long = 7L): GeneratedDataset =
    LogSynth.generate(loghub2Spec(name), loghub2Logs(name), seed)
}
