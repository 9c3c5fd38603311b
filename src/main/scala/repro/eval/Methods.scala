package repro.eval

import repro.baselines._
import repro.core.ByteBrainConfig
import repro.logdata.GeneratedDataset

/** Registry of every evaluated method, in the row order of the paper's
  * Tables 2 and 3 (baselines alphabetical, ByteBrain last).
  */
object Methods {

  /** Baselines that need no per-dataset knowledge. */
  def syntaxBaselines(): Seq[LogParser] = Seq(
    new AEL,
    new Drain,
    new IPLoM,
    new LenMa,
    new LFA,
    new LogCluster,
    new LogMine,
    new Logram,
    new MoLFI,
    new SHISO,
    new SLCT,
    new Spell,
  )

  /** All methods for one dataset. LogSig gets the dataset's template count as
    * its required k (the paper notes it needs "precise specification of log
    * category numbers" — we are generous); semantic/LLM surrogates read
    * ground truth per DESIGN.md §3.
    */
  def all(ds: GeneratedDataset,
          byteBrainCfg: ByteBrainConfig = ByteBrainConfig(),
          threshold: Double = 0.9): Seq[LogParser] =
    (syntaxBaselines() :+ new LogSig(k = ds.numTemplates)) ++ Seq(
      SemanticSurrogate.uniParser(),
      SemanticSurrogate.logPPT(),
      new LilacSurrogate,
      new ByteBrainParser(byteBrainCfg, threshold),
    )

  /** Canonical row order for the tables. */
  val rowOrder: Seq[String] = Seq(
    "AEL", "Drain", "IPLoM", "LenMa", "LFA", "LogCluster", "LogMine", "Logram",
    "LogSig", "MoLFI", "SHISO", "SLCT", "Spell", "UniParser", "LogPPT", "LILAC",
    "ByteBrain")
}
