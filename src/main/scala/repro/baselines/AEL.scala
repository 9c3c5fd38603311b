package repro.baselines

import scala.collection.mutable
import ParserUtil._

/** AEL (Jiang et al., QSIC'08): Abstracting Execution Logs.
  *
  * Anonymize step replaces obviously dynamic tokens (`key=value` pairs, pure
  * numbers, digit-bearing mixed tokens) with a placeholder; logs are then
  * binned by (token count, #anonymized) and categorized by their anonymized
  * sequence; a reconcile step merges categories whose sequences differ in at
  * most one non-anonymized position (absorbing missed dynamic fields).
  */
final class AEL extends LogParser {
  override def name: String = "AEL"

  override def parse(input: ParseInput): Array[Int] = {
    val out = new Array[Int](input.tokens.length)

    def anonymize(tok: String): String =
      if (tok.contains('=')) {
        val k = tok.substring(0, tok.indexOf('=') + 1); k + "$v"
      }
      else if (tok.nonEmpty && tok.forall(Character.isDigit)) "$v"
      else if (hasDigit(tok) && tok.exists(Character.isLetterOrDigit)) "$v"
      else tok

    val anonymized = input.tokens.map(_.map(anonymize))

    // bin by (length, #anonymized), categorize by exact anonymized sequence
    val categories = mutable.LinkedHashMap.empty[(Int, Int, List[String]), mutable.ArrayBuffer[Int]]
    anonymized.indices.foreach { i =>
      val a = anonymized(i)
      val key = (a.length, a.count(_ == "$v"), a.toList)
      categories.getOrElseUpdate(key, mutable.ArrayBuffer.empty) += i
    }

    // reconcile: within a bin, merge categories differing in ≤1 position —
    // and only when both differing tokens look dynamic (digit-bearing), the
    // "missed dynamic field" case AEL's reconcile step targets
    val merged = mutable.ArrayBuffer.empty[(Array[String], mutable.ArrayBuffer[Int])]
    categories.foreach { case ((_, _, seq), idxs) =>
      val arr = seq.toArray
      val hit = merged.find { case (tpl, _) =>
        tpl.length == arr.length && {
          val diffs = tpl.indices.filter(i => tpl(i) != arr(i))
          diffs.size <= 1 && diffs.forall(i =>
            (hasDigit(tpl(i)) || tpl(i) == "$v") && (hasDigit(arr(i)) || arr(i) == "$v"))
        }
      }
      hit match {
        case Some((tpl, acc)) =>
          var i = 0
          while (i < tpl.length) { if (tpl(i) != arr(i)) tpl(i) = "$v"; i += 1 }
          acc ++= idxs
        case None => merged += ((arr, idxs.clone()))
      }
    }

    merged.zipWithIndex.foreach { case ((_, idxs), id) => idxs.foreach(out(_) = id) }
    out
  }
}
