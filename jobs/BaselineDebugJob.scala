package repro.jobs

import scala.collection.mutable

import repro.eval.Methods
import repro.logdata.Datasets
import repro.baselines.ParseInput

/** Diagnostic: per ground-truth template, how a chosen baseline grouped its
  * logs (splits/merges). Usage: BaselineDebugJob <dataset> <method> [loghub|loghub2]
  */
object BaselineDebugJob {
  def main(args: Array[String]): Unit = {
    val name = if (args.nonEmpty) args(0) else "HDFS"
    val method = if (args.length > 1) args(1) else "UniParser"
    val suite = if (args.length > 2) args(2) else "loghub"
    val ds = if (suite == "loghub2") Datasets.loghub2(name) else Datasets.loghub(name)
    val parser = Methods.all(ds).find(_.name == method).getOrElse(sys.error(s"no method $method"))
    val input = ParseInput.of(ds)
    val pred = parser.parse(input)

    val truthToGroups = mutable.HashMap.empty[Int, mutable.HashMap[Int, Int]]
    val groupToTruths = mutable.HashMap.empty[Int, mutable.HashSet[Int]]
    pred.indices.foreach { i =>
      val t = ds.truth(i); val g = pred(i)
      truthToGroups.getOrElseUpdate(t, mutable.HashMap.empty)
        .updateWith(g)(c => Some(c.getOrElse(0) + 1))
      groupToTruths.getOrElseUpdate(g, mutable.HashSet.empty) += t
    }
    truthToGroups.toSeq.sortBy(-_._2.values.sum).take(12).foreach { case (t, groups) =>
      val total = groups.values.sum
      val pure = groups.size == 1 && groupToTruths(groups.head._1).size == 1
      if (!pure) {
        println(s"--- truth $t ($total logs) -> ${groups.size} groups " +
          s"(mergedWith=${groups.keys.map(g => groupToTruths(g).size - 1).sum})")
        println(s"    gt: ${ds.templates(t).tokens.map {
          case repro.logdata.Tok.Const(s) => s
          case _ => "<VAR>"
        }.mkString(" ")}")
        groups.toSeq.sortBy(-_._2).take(3).foreach { case (g, c) =>
          val sample = pred.indices.find(i => pred(i) == g && ds.truth(i) == t).get
          println(s"    group $g ($c logs; truths=${groupToTruths(g).toSeq.sorted.take(6)}): " +
            input.tokens(sample).mkString(" "))
        }
      }
    }
  }
}
