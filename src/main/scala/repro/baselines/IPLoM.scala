package repro.baselines

import scala.collection.mutable

/** IPLoM (Makanju et al., KDD'09): iterative partitioning log mining.
  *
  * Three partitioning steps: (1) by token count; (2) by the token at the
  * position with the lowest value cardinality; (3) by the mapping relation
  * between the two most-suitable positions (1-1 pairs partition by pair;
  * 1-M/M-1/M-M fall back to the 1-side value). Partitions below the support
  * threshold collapse into a per-length outlier partition.
  */
final class IPLoM(supportThreshold: Int = 2) extends LogParser {
  override def name: String = "IPLoM"

  override def parse(input: ParseInput): Array[Int] = {
    val out = new Array[Int](input.tokens.length)
    var nextId = 0

    // step 1: partition by token count
    val byLen = input.tokens.indices.groupBy(i => input.tokens(i).length)

    byLen.foreach { case (len, idxs) =>
      if (len == 0) { val id = nextId; nextId += 1; idxs.foreach(out(_) = id) }
      else {
        // step 2: split by token at the lowest-cardinality position with more
        // than one value (a constant position would be a no-op partition)
        val card = Array.tabulate(len) { p =>
          val s = mutable.HashSet.empty[String]
          idxs.foreach(i => s += input.tokens(i)(p))
          s.size
        }
        val splittable = card.indices.filter(card(_) > 1)
        val p2 = if (splittable.isEmpty) 0 else splittable.minBy(card)
        val parts2 = idxs.groupBy(i => input.tokens(i)(p2))

        parts2.foreach { case (_, part) =>
          // step 3: partition by the mapping between the two positions whose
          // cardinalities are most frequent among the remaining positions
          val groups: Iterable[IndexedSeq[Int]] =
            if (part.size <= supportThreshold || len < 2) Iterable(part)
            else {
              val cards = Array.tabulate(len) { p =>
                val s = mutable.HashSet.empty[String]
                part.foreach(i => s += input.tokens(i)(p))
                s.size
              }
              val candidates = cards.indices.filter(p => cards(p) > 1)
              if (candidates.size < 2) Iterable(part)
              else {
                val freqOfCard = candidates.groupBy(cards(_))
                val bestCard = freqOfCard.maxBy { case (_, ps) => ps.size }._2
                val (pa, pb) =
                  if (bestCard.size >= 2) (bestCard(0), bestCard(1))
                  else (candidates(0), candidates(1))
                partitionByMapping(input, part, pa, pb)
              }
            }
          groups.foreach { g =>
            val id = nextId; nextId += 1
            g.foreach(out(_) = id)
          }
        }
      }
    }
    out
  }

  /** Split a partition by the relation between token positions `pa` and `pb`. */
  private def partitionByMapping(input: ParseInput, part: IndexedSeq[Int],
                                 pa: Int, pb: Int): Iterable[IndexedSeq[Int]] = {
    val aToB = mutable.HashMap.empty[String, mutable.HashSet[String]]
    val bToA = mutable.HashMap.empty[String, mutable.HashSet[String]]
    part.foreach { i =>
      val a = input.tokens(i)(pa); val b = input.tokens(i)(pb)
      aToB.getOrElseUpdate(a, mutable.HashSet.empty) += b
      bToA.getOrElseUpdate(b, mutable.HashSet.empty) += a
    }
    part.groupBy { i =>
      val a = input.tokens(i)(pa); val b = input.tokens(i)(pb)
      val oneToOne = aToB(a).size == 1 && bToA(b).size == 1
      // 1-1 related values are jointly variable: ALL such lines form one
      // partition; 1-M/M-1 partition by the 1-side value; M-M stay together
      if (oneToOne) "11"
      else if (aToB(a).size == 1) s"m1:$b"   // many a's map to this b
      else if (bToA(b).size == 1) s"1m:$a"   // this a maps to many b's
      else "mm"
    }.values
  }
}
