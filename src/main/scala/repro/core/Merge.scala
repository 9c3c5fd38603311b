package repro.core

import scala.collection.mutable

/** Merging a newly trained model into the previous one (paper §3: "The newly
  * trained model is merged with the previous one. Templates with similarity
  * scores above a given threshold are merged; otherwise, they remain separate
  * child nodes.").
  *
  * Template similarity is the fraction of positions that agree (equal tokens,
  * or a wildcard on either side). New leaf templates that merge into an old
  * node just add their counts there; the rest are attached as children of the
  * old group root (or the whole new group tree is adopted when the group key
  * is unseen).
  */
object Merge {

  /** Fraction of agreeing positions between two same-length templates. */
  def templateSimilarity(a: IndexedSeq[String], b: IndexedSeq[String]): Double = {
    require(a.length == b.length, "similarity is defined per length group")
    if (a.isEmpty) return 1.0
    var same = 0
    var i = 0
    while (i < a.length) {
      val x = a(i); val y = b(i)
      if (x == y || x == CommonVariables.Wildcard || y == CommonVariables.Wildcard) same += 1
      i += 1
    }
    same.toDouble / a.length
  }

  def merge(oldModel: TemplateModel, newModel: TemplateModel, cfg: ByteBrainConfig): TemplateModel = {
    if (oldModel.nodes.isEmpty) return newModel
    if (newModel.nodes.isEmpty) return oldModel

    val merged = mutable.LinkedHashMap.from(oldModel.nodes.map(n => n.id -> n))
    var nextId = math.max(oldModel.nextId, newModel.nextId)

    val oldGroups: Map[GroupKey, IndexedSeq[TemplateNode]] = oldModel.nodes.groupBy(_.groupKey)

    newModel.nodes.groupBy(_.groupKey).foreach { case (gk, newNodes) =>
      oldGroups.get(gk) match {
        case None =>
          // unseen group: adopt the whole new tree under fresh ids
          val idMap = newNodes.map(_.id).map { oid => oid -> { val i = nextId; nextId += 1; i } }.toMap
          newNodes.foreach { n =>
            val nn = n.copy(
              id = idMap(n.id),
              parentId = if (n.parentId < 0) -1 else idMap(n.parentId),
              temporary = false,
            )
            merged.put(nn.id, nn)
          }

        case Some(oldNodes) =>
          val oldRoot = oldNodes.minBy(_.depth)
          val newChildren = newModel.childrenOf
          val newLeaves = newNodes.filter(n => !newChildren.contains(n.id))
          newLeaves.foreach { leaf =>
            // among equally similar old nodes prefer the most specific one
            // (fewest wildcards, deepest) so counts land on the leaf, not its
            // wildcarded ancestors
            val best = oldNodes.maxBy(o => (
              templateSimilarity(o.template, leaf.template),
              -o.template.count(_ == CommonVariables.Wildcard),
              o.depth))
            val sim = templateSimilarity(best.template, leaf.template)
            if (sim >= cfg.mergeThreshold) {
              merged.update(best.id, best.copy(count = best.count + leaf.count))
            } else {
              val nn = leaf.copy(
                id = nextId,
                parentId = oldRoot.id,
                depth = oldRoot.depth + 1,
                effectiveSaturation = math.max(leaf.saturation, oldRoot.effectiveSaturation),
                temporary = false,
              )
              nextId += 1
              merged.put(nn.id, nn)
            }
          }
      }
    }
    new TemplateModel(merged.values.toVector)
  }
}
