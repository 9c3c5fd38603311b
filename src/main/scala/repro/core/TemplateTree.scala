package repro.core

/** Initial-grouping key (paper §4.2): token count plus the first k tokens. */
final case class GroupKey(numTokens: Int, prefix: Seq[String])

/** One node of a clustering tree = one log template (paper §3, §4.3).
  *
  * @param id          model-global node id
  * @param parentId    parent node id, or -1 for an initial-group root
  * @param groupKey    the initial group this tree belongs to
  * @param template    per-position token, [[CommonVariables.Wildcard]] for variables
  * @param saturation  raw saturation score of the node's log set
  * @param effectiveSaturation saturation clamped to be non-decreasing with
  *                    depth (the paper guarantees strict increase by
  *                    construction; clamping makes query navigation total even
  *                    in degenerate splits)
  * @param depth       0 for group roots
  * @param count       raw (duplicate-weighted) log count at training time
  * @param temporary   true for unmatched-log singletons inserted online (§3)
  */
final case class TemplateNode(
    id: Int,
    parentId: Int,
    groupKey: GroupKey,
    template: IndexedSeq[String],
    saturation: Double,
    effectiveSaturation: Double,
    depth: Int,
    count: Long,
    temporary: Boolean = false,
) {
  def templateText: String = template.mkString(" ")
  def isRoot: Boolean = parentId < 0

  /** Position-based template match (§4.8): every token must equal the
    * template token or the template token must be the wildcard.
    */
  def matches(tokens: Array[String]): Boolean = {
    if (tokens.length != template.length) return false
    var i = 0
    while (i < tokens.length) {
      val t = template(i)
      if (t != CommonVariables.Wildcard && t != tokens(i)) return false
      i += 1
    }
    true
  }
}

/** An immutable trained model: the forest of clustering trees over all initial
  * groups, with the indices online matching and querying need.
  */
final class TemplateModel(val nodes: IndexedSeq[TemplateNode]) extends Serializable {
  val byId: Map[Int, TemplateNode] = nodes.map(n => n.id -> n).toMap
  require(byId.size == nodes.size, "duplicate node ids in model")

  val childrenOf: Map[Int, IndexedSeq[TemplateNode]] =
    nodes.filter(!_.isRoot).groupBy(_.parentId).map { case (p, cs) => p -> cs.sortBy(_.id) }

  /** Leaves = most precise templates (what online matching assigns). */
  val leaves: IndexedSeq[TemplateNode] = nodes.filter(n => !childrenOf.contains(n.id))

  /** All nodes per token count in §4.8 matching order: descending effective
    * saturation, then most-specific first (fewest wildcards, greatest depth),
    * id as the deterministic tie-break.
    */
  val byLength: Map[Int, IndexedSeq[TemplateNode]] =
    nodes.groupBy(_.groupKey.numTokens).map { case (len, ns) =>
      len -> ns.sortBy(n => (-n.effectiveSaturation,
        n.template.count(_ == CommonVariables.Wildcard), -n.depth, n.id))
    }

  def parentOf(n: TemplateNode): Option[TemplateNode] =
    if (n.isRoot) None else byId.get(n.parentId)

  /** Ancestor chain of a node, ordered root first, the node itself last. */
  def ancestry(id: Int): List[TemplateNode] = {
    var cur = byId.get(id)
    var acc = List.empty[TemplateNode]
    while (cur.isDefined) {
      acc = cur.get :: acc // prepending while walking up yields root..node
      cur = parentOf(cur.get)
    }
    acc
  }

  def size: Int = nodes.size
  def maxDepth: Int = if (nodes.isEmpty) 0 else nodes.map(_.depth).max

  /** New model with extra nodes appended (used for temporary online inserts). */
  def withNodes(extra: Seq[TemplateNode]): TemplateModel =
    new TemplateModel(nodes ++ extra)

  def nextId: Int = if (nodes.isEmpty) 0 else nodes.map(_.id).max + 1
}

object TemplateModel {
  val empty: TemplateModel = new TemplateModel(Vector.empty)
}
