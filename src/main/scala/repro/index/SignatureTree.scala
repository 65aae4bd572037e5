package repro.index

import repro.core.EntryStats
import scala.collection.mutable.ArrayBuffer

/** A node of the extended signature tree. `stats` is the node's signature:
  * the user's own statistics at a leaf (LEntry), the element-wise max over
  * all children at an internal node (IEntry) — the "virtual user whose
  * interests cover all of its children" of Section V-A.
  */
sealed abstract class SigNode extends Serializable {
  var stats: EntryStats = _
  var parent: SigInner = _
}

/** LEntry: one user's per-category profile statistics. */
final class SigLeaf(val userId: Long) extends SigNode

/** IEntry: upper-bound summary of a subtree. */
final class SigInner extends SigNode {
  val children: ArrayBuffer[SigNode] = ArrayBuffer.empty
}

/** Extended signature tree over the users of one (block, category) pair.
  * Supports bulk build, exact-upper-bound maintenance on leaf updates, and
  * leaf insertion with node splits (the 20%-reserve trick of Section V-C is
  * subsumed by growing the sparse maps directly).
  */
final class SignatureTree(val block: Int, val category: Int, val fanout: Int)
    extends Serializable {
  require(fanout >= 2, "fanout must be >= 2")

  private var rootNode: SigNode = _
  private val leavesById = scala.collection.mutable.Map.empty[Long, SigLeaf]

  /** Root entry, or None for an empty tree. */
  def root: Option[SigNode] = Option(rootNode)

  /** Number of user profiles (LEntries) in the tree. */
  def size: Int = leavesById.size

  /** The leaf of a user, if present. */
  def leafOf(userId: Long): Option[SigLeaf] = leavesById.get(userId)

  private def recomputeStats(n: SigInner): Unit =
    n.stats = n.children.map(_.stats).reduce(_ merge _)

  private def recomputeUp(n: SigInner): Unit = {
    var cur = n
    while (cur != null) { recomputeStats(cur); cur = cur.parent }
  }

  /** Bulk-load the tree bottom-up: leaves are packed `fanout` at a time into
    * internal nodes level by level until a single root remains.
    */
  def build(entries: Seq[(Long, EntryStats)]): this.type = {
    leavesById.clear()
    if (entries.isEmpty) { rootNode = null; return this }
    var level: Seq[SigNode] = entries.map { case (u, s) =>
      val l = new SigLeaf(u); l.stats = s; leavesById(u) = l; l
    }
    while (level.size > 1) {
      level = level.grouped(fanout).map { grp =>
        val inner = new SigInner
        grp.foreach { ch => ch.parent = inner; inner.children += ch }
        recomputeStats(inner)
        inner
      }.toSeq
    }
    rootNode = level.head
    rootNode.parent = null
    this
  }

  /** Replace a user's leaf statistics and recompute every ancestor IEntry
    * exactly (a recompute, not a max-merge: updated components may shrink).
    * @return false if the user is not in this tree.
    */
  def update(userId: Long, stats: EntryStats): Boolean = leavesById.get(userId) match {
    case None => false
    case Some(leaf) =>
      leaf.stats = stats
      if (leaf.parent != null) recomputeUp(leaf.parent)
      true
  }

  /** Insert a new user: descend into the smallest subtree, attach the leaf at
    * the deepest internal level, split overflowing nodes upward (a root split
    * grows the tree by one level).
    */
  def insert(userId: Long, stats: EntryStats): Unit = {
    require(!leavesById.contains(userId), s"user $userId already present")
    val leaf = new SigLeaf(userId)
    leaf.stats = stats
    leavesById(userId) = leaf
    rootNode match {
      case null => rootNode = leaf
      case l: SigLeaf =>
        val inner = new SigInner
        inner.children += l; l.parent = inner
        inner.children += leaf; leaf.parent = inner
        recomputeStats(inner)
        rootNode = inner
      case r: SigInner =>
        var cur = r
        while (cur.children.head.isInstanceOf[SigInner])
          cur = cur.children.minBy(c => subtreeSize(c)).asInstanceOf[SigInner]
        cur.children += leaf
        leaf.parent = cur
        var node = cur
        while (node != null && node.children.size > fanout) {
          val right = new SigInner
          val moved = node.children.takeRight(node.children.size / 2)
          node.children.remove(node.children.size - moved.size, moved.size)
          moved.foreach { m => m.parent = right; right.children += m }
          recomputeStats(right)
          recomputeStats(node)
          if (node.parent == null) {
            val newRoot = new SigInner
            newRoot.children += node; node.parent = newRoot
            newRoot.children += right; right.parent = newRoot
            recomputeStats(newRoot)
            rootNode = newRoot
            node = null
          } else {
            val p = node.parent
            p.children += right
            right.parent = p
            node = p
          }
        }
        if (node != null) recomputeUp(node) else recomputeUp(rootNode.asInstanceOf[SigInner])
    }
  }

  private def subtreeSize(n: SigNode): Int = n match {
    case _: SigLeaf => 1
    case i: SigInner => i.children.iterator.map(subtreeSize).sum
  }

  /** All (userId, stats) leaves — for exhaustive checks in tests. */
  def leaves: Seq[(Long, EntryStats)] =
    leavesById.iterator.map { case (u, l) => (u, l.stats) }.toSeq

  /** Single-tree branch-and-bound KNN (Algorithm 1 restricted to one tree) —
    * used by the per-category Structured Streaming matching operator, where
    * each category group holds exactly one tree.
    */
  def knn(q: repro.core.ItemQuery, k: Int, prm: repro.core.RankParams,
          col: repro.core.CollectionStats): Seq[(Long, Double)] = {
    import repro.core.Ranking
    val queue = scala.collection.mutable.PriorityQueue.empty[(Double, SigNode)](
      Ordering.by[(Double, SigNode), Double](_._1))
    root.foreach(r => queue.enqueue((Ranking.score(r.stats, q, prm, col), r)))
    val result = scala.collection.mutable.PriorityQueue.empty[(Double, Long)](
      Ordering.by[(Double, Long), Double](-_._1))
    def lb: Double = if (result.size < k) Double.NegativeInfinity else result.head._1
    var done = false
    while (queue.nonEmpty && !done) {
      val (score, node) = queue.dequeue()
      if (score <= lb && result.size >= k) done = true
      else node match {
        case leaf: SigLeaf =>
          result.enqueue((score, leaf.userId))
          if (result.size > k) result.dequeue()
        case inner: SigInner =>
          inner.children.foreach { ch =>
            val s = Ranking.score(ch.stats, q, prm, col)
            if (s > lb) queue.enqueue((s, ch))
          }
      }
    }
    val drained: Seq[(Double, Long)] = result.dequeueAll
    drained.reverse.map { case (s, u) => (u, s) }
  }
}
