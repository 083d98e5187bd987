package repro.core

import scala.collection.mutable

/** A tree node of the EH-Tree: one update plus its indexed node set
  * (affected nodes for `U_Di`, candidate nodes for `U_Pi`).
  */
final class EhNode(val update: Update, val set: Set[Long]) {
  val children: mutable.Buffer[EhNode] = mutable.Buffer.empty

  /** Pre-order traversal of this subtree. */
  def preorder: Seq[EhNode] = this +: children.toSeq.flatMap(_.preorder)
}

/** The Elimination Hierarchy Tree (§IV-C) — in general a forest, since
  * updates with incomparable sets cannot eliminate each other.
  *
  * Construction follows the paper's strategies: (a) updates are inserted
  * in decreasing set-size order, so the largest becomes a root; (b)/(c)
  * an update whose set is covered by an existing same-graph node is
  * attached beneath it; (d) cross-graph cancellation re-hangs `U_Pi`
  * beneath `U_Di`. Non-root updates are *eliminated*: their effect is
  * subsumed by an ancestor's incremental pass.
  */
final class EhTree private (val roots: mutable.Buffer[EhNode]) {

  /** All tree nodes, pre-order within each root. */
  def allNodes: Seq[EhNode] = roots.toSeq.flatMap(_.preorder)

  /** Updates needing their own incremental GPNM pass. */
  def uneliminated: Seq[Update] = roots.toSeq.map(_.update)

  /** Updates subsumed by an ancestor. */
  def eliminated: Seq[Update] = allNodes.filterNot(n => roots.contains(n)).map(_.update)

  /** Locate the node holding update `uid`, if present. */
  def find(uid: String): Option[EhNode] = allNodes.find(_.update.uid == uid)

  /** Number of indexed updates. */
  def size: Int = allNodes.size

  /** Maximum depth (a single root with no children has depth 1). */
  def depth: Int = {
    def go(n: EhNode): Int = 1 + (if (n.children.isEmpty) 0 else n.children.map(go).max)
    if (roots.isEmpty) 0 else roots.map(go).max
  }

  /** Re-hang the node for pattern update `patUid` beneath the node for data
    * update `dataUid` (strategy (d), Type III). Only a current root moves —
    * a nested node is already eliminated.
    */
  def attachCross(patUid: String, dataUid: String): Boolean =
    (roots.find(_.update.uid == patUid), find(dataUid)) match {
      case (Some(p), Some(d)) if p.update.uid != d.update.uid =>
        roots -= p
        d.children += p
        true
      case _ => false
    }
}

object EhTree {

  /** Build the forest from `(update, indexed set)` entries plus cross-graph
    * cancellation pairs `(patternUid, dataUid)`.
    */
  def build(entries: Seq[(Update, Set[Long])],
            cross: Seq[(String, String)] = Nil): EhTree = {
    val ordered = entries.sortBy { case (u, s) => (-s.size, u.uid) }
    val tree    = new EhTree(mutable.Buffer.empty)
    ordered.foreach { case (u, s) =>
      val node = new EhNode(u, s)
      findHost(tree, u, s) match {
        case Some(host) => host.children += node
        case None       => tree.roots += node
      }
    }
    cross.foreach { case (p, d) => tree.attachCross(p, d) }
    tree
  }

  /** Tightest same-graph cover of `s` (smallest covering set, ties by uid):
    * "recursively insert" — a chain of covers builds a chain in the tree.
    */
  private def findHost(tree: EhTree, u: Update, s: Set[Long]): Option[EhNode] = {
    val covers = tree.allNodes.filter { n =>
      sameGraph(n.update, u) && n.set.size >= s.size && s.subsetOf(n.set)
    }
    if (covers.isEmpty) None
    else Some(covers.minBy(n => (n.set.size, n.update.uid)))
  }

  private def sameGraph(a: Update, b: Update): Boolean = (a, b) match {
    case (_: DataUpdate, _: DataUpdate)       => true
    case (_: PatternUpdate, _: PatternUpdate) => true
    case _                                    => false
  }
}
