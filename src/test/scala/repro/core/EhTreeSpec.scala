package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** EH-Tree construction (§IV-C): root selection, coverage nesting, the
  * cross-graph re-hang, forest behavior and the Example 10 shape.
  */
class EhTreeSpec extends AnyFunSuite {

  private val uD1 = DataEdgeIns(1L, 2L)
  private val uD2 = DataEdgeIns(3L, 4L)
  private val uP1 = PatEdgeIns(PEdge("a", "b", 2))
  private val uP2 = PatEdgeIns(PEdge("c", "d", 4))

  test("strategy (a): the update with the largest set becomes a root") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L, 3L), uD2 -> Set(1L, 2L)))
    assert(t.roots.map(_.update) == Seq(uD1))
  }

  test("strategy (b): covered data update becomes a child") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L, 3L), uD2 -> Set(2L, 3L)))
    assert(t.find(uD2.uid).get.set == Set(2L, 3L))
    assert(t.roots.head.children.map(_.update) == Seq(uD2))
    assert(t.eliminated.map(_.uid) == Seq(uD2.uid))
  }

  test("strategy (c): covered pattern update becomes a child of a pattern node") {
    val t = EhTree.build(Seq(uP1 -> Set(1L, 2L), uP2 -> Set(1L)))
    assert(t.roots.map(_.update) == Seq(uP1))
    assert(t.roots.head.children.map(_.update) == Seq(uP2))
  }

  test("pattern updates never nest under data updates by coverage alone") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L, 3L), uP1 -> Set(1L, 2L)))
    assert(t.roots.map(_.update.uid).toSet == Set(uD1.uid, uP1.uid))
  }

  test("strategy (d): Type III re-hangs a pattern root under a data node") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L, 3L), uP1 -> Set(1L, 2L)),
                         cross = Seq((uP1.uid, uD1.uid)))
    assert(t.uneliminated.map(_.uid) == Seq(uD1.uid))
    assert(t.find(uD1.uid).get.children.map(_.update.uid) == Seq(uP1.uid))
  }

  test("Example 10 shape: D2 under D1, P2 under P1, P1 under D1") {
    val t = EhTree.build(
      Seq(uD1 -> Set(1L, 2L, 3L, 4L, 5L, 6L, 7L, 8L),
          uD2 -> Set(1L, 4L, 5L, 6L, 8L),
          uP1 -> Set(2L, 7L),
          uP2 -> Set(7L)),
      cross = Seq((uP1.uid, uD1.uid)))
    assert(t.uneliminated.map(_.uid) == Seq(uD1.uid))
    val d1 = t.find(uD1.uid).get
    assert(d1.children.map(_.update.uid).toSet == Set(uD2.uid, uP1.uid))
    assert(t.find(uP1.uid).get.children.map(_.update.uid) == Seq(uP2.uid))
    assert(t.depth == 3)
    assert(t.size == 4)
    assert(t.eliminated.size == 3)
  }

  test("incomparable sets form a forest") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L), uD2 -> Set(3L, 4L)))
    assert(t.roots.size == 2)
    assert(t.eliminated.isEmpty)
  }

  test("equal sets nest deterministically (one eliminates the other)") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L), uD2 -> Set(1L, 2L)))
    assert(t.roots.size == 1)
    assert(t.eliminated.size == 1)
  }

  test("insertion order does not change the uneliminated set") {
    val entries: Seq[(Update, Set[Long])] = Seq(
      uD1 -> Set(1L, 2L, 3L), uD2 -> Set(2L, 3L), uP1 -> Set(5L), uP2 -> Set(5L, 6L))
    val a = EhTree.build(entries).uneliminated.map(_.uid).toSet
    val b = EhTree.build(entries.reverse).uneliminated.map(_.uid).toSet
    assert(a == b)
  }

  test("empty build") {
    val t = EhTree.build(Nil)
    assert(t.roots.isEmpty && t.size == 0 && t.depth == 0)
  }

  test("attachCross is a no-op for unknown or nested nodes") {
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L), uP1 -> Set(9L)))
    assert(!t.attachCross("missing", uD1.uid))
    assert(t.attachCross(uP1.uid, uD1.uid))
    // second time: uP1 is no longer a root
    assert(!t.attachCross(uP1.uid, uD1.uid))
  }

  test("deep chains: transitive coverage builds a hierarchy") {
    val u3 = DataEdgeDel(9L, 10L)
    val t = EhTree.build(Seq(uD1 -> Set(1L, 2L, 3L), uD2 -> Set(1L, 2L), u3 -> Set(1L)))
    assert(t.depth == 3)
    assert(t.uneliminated.map(_.uid) == Seq(uD1.uid))
  }
}
