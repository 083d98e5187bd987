package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Sanity checks for the brute-force reference itself (it anchors every
  * other suite, so it gets hand-verifiable cases).
  */
class LocalRefSpec extends AnyFunSuite {

  test("apsp on a chain") {
    val got = LocalRef.apsp(Seq(0L, 1L, 2L), Seq((0L, 1L), (1L, 2L)), cap = 5)
    assert(got == Map((0L, 0L) -> 0, (1L, 1L) -> 0, (2L, 2L) -> 0,
                      (0L, 1L) -> 1, (1L, 2L) -> 1, (0L, 2L) -> 2))
  }

  test("apsp respects cap") {
    val nodes = (0L to 6L)
    val edges = (0L to 5L).map(i => (i, i + 1))
    val got   = LocalRef.apsp(nodes, edges, cap = 2)
    assert(got.contains((0L, 2L)) && !got.contains((0L, 3L)))
  }

  test("gpnm: Example-1-style IT-project pattern") {
    // PM1 -> SE1 -> TE1; PM1 -> S1; S1 -> TE1 (long way via SE)
    val nodes = Seq((1L, "PM"), (2L, "SE"), (3L, "TE"), (4L, "S"), (5L, "PM"))
    val edges = Seq((1L, 2L), (2L, 3L), (1L, 4L), (4L, 2L))
    val p = PatternGraph(
      Seq(PNode("PM", "PM"), PNode("SE", "SE"), PNode("TE", "TE"), PNode("S", "S")),
      Seq(PEdge("PM", "SE", 3), PEdge("PM", "S", 3), PEdge("SE", "TE", 2), PEdge("S", "TE", 4)))
    val got = LocalRef.gpnm(nodes, edges, p, cap = 6)
    // PM2 (id 5) has no outgoing edges: cannot match; PM1 matches everything.
    assert(got == Map("PM" -> Set(1L), "SE" -> Set(2L), "TE" -> Set(3L), "S" -> Set(4L)))
  }

  test("gpnm: empty result when a pattern node cannot match at all") {
    val nodes = Seq((1L, "PM"), (2L, "SE"))
    val edges = Seq((1L, 2L))
    val p = PatternGraph(Seq(PNode("PM", "PM"), PNode("TE", "TE")), Seq(PEdge("PM", "TE", 3)))
    val got = LocalRef.gpnm(nodes, edges, p, cap = 6)
    assert(got.values.forall(_.isEmpty))
  }

  test("gpnm: cascade removal empties everything (completeness rule)") {
    // A -> B requires B within 1 hop; B exists but unreachable.
    val nodes = Seq((1L, "A"), (2L, "B"))
    val edges = Seq.empty[(Long, Long)]
    val p = PatternGraph(Seq(PNode("a", "A"), PNode("b", "B")), Seq(PEdge("a", "b", 1)))
    val got = LocalRef.gpnm(nodes, edges, p, cap = 6)
    assert(got("a").isEmpty && got("b").isEmpty)
  }

  test("gpnm: self distance 0 does not witness an edge") {
    // Single A node, pattern a -> a' both labeled A within 1: needs a real path.
    val nodes = Seq((1L, "A"))
    val p = PatternGraph(Seq(PNode("a1", "A"), PNode("a2", "A")), Seq(PEdge("a1", "a2", 1)))
    assert(LocalRef.gpnm(nodes, Nil, p, cap = 6).values.forall(_.isEmpty))
    // With a 2-cycle the path exists.
    val nodes2 = Seq((1L, "A"), (2L, "A"))
    val edges2 = Seq((1L, 2L), (2L, 1L))
    val got = LocalRef.gpnm(nodes2, edges2, p, cap = 6)
    assert(got("a1") == Set(1L, 2L) && got("a2") == Set(1L, 2L))
  }

  test("gpnm: star bound requires a finite path") {
    val nodes = Seq((1L, "A"), (2L, "B"), (3L, "B"))
    val edges = Seq((1L, 2L)) // 3 unreachable
    val p = PatternGraph(Seq(PNode("a", "A"), PNode("b", "B")),
                         Seq(PEdge("a", "b", PatternGraph.Star)))
    val got = LocalRef.gpnm(nodes, edges, p, cap = 6)
    assert(got("a") == Set(1L))
    assert(got("b") == Set(2L, 3L)) // b has no out-constraints
  }

  test("gpnm: pattern with no edges matches purely by label") {
    val nodes = Seq((1L, "A"), (2L, "A"), (3L, "B"))
    val p = PatternGraph(Seq(PNode("a", "A")), Nil)
    assert(LocalRef.gpnm(nodes, Nil, p, cap = 6) == Map("a" -> Set(1L, 2L)))
  }
}
