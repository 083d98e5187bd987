package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Pattern-update application semantics (driver-side). */
class UpdatesSpec extends AnyFunSuite {

  private val p = PatternGraph(
    Seq(PNode("a", "A"), PNode("b", "B"), PNode("c", "C")),
    Seq(PEdge("a", "b", 2), PEdge("b", "c", 3)))

  test("PatEdgeIns adds a new edge") {
    val p2 = Updates.applyPattern(p, PatEdgeIns(PEdge("a", "c", 1)))
    assert(p2.edges.contains(PEdge("a", "c", 1)) && p2.edges.size == 3)
  }

  test("PatEdgeIns on an existing edge replaces the bound") {
    val p2 = Updates.applyPattern(p, PatEdgeIns(PEdge("a", "b", 5)))
    assert(p2.edges.count(e => e.src == "a" && e.dst == "b") == 1)
    assert(p2.edges.contains(PEdge("a", "b", 5)))
  }

  test("PatEdgeIns referencing a missing node fails") {
    intercept[IllegalArgumentException] {
      Updates.applyPattern(p, PatEdgeIns(PEdge("a", "zzz", 1)))
    }
  }

  test("PatEdgeDel removes exactly that edge; absent edge is a no-op") {
    val p2 = Updates.applyPattern(p, PatEdgeDel("a", "b"))
    assert(p2.edges == Seq(PEdge("b", "c", 3)))
    val p3 = Updates.applyPattern(p, PatEdgeDel("c", "a"))
    assert(p3.edges == p.edges)
  }

  test("PatNodeIns adds node and attach edge") {
    val p2 = Updates.applyPattern(p, PatNodeIns(PNode("d", "D"), PEdge("c", "d", 2)))
    assert(p2.hasNode("d") && p2.edges.contains(PEdge("c", "d", 2)))
  }

  test("PatNodeIns duplicate id fails") {
    intercept[IllegalArgumentException] {
      Updates.applyPattern(p, PatNodeIns(PNode("a", "A"), PEdge("a", "b", 1)))
    }
  }

  test("PatNodeIns attach edge must touch the new node") {
    intercept[IllegalArgumentException] {
      Updates.applyPattern(p, PatNodeIns(PNode("d", "D"), PEdge("a", "b", 1)))
    }
  }

  test("PatNodeDel drops the node and incident edges") {
    val p2 = Updates.applyPattern(p, PatNodeDel("b"))
    assert(!p2.hasNode("b") && p2.edges.isEmpty)
    assert(p2.nodes.map(_.id) == Seq("a", "c"))
  }

  test("applyPatternAll applies in order") {
    val p2 = Updates.applyPatternAll(p, Seq(
      PatEdgeIns(PEdge("a", "c", 4)), PatNodeDel("b")))
    assert(p2.edges == Seq(PEdge("a", "c", 4)))
  }

  test("pattern helpers: neighbours, maxBound, node lookup") {
    assert(p.neighbours("b").toSet == Set("a", "c"))
    assert(p.maxBound(cap = 8) == 3)
    val star = PatternGraph(p.nodes, p.edges :+ PEdge("a", "c", PatternGraph.Star))
    assert(star.maxBound(cap = 8) == 8)
    assert(p.node("a").label == "A")
    intercept[NoSuchElementException] { p.node("zzz") }
  }

  test("duplicate pattern node ids are rejected at construction") {
    intercept[IllegalArgumentException] {
      PatternGraph(Seq(PNode("a", "A"), PNode("a", "B")), Nil)
    }
  }
}
