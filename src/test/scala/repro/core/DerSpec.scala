package repro.core

import repro.{SparkSpec, TestKit}
import repro.sssp.{ApspBfs, IncApsp}

/** DER-I / DER-II / DER-III detection (Algorithms 1–3) on constructed
  * scenarios mirroring Examples 7–9, plus the order-invariance theorems.
  */
class DerSpec extends SparkSpec {

  private val cap = 8

  /** PM/TE mini-world: PM1 reaches both TEs, PM2 reaches neither. */
  private lazy val world = {
    val lg = TestKit.LocalGraph(
      Seq((1L, "PM"), (2L, "PM"), (3L, "TE"), (4L, "TE"), (5L, "S")),
      Seq((1L, 3L), (1L, 4L), (5L, 3L)))
    val g    = lg.toDataGraph(spark)
    val slen = ApspBfs.apsp(spark, g.nodes, g.edges, cap)
    (lg, g, slen)
  }
  private lazy val patNoEdges = PatternGraph(
    Seq(PNode("pm", "PM"), PNode("te", "TE"), PNode("s", "S")), Nil)
  private lazy val iqueryNoEdges = {
    val (_, g, slen) = world
    Bgs.run(spark, g, patNoEdges, slen, cap)
  }

  test("DER-I: PatEdgeIns collects violating match pairs (Can_RN)") {
    val (_, g, slen) = world
    val can = Der.candidateNodes(spark, PatEdgeIns(PEdge("pm", "te", 1)),
                                 patNoEdges, g, iqueryNoEdges, slen, cap)
    // PM2 (2) reaches no TE; both TEs appear through the violating pairs.
    assert(can == Set(2L, 3L, 4L))
  }

  test("DER-I: each insert gets its own candidate set (Example 7 analogue)") {
    val (_, g, slen) = world
    val tight = Der.candidateNodes(spark, PatEdgeIns(PEdge("pm", "te", 1)),
                                   patNoEdges, g, iqueryNoEdges, slen, cap)
    val loose = Der.candidateNodes(spark, PatEdgeIns(PEdge("s", "te", 4)),
                                   patNoEdges, g, iqueryNoEdges, slen, cap)
    // S1 reaches TE1 but not TE2 within 4: candidates {5,4}; not nested with
    // the PM case here, so check the exact sets instead.
    assert(loose == Set(5L, 4L))
    assert(tight == Set(2L, 3L, 4L))
  }

  test("DER-I: star-bound insert still flags unreachable pairs") {
    val (_, g, slen) = world
    val can = Der.candidateNodes(spark, PatEdgeIns(PEdge("pm", "te", PatternGraph.Star)),
                                 patNoEdges, g, iqueryNoEdges, slen, cap)
    // PM2 still violates (no finite path), PM1 satisfies.
    assert(can == Set(2L, 3L, 4L))
  }

  test("DER-I: PatEdgeDel collects excluded label candidates (Can_AN)") {
    // Pattern pm -> te <= 1 excludes PM2; deleting that edge makes PM2 addable.
    val (_, g, slen) = world
    val p      = PatternGraph(patNoEdges.nodes, Seq(PEdge("pm", "te", 1)))
    val iquery = Bgs.run(spark, g, p, slen, cap)
    assert(TestKit.collectMatches(iquery, p)("pm") == Set(1L))
    val can = Der.candidateNodes(spark, PatEdgeDel("pm", "te"), p, g, iquery, slen, cap)
    assert(can == Set(2L))
  }

  test("DER-I: PatNodeIns candidates are all nodes of the new label") {
    val (_, g, slen) = world
    val u   = PatNodeIns(PNode("te2", "TE"), PEdge("pm", "te2", 2))
    val can = Der.candidateNodes(spark, u, patNoEdges, g, iqueryNoEdges, slen, cap)
    assert(can == Set(3L, 4L))
  }

  test("DER-I: PatNodeDel candidates include the node's matches") {
    val (_, g, slen) = world
    val can = Der.candidateNodes(spark, PatNodeDel("te"), patNoEdges, g,
                                 iqueryNoEdges, slen, cap)
    assert(can == Set(3L, 4L)) // te's matches; no constrained neighbours
  }

  test("DER-II: affected nodes of an edge insert (Example 8 analogue)") {
    val (_, g, slen) = world
    val s2  = IncApsp.insertEdge(slen, 2L, 3L, cap)
    val aff = Der.affectedNodes(IncApsp.changedPairs(slen, s2))
    assert(aff == Set(2L, 3L)) // only the new pair 2->3
  }

  test("DER-II: a far-reaching insert affects more nodes (coverage)") {
    val (_, g, slen) = world
    val sBig   = IncApsp.insertEdge(slen, 2L, 1L, cap) // PM2 -> PM1 opens 2->{1,3,4}
    val affBig = Der.affectedNodes(IncApsp.changedPairs(slen, sBig))
    val sSmall   = IncApsp.insertEdge(slen, 2L, 3L, cap)
    val affSmall = Der.affectedNodes(IncApsp.changedPairs(slen, sSmall))
    assert(affBig == Set(1L, 2L, 3L, 4L))
    assert(affSmall.subsetOf(affBig)) // U_Da ⊵ U_Db
  }

  test("DER-II pairwise coverage via typeII") {
    val uA = DataEdgeIns(2L, 1L); val uB = DataEdgeIns(2L, 3L)
    val pairs = Der.typeII(Seq(uA -> Set(1L, 2L, 3L, 4L), uB -> Set(2L, 3L)))
    assert(pairs == Seq((uA, uB)))
  }

  test("DER-I pairwise coverage via typeI, with equal-set tie-break") {
    val u1 = PatEdgeIns(PEdge("pm", "te", 1))
    val u2 = PatEdgeIns(PEdge("s", "te", 4))
    val u3 = PatEdgeIns(PEdge("pm", "s", 2))
    val pairs = Der.typeI(Seq(u1 -> Set(1L, 2L, 3L), u2 -> Set(2L, 3L), u3 -> Set(2L, 3L)))
    // u1 covers both; u2/u3 have equal sets — only one direction is kept.
    assert(pairs.contains((u1, u2)) && pairs.contains((u1, u3)))
    assert(pairs.count { case (a, b) => Set(a.uid, b.uid) == Set(u2.uid, u3.uid) } == 1)
  }

  test("DER-III: cross-graph cancellation (Example 9 analogue)") {
    // Pattern insert pm->te<=1 would drop PM2, but the data insert 2->3
    // restores reachability: the two updates cancel.
    val (_, g, slen) = world
    val uPi  = PatEdgeIns(PEdge("pm", "te", 1))
    val can  = Der.candidateNodes(spark, uPi, patNoEdges, g, iqueryNoEdges, slen, cap)
    val s2   = IncApsp.insertEdge(IncApsp.insertEdge(slen, 2L, 3L, cap), 2L, 4L, cap)
    val aff  = Der.affectedNodes(IncApsp.changedPairs(slen, s2))
    assert(can.subsetOf(aff))
    assert(Der.typeIII(spark, uPi, can, aff, iqueryNoEdges, s2, cap))
  }

  test("DER-III rejects when the new SLen still violates the bound") {
    val (_, g, slen) = world
    val uPi = PatEdgeIns(PEdge("pm", "te", 1))
    val can = Der.candidateNodes(spark, uPi, patNoEdges, g, iqueryNoEdges, slen, cap)
    val s2  = IncApsp.insertEdge(slen, 2L, 3L, cap) // 2->4 still unreachable
    val aff = Der.affectedNodes(IncApsp.changedPairs(slen, s2))
    assert(!Der.typeIII(spark, uPi, can, aff, iqueryNoEdges, s2, cap))
  }

  test("DER-III rejects when Aff does not cover Can") {
    val (_, g, slen) = world
    val uPi = PatEdgeIns(PEdge("pm", "te", 1))
    val can = Der.candidateNodes(spark, uPi, patNoEdges, g, iqueryNoEdges, slen, cap)
    assert(!Der.typeIII(spark, uPi, can, affDi = Set(3L), iqueryNoEdges, slen, cap))
  }

  test("Theorem 1: Can_N detection is order-invariant") {
    val (_, g, slen) = world
    val us: Seq[PatternUpdate] = Seq(
      PatEdgeIns(PEdge("pm", "te", 1)), PatEdgeIns(PEdge("s", "te", 4)),
      PatNodeDel("s"))
    val once  = us.map(u => Der.candidateNodes(spark, u, patNoEdges, g, iqueryNoEdges, slen, cap))
    val again = us.reverse.map(u => Der.candidateNodes(spark, u, patNoEdges, g, iqueryNoEdges, slen, cap)).reverse
    assert(once == again)
  }

  test("Theorem 2: commuting data updates reach the same SLen in any order") {
    val (lg, g, slen) = world
    val ops = SlenOps(cap, partitioned = false)
    def applySeq(us: Seq[DataUpdate]): Map[(Long, Long), Int] = {
      var cur = g; var s = slen
      us.foreach { u =>
        val (g2, s2) = Engine.applyDataUpdate(spark, cur, s, u, ops); cur = g2; s = s2
      }
      TestKit.collectSlen(s)
    }
    val us: Seq[DataUpdate] = Seq(DataEdgeIns(2L, 3L), DataEdgeDel(5L, 3L), DataEdgeIns(4L, 5L))
    assert(applySeq(us) == applySeq(us.reverse))
  }
}
