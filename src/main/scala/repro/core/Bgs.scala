package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Bounded Graph Simulation matching (§III-A/B) on DataFrames.
  *
  * The maximum BGS match relation is the greatest fixpoint of candidate
  * removal: start from label candidates and repeatedly delete `(u, v)`
  * when some pattern edge `(u, u', k)` has no witness `v'` with
  * `1 ≤ SLen(v, v') ≤ k` and `(u', v')` still a candidate. GPNM returns,
  * per pattern node, its surviving candidates — or ∅ for every node if any
  * pattern node ends up unmatched (then `G_P ⋢ G_D`).
  *
  * Conventions (DESIGN.md §3.7): `d(v,v)=0` never witnesses an edge;
  * `*` bounds are clamped to the SLen cap (any stored-finite length).
  */
object Bgs {

  /** Label candidates `(pu, v)`: data nodes whose label equals the pattern
    * node's required label.
    */
  def labelCandidates(spark: SparkSession, g: DataGraph, p: PatternGraph): DataFrame =
    g.nodes
      .join(p.nodesDf(spark), col("label") === col("plabel"))
      .select(col("pu"), col("id").as("v"))

  /** Run the removal fixpoint from `cand0` and apply the all-nodes-matched
    * rule. Returns the GPNM result `(pu, v)`.
    */
  def matchFixpoint(spark: SparkSession, cand0: DataFrame, p: PatternGraph,
                    slen: DataFrame, cap: Int): DataFrame = {
    var cand = cand0.distinct().localCheckpoint()
    if (p.edges.nonEmpty) {
      val pe = p.edgesDf(spark, cap)
      // Only distances that can ever witness an edge matter.
      val sl = slen
        .filter(col("d") >= 1 && col("d") <= p.maxBound(cap))
        .select(col("src").as("wv"), col("dst").as("wv2"), col("d"))
        .localCheckpoint()
      var changed = true
      var iters   = 0
      while (changed) {
        iters += 1
        require(iters <= 100000, "BGS fixpoint failed to converge")
        val req = cand
          .join(pe, cand("pu") === pe("ppu"))
          .select(col("pu"), col("v"), col("ppv"), col("bound"))
        val witnesses = req
          .join(sl, req("v") === sl("wv") && col("d") <= req("bound"))
          .join(cand.select(col("pu").as("cpv"), col("v").as("cv2")),
                col("wv2") === col("cv2") && col("ppv") === col("cpv"))
          .select(col("pu"), col("v"), col("ppv"))
          .distinct()
        val bad = req
          .select(col("pu"), col("v"), col("ppv"))
          .distinct()
          .join(witnesses, Seq("pu", "v", "ppv"), "left_anti")
          .select(col("pu"), col("v"))
          .distinct()
          .localCheckpoint()
        if (bad.isEmpty) changed = false
        else cand = cand.join(bad, Seq("pu", "v"), "left_anti").localCheckpoint()
      }
    }
    finalizeResult(spark, cand, p)
  }

  /** BGS completeness rule: if any pattern node has no surviving candidate,
    * there is no match at all and every `N_{p_i}` is empty.
    */
  private def finalizeResult(spark: SparkSession, cand: DataFrame, p: PatternGraph): DataFrame = {
    val matchedNodes = cand.select("pu").distinct().collect().map(_.getString(0)).toSet
    if (p.nodes.forall(n => matchedNodes.contains(n.id))) cand
    else cand.limit(0)
  }

  /** Full GPNM: label candidates then the removal fixpoint. */
  def run(spark: SparkSession, g: DataGraph, p: PatternGraph,
          slen: DataFrame, cap: Int): DataFrame =
    matchFixpoint(spark, labelCandidates(spark, g, p), p, slen, cap)
}
