package repro.sssp

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Global shortest-path-length computation as iterative DataFrame BFS.
  *
  * This is the non-partitioned engine used by the INC-GPNM / EH-GPNM /
  * UA-GPNM-NoPar baselines: each BFS level is a shuffle join
  * (frontier ⋈ edges), deduplicated and anti-joined against the reached
  * set. `localCheckpoint` truncates lineage per level so long runs stay
  * flat.
  *
  * SLen representation (Table II): `(src, dst, d)` rows for *finite*
  * distances only, `d ∈ [0, cap]`, including the self rows `(v, v, 0)`.
  * Absent pair ⇒ ∞. The cap is a documented substitution (DESIGN.md §3.1):
  * pattern bounds are small integers (1–3), so distances beyond `cap`
  * never witness a match.
  */
object ApspBfs {

  /** Hop distances from every node of `sources` ("id" column) to every node
    * reachable within `cap` hops over `edges(src, dst)`.
    */
  def fromSources(spark: SparkSession, edges: DataFrame, sources: DataFrame, cap: Int): DataFrame = {
    val e = edges.select(col("src").as("e_src"), col("dst").as("e_dst"))
    var result = sources
      .select(col("id").as("src"), col("id").as("dst"), lit(0).as("d"))
      .distinct()
      .localCheckpoint()
    var frontier = result
    var depth    = 0
    var done     = frontier.isEmpty
    while (!done && depth < cap) {
      depth += 1
      val next = frontier
        .join(e, frontier("dst") === e("e_src"))
        .select(col("src"), col("e_dst").as("dst"))
        .distinct()
        .join(result, Seq("src", "dst"), "left_anti")
        .select(col("src"), col("dst"), lit(depth).as("d"))
        .localCheckpoint()
      if (next.isEmpty) done = true
      else {
        result = result.union(next).localCheckpoint()
        frontier = next
      }
    }
    result
  }

  /** All-pairs shortest path lengths (the SLen matrix, finite entries). */
  def apsp(spark: SparkSession, nodes: DataFrame, edges: DataFrame, cap: Int): DataFrame =
    fromSources(spark, edges, nodes.select(col("id")), cap)
}
