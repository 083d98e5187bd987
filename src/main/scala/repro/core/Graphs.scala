package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** A directed, node-labeled data graph `G_D = (V_D, E_D, f_a)` (§III-A).
  *
  * Held as two DataFrames so every set-oriented kernel (APSP, candidate
  * extraction, diffs) runs on Catalyst:
  *   - `nodes(id: Long, label: String)` — `f_a` reduced to a single label,
  *     which is how the paper uses it (job titles);
  *   - `edges(src: Long, dst: Long)` — unweighted directed edges.
  *
  * Update application returns a new `DataGraph`; `localCheckpoint` keeps
  * plans flat across long update sequences.
  */
final case class DataGraph(nodes: DataFrame, edges: DataFrame) {

  /** Insert a directed edge; no-op if it already exists. */
  def insertEdge(spark: SparkSession, a: Long, b: Long): DataGraph = {
    import spark.implicits._
    val added = Seq((a, b)).toDF("src", "dst")
    copy(edges = edges.union(added).distinct().localCheckpoint())
  }

  /** Delete a directed edge; no-op if absent. */
  def deleteEdge(a: Long, b: Long): DataGraph =
    copy(edges = edges.filter(!(col("src") === a && col("dst") === b)).localCheckpoint())

  /** Insert a node with its attachment edges (out- and in-neighbours). */
  def insertNode(spark: SparkSession, id: Long, label: String,
                 outTo: Seq[Long], inFrom: Seq[Long]): DataGraph = {
    import spark.implicits._
    val n2 = nodes.union(Seq((id, label)).toDF("id", "label")).distinct().localCheckpoint()
    val newEdges = (outTo.map(t => (id, t)) ++ inFrom.map(s => (s, id))).toDF("src", "dst")
    val e2 = edges.union(newEdges).distinct().localCheckpoint()
    DataGraph(n2, e2)
  }

  /** Delete a node and all its incident edges. */
  def removeNode(id: Long): DataGraph =
    DataGraph(
      nodes.filter(col("id") =!= id).localCheckpoint(),
      edges.filter(col("src") =!= id && col("dst") =!= id).localCheckpoint()
    )

  /** Number of nodes (an action). */
  def numNodes: Long = nodes.count()

  /** Number of edges (an action). */
  def numEdges: Long = edges.count()

  /** Pin both sides in memory for repeated traversals. */
  def cached(): DataGraph = {
    nodes.cache(); edges.cache()
    DataGraph(nodes, edges)
  }
}

object DataGraph {

  /** Build a graph from driver-side node and edge lists (tests, examples). */
  def fromLocal(spark: SparkSession, ns: Seq[(Long, String)], es: Seq[(Long, Long)]): DataGraph = {
    import spark.implicits._
    DataGraph(ns.toDF("id", "label"), es.toDF("src", "dst"))
  }
}

/** A pattern node: identifier (e.g. "PM") and required label. */
final case class PNode(id: String, label: String)

/** A pattern edge `(src, dst)` with bounded path length `1..bound`;
  * `bound = PatternGraph.Star` encodes the `*` symbol (any finite length).
  */
final case class PEdge(src: String, dst: String, bound: Int)

/** A pattern graph `G_P = (V_P, E_P, f_v, f_e)` (§III-A).
  *
  * Patterns have 6–10 nodes in the paper, so they are plain driver-side
  * values; DataFrame views are derived where a join needs them.
  */
final case class PatternGraph(nodes: Seq[PNode], edges: Seq[PEdge]) {
  require(nodes.map(_.id).distinct.size == nodes.size, "duplicate pattern node ids")

  /** Node lookup by id. */
  def node(id: String): PNode = nodes.find(_.id == id)
    .getOrElse(throw new NoSuchElementException(s"pattern node $id"))

  /** Whether `id` names a node of this pattern. */
  def hasNode(id: String): Boolean = nodes.exists(_.id == id)

  /** Out- and in-neighbour pattern-node ids of `id`. */
  def neighbours(id: String): Seq[String] =
    (edges.collect { case PEdge(s, d, _) if s == id => d } ++
     edges.collect { case PEdge(s, d, _) if d == id => s }).distinct

  /** Largest finite bound, clamped to `cap`; used to prune SLen joins. */
  def maxBound(cap: Int): Int = {
    val bs = edges.map(e => math.min(e.bound, cap))
    if (bs.isEmpty) 0 else bs.max
  }

  /** DataFrame view of the nodes: (pu, plabel). */
  def nodesDf(spark: SparkSession): DataFrame = {
    import spark.implicits._
    nodes.map(n => (n.id, n.label)).toDF("pu", "plabel")
  }

  /** DataFrame view of the edges: (ppu, ppv, bound), `*` clamped to `cap`. */
  def edgesDf(spark: SparkSession, cap: Int): DataFrame = {
    import spark.implicits._
    edges.map(e => (e.src, e.dst, math.min(e.bound, cap))).toDF("ppu", "ppv", "bound")
  }
}

object PatternGraph {
  /** The `*` bound: no length constraint beyond finiteness. */
  val Star: Int = Int.MaxValue
}
