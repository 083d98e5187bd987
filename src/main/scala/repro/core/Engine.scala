package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.sssp.{ApspBfs, IncApsp}
import repro.partition.PartitionedApsp

/** The SLen maintenance engine: how restricted-source recomputation (after
  * deletions) is executed. This is exactly what separates UA-GPNM from
  * UA-GPNM-NoPar (§V): the partitioned engine runs local BFS inside
  * combined label partitions; the global engine runs join-level BFS.
  */
final case class SlenOps(cap: Int, partitioned: Boolean) {

  /** Recompute SLen rows for a source set over the post-update graph. */
  def recompute(spark: SparkSession, g: DataGraph): IncApsp.Recompute =
    if (partitioned) sources => PartitionedApsp.fromSources(spark, g, sources, cap)
    else sources => ApspBfs.fromSources(spark, g.edges, sources, cap)

  /** Full SLen matrix from scratch. */
  def fullApsp(spark: SparkSession, g: DataGraph): DataFrame =
    if (partitioned) PartitionedApsp.apsp(spark, g, cap)
    else ApspBfs.apsp(spark, g.nodes, g.edges, cap)
}

/** Application of one data update to the (graph, SLen) state. */
object Engine {

  /** Apply `u`, returning the updated graph and maintained SLen. */
  def applyDataUpdate(spark: SparkSession, g: DataGraph, slen: DataFrame,
                      u: DataUpdate, ops: SlenOps): (DataGraph, DataFrame) = u match {
    case DataEdgeIns(a, b) =>
      val g2 = g.insertEdge(spark, a, b)
      (g2, IncApsp.insertEdge(slen, a, b, ops.cap))
    case DataEdgeDel(a, b) =>
      val g2 = g.deleteEdge(a, b)
      (g2, IncApsp.deleteEdge(slen, a, b, ops.recompute(spark, g2)))
    case DataNodeIns(id, label, outTo, inFrom) =>
      val g2    = g.insertNode(spark, id, label, outTo, inFrom)
      val base  = IncApsp.insertNode(spark, slen, id)
      val after = (outTo.map(t => (id, t)) ++ inFrom.map(s => (s, id)))
        .foldLeft(base) { case (s, (a, b)) => IncApsp.insertEdge(s, a, b, ops.cap) }
      (g2, after)
    case DataNodeDel(id) =>
      val g2 = g.removeNode(id)
      (g2, IncApsp.deleteNode(slen, id, ops.recompute(spark, g2)))
  }
}
