package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._

import scala.util.Random

/** Shared helpers for the test suites: seeded random graphs/patterns on the
  * driver (so [[repro.core.LocalRef]] can provide ground truth) and
  * conversions to DataFrames.
  */
object TestKit {

  /** A driver-side labeled digraph. */
  final case class LocalGraph(nodes: Seq[(Long, String)], edges: Seq[(Long, Long)]) {
    def nodeIds: Seq[Long] = nodes.map(_._1)
    def labels: Seq[String] = nodes.map(_._2).distinct.sorted
    def toDataGraph(spark: SparkSession): DataGraph =
      DataGraph.fromLocal(spark, nodes, edges)
  }

  /** Seeded homophilous random graph, small enough for brute force. */
  def randomGraph(seed: Long, n: Int = 40, m: Int = 120, nLabels: Int = 4,
                  homophily: Double = 0.7): LocalGraph = {
    val rnd    = new Random(seed)
    val nodes  = (0L until n).map(i => (i, s"L${rnd.nextInt(nLabels)}"))
    val byLab  = nodes.groupBy(_._2).view.mapValues(_.map(_._1).toVector).toMap
    val edges  = scala.collection.mutable.LinkedHashSet.empty[(Long, Long)]
    var guard  = 0
    while (edges.size < m && guard < m * 50) {
      guard += 1
      val s = rnd.nextInt(n).toLong
      val d =
        if (rnd.nextDouble() < homophily) {
          val pool = byLab(nodes(s.toInt)._2)
          pool(rnd.nextInt(pool.size))
        } else rnd.nextInt(n).toLong
      if (s != d) edges += ((s, d))
    }
    LocalGraph(nodes, edges.toSeq)
  }

  /** Seeded random pattern over the graph's labels. */
  def randomPattern(g: LocalGraph, seed: Long, nNodes: Int = 4, nEdges: Int = 5): PatternGraph =
    repro.gen.PatternGen.generate(nNodes, nEdges, g.labels, seed)

  /** Collect a SLen DataFrame to the LocalRef map form. */
  def collectSlen(df: DataFrame): Map[(Long, Long), Int] =
    df.collect().map(r => ((r.getLong(0), r.getLong(1)), r.getInt(2))).toMap

  /** Collect a GPNM result `(pu, v)` to pattern-node → match-set form,
    * including empty sets for unmatched pattern nodes of `p`.
    */
  def collectMatches(df: DataFrame, p: PatternGraph): Map[String, Set[Long]] = {
    val m = df.collect().map(r => (r.getString(0), r.getLong(1)))
      .groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap
    p.nodes.map(n => n.id -> m.getOrElse(n.id, Set.empty[Long])).toMap
  }

  /** Apply data updates to a LocalGraph (reference semantics). */
  def applyDataLocal(g: LocalGraph, us: Seq[DataUpdate]): LocalGraph =
    us.foldLeft(g) {
      case (cur, DataEdgeIns(a, b)) =>
        cur.copy(edges = (cur.edges :+ ((a, b))).distinct)
      case (cur, DataEdgeDel(a, b)) =>
        cur.copy(edges = cur.edges.filterNot(_ == ((a, b))))
      case (cur, DataNodeIns(id, l, out, in)) =>
        LocalGraph((cur.nodes :+ ((id, l))).distinct,
                   (cur.edges ++ out.map((id, _)) ++ in.map((_, id))).distinct)
      case (cur, DataNodeDel(id)) =>
        LocalGraph(cur.nodes.filterNot(_._1 == id),
                   cur.edges.filterNot(e => e._1 == id || e._2 == id))
    }
}
