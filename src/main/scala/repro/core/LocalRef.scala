package repro.core

import scala.collection.mutable

/** Pure-Scala brute-force reference implementations used as test ground
  * truth for the Spark kernels. Deliberately simple: BFS per source for
  * APSP, naive candidate-removal loop for BGS.
  */
object LocalRef {

  /** All-pairs shortest hop lengths, finite entries ≤ cap, self = 0. */
  def apsp(nodes: Seq[Long], edges: Seq[(Long, Long)], cap: Int): Map[(Long, Long), Int] = {
    val adj = edges.groupMap(_._1)(_._2)
    val out = mutable.Map.empty[(Long, Long), Int]
    nodes.foreach { s =>
      val dist = mutable.Map[Long, Int](s -> 0)
      var level = List(s)
      var d = 0
      while (level.nonEmpty && d < cap) {
        d += 1
        level = level.flatMap(v => adj.getOrElse(v, Nil)).distinct.filterNot(dist.contains)
        level.foreach(w => dist(w) = d)
      }
      dist.foreach { case (t, dd) => out((s, t)) = dd }
    }
    out.toMap
  }

  /** Maximum BGS match + GPNM completeness rule: pattern-node id → matches.
    * All-empty map values when some pattern node cannot be matched.
    */
  def gpnm(nodes: Seq[(Long, String)], edges: Seq[(Long, Long)],
           p: PatternGraph, cap: Int): Map[String, Set[Long]] = {
    val slen = apsp(nodes.map(_._1), edges, cap)
    val cand = mutable.Map.empty[String, mutable.Set[Long]]
    p.nodes.foreach { pn =>
      cand(pn.id) = mutable.Set.from(nodes.collect { case (id, l) if l == pn.label => id })
    }
    var changed = true
    while (changed) {
      changed = false
      for (e <- p.edges; v <- cand(e.src).toSeq) {
        val bound = math.min(e.bound, cap)
        val ok = cand(e.dst).exists { v2 =>
          slen.get((v, v2)).exists(d => d >= 1 && d <= bound)
        }
        if (!ok) { cand(e.src) -= v; changed = true }
      }
    }
    if (p.nodes.forall(n => cand(n.id).nonEmpty))
      p.nodes.map(n => n.id -> cand(n.id).toSet).toMap
    else p.nodes.map(n => n.id -> Set.empty[Long]).toMap
  }
}
