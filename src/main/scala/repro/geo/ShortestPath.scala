package repro.geo

import java.util.PriorityQueue
import scala.collection.mutable

/** Shortest-path primitives over a [[RoadNetwork]]: node-level Dijkstra,
  * point-to-point A* with early exit, and the road-network distance between
  * two map-matched points used by the MAE/RMSE recovery metrics.
  */
object ShortestPath {

  private final val Inf = Double.PositiveInfinity

  /** Node-level Dijkstra from `src`; distances capped at `maxDist` (nodes
    * farther than that keep +inf). O((m + n) log n).
    */
  def dijkstra(net: RoadNetwork, src: Int, maxDist: Double = Inf): Array[Double] = {
    val dist = Array.fill(net.numNodes)(Inf)
    dist(src) = 0.0
    val pq = new PriorityQueue[(Double, Int)](11,
      (a: (Double, Int), b: (Double, Int)) => java.lang.Double.compare(a._1, b._1))
    pq.add((0.0, src))
    while (!pq.isEmpty) {
      val (d, u) = pq.poll()
      if (d <= dist(u) && d <= maxDist) {
        net.outSegments(u).foreach { sid =>
          val s = net.segments(sid)
          val nd = d + s.lengthM
          if (nd < dist(s.to)) { dist(s.to) = nd; pq.add((nd, s.to)) }
        }
      }
    }
    dist
  }

  /** A* shortest path length from node `src` to node `dst` with the planar
    * straight-line heuristic (admissible: every segment's length is its
    * chord). Returns +inf if unreachable.
    */
  def aStar(net: RoadNetwork, src: Int, dst: Int): Double = {
    if (src == dst) return 0.0
    val goal = net.nodes(dst)
    val g = mutable.HashMap.empty[Int, Double]
    g(src) = 0.0
    val pq = new PriorityQueue[(Double, Int)](11,
      (a: (Double, Int), b: (Double, Int)) => java.lang.Double.compare(a._1, b._1))
    pq.add((net.nodes(src).dist(goal), src))
    val done = mutable.HashSet.empty[Int]
    while (!pq.isEmpty) {
      val (_, u) = pq.poll()
      if (u == dst) return g(u)
      if (!done.contains(u)) {
        done += u
        val gu = g(u)
        net.outSegments(u).foreach { sid =>
          val s = net.segments(sid)
          val ng = gu + s.lengthM
          if (ng < g.getOrElse(s.to, Inf)) {
            g(s.to) = ng
            pq.add((ng + net.nodes(s.to).dist(goal), s.to))
          }
        }
      }
    }
    Inf
  }

  /** Shortest node path from `src` to `dst` as the list of traversed
    * segment ids (A* with parent pointers). None when unreachable.
    */
  def nodePathSegments(net: RoadNetwork, src: Int, dst: Int): Option[List[Int]] = {
    if (src == dst) return Some(Nil)
    val goal = net.nodes(dst)
    val g = mutable.HashMap.empty[Int, Double]
    val prevSeg = mutable.HashMap.empty[Int, Int] // node -> incoming segment
    g(src) = 0.0
    val pq = new PriorityQueue[(Double, Int)](11,
      (a: (Double, Int), b: (Double, Int)) => java.lang.Double.compare(a._1, b._1))
    pq.add((net.nodes(src).dist(goal), src))
    val done = mutable.HashSet.empty[Int]
    while (!pq.isEmpty) {
      val (_, u) = pq.poll()
      if (u == dst) {
        var path = List.empty[Int]
        var cur = dst
        while (cur != src) {
          val sid = prevSeg(cur)
          path = sid :: path
          cur = net.segments(sid).from
        }
        return Some(path)
      }
      if (!done.contains(u)) {
        done += u
        val gu = g(u)
        net.outSegments(u).foreach { sid =>
          val s = net.segments(sid)
          val ng = gu + s.lengthM
          if (ng < g.getOrElse(s.to, Inf)) {
            g(s.to) = ng
            prevSeg(s.to) = sid
            pq.add((ng + net.nodes(s.to).dist(goal), s.to))
          }
        }
      }
    }
    None
  }

  /** Memoising node-to-node distance helper for metric computation. One
    * instance per evaluation task; NOT thread-safe.
    */
  final class DistCache(net: RoadNetwork) {
    private val cache = mutable.HashMap.empty[Long, Double]
    def nodeDist(a: Int, b: Int): Double =
      cache.getOrElseUpdate((a.toLong << 32) | (b.toLong & 0xffffffffL), aStar(net, a, b))

    /** Directed travel distance from point (segA, rA) to point (segB, rB)
      * along the network — the HMM transition distance (a wrong-direction
      * candidate forces a costly loop, which is exactly the signal that
      * disambiguates direction).
      */
    def directedDist(segA: Int, rA: Double, segB: Int, rB: Double): Double = {
      val sa = net.segments(segA); val sb = net.segments(segB)
      if (segA == segB) {
        if (rB >= rA) return (rB - rA) * sa.lengthM
        return (1 - rA) * sa.lengthM + nodeDist(sa.to, sb.from) + rB * sb.lengthM
      }
      (1 - rA) * sa.lengthM + nodeDist(sa.to, sb.from) + rB * sb.lengthM
    }

    /** Road-network distance between map-matched points (segA, rA) and
      * (segB, rB): the shorter directed travel distance of A->B and B->A.
      * Falls back to the planar straight-line distance if neither direction
      * is reachable (disconnected components cannot occur with the generator
      * but defensive anyway).
      */
    def matchedDist(segA: Int, rA: Double, segB: Int, rB: Double): Double = {
      if (segA == segB) {
        return math.abs(rA - rB) * net.segments(segA).lengthM
      }
      val sa = net.segments(segA); val sb = net.segments(segB)
      val ab = (1 - rA) * sa.lengthM + nodeDist(sa.to, sb.from) + rB * sb.lengthM
      val ba = (1 - rB) * sb.lengthM + nodeDist(sb.to, sa.from) + rA * sa.lengthM
      val d = math.min(ab, ba)
      if (d.isInfinite) net.pointAt(segA, rA).dist(net.pointAt(segB, rB)) else d
    }
  }

  /** Shortest segment-level route from segment `from` to segment `to`:
    * the sequence of segments AFTER `from` up to and including `to`
    * (empty if `from == to`). Costs are successor-segment lengths. Returns
    * None when unreachable within `maxHops` expansions.
    */
  def segmentRoute(net: RoadNetwork, from: Int, to: Int, maxHops: Int = 200): Option[List[Int]] =
    segmentSearch(net, from, to, (_, nid) => net.segments(nid).lengthM, maxHops)

  /** Generic least-cost search in the segment graph with per-transition cost
    * `cost(curSeg, nextSeg)`; shared by the shortest-path route and the
    * statistics-weighted planner.
    */
  def segmentSearch(
      net: RoadNetwork,
      from: Int,
      to: Int,
      cost: (Int, Int) => Double,
      maxHops: Int = 200,
  ): Option[List[Int]] = {
    if (from == to) return Some(Nil)
    val dist = mutable.HashMap.empty[Int, Double]
    val prev = mutable.HashMap.empty[Int, Int]
    dist(from) = 0.0
    val pq = new PriorityQueue[(Double, Int)](11,
      (a: (Double, Int), b: (Double, Int)) => java.lang.Double.compare(a._1, b._1))
    pq.add((0.0, from))
    var expansions = 0
    while (!pq.isEmpty && expansions < maxHops * 64) {
      val (d, u) = pq.poll()
      if (u == to) {
        // Reconstruct path of segments excluding `from`.
        var path = List.empty[Int]
        var cur = to
        while (cur != from) { path = cur :: path; cur = prev(cur) }
        return Some(path)
      }
      if (d <= dist.getOrElse(u, Inf)) {
        expansions += 1
        net.nextSegments(u).foreach { v =>
          val nd = d + math.max(1e-9, cost(u, v))
          if (nd < dist.getOrElse(v, Inf)) {
            dist(v) = nd; prev(v) = u; pq.add((nd, v))
          }
        }
      }
    }
    None
  }
}
