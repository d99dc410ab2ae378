package repro.geo

import scala.collection.mutable

/** The "DA-based" route planner (paper ref [2]): route planning guided by
  * basic statistical counts of segment-to-segment transitions observed in
  * historical (training) routes.
  *
  * Planning from segment `from` to `to` is a least-cost search in the
  * segment graph with cost
  *
  *   cost(s -> s') = len(s') + beta * (-log P(s' | s))
  *
  * where P is the add-one-smoothed empirical transition probability. The
  * length term keeps routes geometrically sane on transitions never seen in
  * training; `beta` (metres per nat) trades statistics against geometry.
  * Falls back to the pure shortest path when the statistical search fails.
  *
  * Both our methods (MMA / TRMMA) and every baseline that needs a route-
  * planning subroutine use this same planner, mirroring the paper's
  * fair-comparison setup.
  */
final class RoutePlanner(
    net: RoadNetwork,
    counts: Map[Long, Int],
    outTotals: Map[Int, Int],
    beta: Double,
) extends Serializable {

  private def key(a: Int, b: Int): Long = (a.toLong << 32) | (b.toLong & 0xffffffffL)

  /** -log of smoothed P(next | cur). */
  def negLogProb(cur: Int, next: Int): Double = {
    val deg = math.max(1, net.nextSegments(cur).length)
    val c = counts.getOrElse(key(cur, next), 0)
    val tot = outTotals.getOrElse(cur, 0)
    -math.log((c + 1.0) / (tot + deg.toDouble))
  }

  /** Segments connecting `from` to `to`, excluding `from`, including `to`;
    * Nil when `from == to`. Never fails on a strongly connected network.
    */
  def plan(from: Int, to: Int): List[Int] = {
    if (from == to) return Nil
    ShortestPath
      .segmentSearch(net, from, to,
        (cur, next) => net.segments(next).lengthM + beta * negLogProb(cur, next))
      .orElse(ShortestPath.segmentRoute(net, from, to))
      .getOrElse(List(to)) // disconnected fallback: jump straight to `to`
  }

  /** Stitch per-point matched segments into a route: consecutive duplicate
    * segments collapse; gaps are filled by `plan`. (Algorithm 1, lines 10-13.)
    */
  def stitch(matched: Seq[Int]): List[Int] = {
    if (matched.isEmpty) return Nil
    val out = mutable.ListBuffer[Int](matched.head)
    matched.sliding(2).foreach {
      case Seq(a, b) if a != b => out ++= plan(a, b)
      case _                   => ()
    }
    // Collapse accidental consecutive repeats from planning.
    val dedup = mutable.ListBuffer.empty[Int]
    out.foreach(s => if (dedup.isEmpty || dedup.last != s) dedup += s)
    dedup.toList
  }
}

object RoutePlanner {

  /** Fit transition counts from historical routes (sequences of segment ids). */
  def fit(net: RoadNetwork, routes: Iterable[Seq[Int]], beta: Double = 30.0): RoutePlanner = {
    val counts = mutable.HashMap.empty[Long, Int]
    val totals = mutable.HashMap.empty[Int, Int]
    routes.foreach { r =>
      r.sliding(2).foreach {
        case Seq(a, b) if a != b =>
          val k = (a.toLong << 32) | (b.toLong & 0xffffffffL)
          counts(k) = counts.getOrElse(k, 0) + 1
          totals(a) = totals.getOrElse(a, 0) + 1
        case _ => ()
      }
    }
    new RoutePlanner(net, counts.toMap, totals.toMap, beta)
  }

  /** A planner with no historical statistics — pure shortest path costs. */
  def shortestPathOnly(net: RoadNetwork): RoutePlanner =
    new RoutePlanner(net, Map.empty, Map.empty, beta = 0.0)
}
