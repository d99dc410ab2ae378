package repro.recovery

import repro.geo.RoadNetwork

/** Arc-length parameterisation of a route: maps between (segment position,
  * ratio) and cumulative distance along the route. Shared by the Linear
  * baseline (constant-speed interpolation) and the constraint masks of the
  * MTrajRec-family decoders.
  */
final class RouteArc(net: RoadNetwork, val route: Array[Int]) extends Serializable {
  /** Cumulative length before each route position. */
  val cum: Array[Double] = {
    val c = new Array[Double](route.length + 1)
    var i = 0
    while (i < route.length) { c(i + 1) = c(i) + net.segments(route(i)).lengthM; i += 1 }
    c
  }
  def totalLen: Double = cum(route.length)

  /** Arc position of ratio `r` on the segment at route position `pos`. */
  def arcOf(pos: Int, r: Double): Double =
    cum(pos) + r * net.segments(route(pos)).lengthM

  /** Map an arc distance back to (route position, ratio), clamped. */
  def atArc(arc: Double): (Int, Double) = {
    val a = math.max(0.0, math.min(totalLen - 1e-9, arc))
    var lo = 0; var hi = route.length - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) / 2
      if (cum(mid) <= a) lo = mid else hi = mid - 1
    }
    val len = net.segments(route(lo)).lengthM
    (lo, math.min(0.999999, (a - cum(lo)) / math.max(1e-9, len)))
  }

  /** First route position of segment `seg` at/after `from`, or -1. */
  def posOf(seg: Int, from: Int): Int = {
    var p = math.max(0, from)
    while (p < route.length && route(p) != seg) p += 1
    if (p < route.length) p else -1
  }
}
