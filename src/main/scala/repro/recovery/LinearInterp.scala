package repro.recovery

import repro.geo.{Geo, RoadNetwork, XY}
import repro.mm.MapMatcher
import repro.traj.{MatchedPoint, Recovered, Traj}
import scala.collection.mutable

/** Baseline `Linear` (paper VI-A) and the ablation combinations
  * `MMA+linear` / `Nearest+linear` (Table IV): map-match the sparse points
  * with the given matcher, then fill every missing epsilon-slot by
  * constant-speed linear interpolation of arc length along the route.
  *
  * No learning: exactly right when vehicles move at constant speed, and
  * systematically wrong across road-class speed changes — the behaviour the
  * paper contrasts learned recovery against.
  */
final class LinearInterp(
    net: RoadNetwork,
    matcher: MapMatcher,
    epsilon: Double,
    override val name: String,
) extends Recoverer {

  def recover(t: Traj): Recovered = {
    val mr = matcher.matchTraj(t)
    val route = if (mr.route.nonEmpty) mr.route else mr.perPoint.distinct
    val arc = new RouteArc(net, route)
    val out = mutable.ArrayBuffer.empty[MatchedPoint]
    // Matched point of each sparse point: (route position, ratio).
    val anchors = mr.perPoint.zipWithIndex.map { case (seg, i) =>
      val p = XY(t.sparse(i).x, t.sparse(i).y)
      val s = net.segments(seg)
      val r = Geo.projectRatio(p, s.a, s.b)
      (seg, r)
    }
    var pos = 0
    val arcPos = anchors.map { case (seg, r) =>
      val p = arc.posOf(seg, pos)
      if (p >= 0) pos = p
      arc.arcOf(math.max(0, p), r)
    }
    var i = 0
    while (i < t.sparse.length) {
      out += MatchedPoint(anchors(i)._1, anchors(i)._2, t.sparse(i).t)
      if (i + 1 < t.sparse.length) {
        val gaps = Recoverer.gapCount(t.sparse(i).t, t.sparse(i + 1).t, epsilon)
        val a0 = arcPos(i); val a1 = math.max(arcPos(i + 1), a0)
        var g = 1
        while (g <= gaps) {
          val f = g.toDouble / (gaps + 1)
          val (p, r) = arc.atArc(a0 + f * (a1 - a0))
          out += MatchedPoint(route(p), r, t.sparse(i).t + g * epsilon)
          g += 1
        }
      }
      i += 1
    }
    Recovered(t.id, out.toArray)
  }
}
