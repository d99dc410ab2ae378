package repro.core

import repro.geo.XY
import repro.mm.MapMatcher
import repro.recovery.Recoverer
import repro.traj.{Recovered, Traj}
import scala.collection.mutable

/** End-to-end TRMMA (Algorithm 2): run the map matcher (MMA by default;
  * HMM / Nearest for the Table IV ablations), project the sparse points
  * onto their matched segments, then recover every missing epsilon-slot
  * with the trained [[TrmmaModel]] restricted to the route's segments.
  */
final class Trmma(
    val model: TrmmaModel,
    val matcher: MapMatcher,
    val epsilon: Double,
    override val name: String = "TRMMA",
) extends Recoverer {

  def recover(t: Traj): Recovered = {
    val mr = matcher.matchTraj(t)
    val segs = mr.perPoint
    val route = if (mr.route.nonEmpty) mr.route else segs.distinct

    // Dense timeline slots from observable timestamps.
    val times = mutable.ArrayBuffer.empty[Double]
    val observed = mutable.ArrayBuffer.empty[Boolean]
    val slotSeg = mutable.ArrayBuffer.empty[Int]
    val slotR = mutable.ArrayBuffer.empty[Double]
    var i = 0
    while (i < t.sparse.length) {
      val p = t.sparse(i)
      times += p.t; observed += true
      slotSeg += segs(i)
      slotR += model.projRatio(XY(p.x, p.y), segs(i))
      if (i + 1 < t.sparse.length) {
        val gaps = Recoverer.gapCount(p.t, t.sparse(i + 1).t, epsilon)
        var g = 1
        while (g <= gaps) {
          times += p.t + g * epsilon; observed += false
          slotSeg += segs(i) // placeholder, overwritten by decode
          slotR += 0.0
          g += 1
        }
      }
      i += 1
    }
    val sample = model.prepare(t, segs, route, slotSeg.toArray, slotR.toArray, observed.toArray)
    Recovered(t.id, model.decode(sample, times.toArray))
  }
}
