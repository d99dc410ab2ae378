package repro.recovery

import repro.traj.{Recovered, Traj}

/** A trajectory-recovery method: from the sparse observed points of `t`,
  * produce the map-matched epsilon-sampling trajectory (paper Definition 7).
  * The output is index-aligned with `t.dense` (timestamps are shared), so
  * metrics compare position i to position i.
  */
trait Recoverer extends Serializable {
  def name: String
  def recover(t: Traj): Recovered
}

object Recoverer {
  /** Number of missing points between consecutive observed timestamps at
    * target rate `epsilon` (Algorithm 2 line 9, with exact-multiple
    * timestamps this is the true gap size).
    */
  def gapCount(tPrev: Double, tNext: Double, epsilon: Double): Int =
    math.max(0, math.round((tNext - tPrev) / epsilon).toInt - 1)
}
