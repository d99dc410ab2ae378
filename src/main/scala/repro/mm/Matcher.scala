package repro.mm

import repro.traj.{MatchedRoute, Traj}

/** A map-matching method: maps the sparse GPS points of a trajectory onto
  * road segments and returns the stitched route (paper Definition 4).
  * Implementations are Serializable so they can be broadcast to executors
  * and applied per partition (see eval.SparkInfer).
  */
trait MapMatcher extends Serializable {
  def name: String

  /** Per-point matched segments plus the stitched route. */
  def matchTraj(t: Traj): MatchedRoute
}
