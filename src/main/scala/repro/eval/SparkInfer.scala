package repro.eval

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.geo.{RoadNetwork, ShortestPath}
import repro.mm.MapMatcher
import repro.recovery.Recoverer
import repro.traj.Traj

/** Distributed batched inference (the repro hint's extension point): the
  * trained model (inside the Recoverer/MapMatcher) and the road network are
  * broadcast once; trajectories are processed per partition with a
  * per-partition network-distance cache, and the per-trajectory metric rows
  * come back as a DataFrame for SQL aggregation.
  */
object SparkInfer {

  /** Per-trajectory recovery metrics for `rec` over `testSet`, plus the
    * mean inference seconds per 1000 trajectories (model time only,
    * measured inside the partitions; metric computation excluded).
    */
  def recovery(spark: SparkSession, net: RoadNetwork, rec: Recoverer,
               testSet: Seq[Traj]): (DataFrame, Double) = {
    import spark.implicits._
    val bcNet = spark.sparkContext.broadcast(net)
    val bcRec = spark.sparkContext.broadcast(rec)
    val ds = spark.createDataset(testSet.toSeq)
    val rows = ds.mapPartitions { iter =>
      val localNet = bcNet.value
      val localRec = bcRec.value
      val cache = new ShortestPath.DistCache(localNet)
      iter.map { t =>
        val t0 = System.nanoTime()
        val out = localRec.recover(t)
        val dt = (System.nanoTime() - t0) / 1e9
        val m = Metrics.recovery(localNet, t, out.points, cache)
        (m, dt)
      }
    }.collect()
    val df = rows.map(_._1).toSeq.toDF()
    val per1000 = rows.map(_._2).sum / rows.length * 1000
    (df, per1000)
  }

  /** Per-trajectory map-matching metrics, plus seconds per 1000. */
  def mapMatch(spark: SparkSession, net: RoadNetwork, matcher: MapMatcher,
               testSet: Seq[Traj]): (DataFrame, Double) = {
    import spark.implicits._
    val bcM = spark.sparkContext.broadcast(matcher)
    val ds = spark.createDataset(testSet.toSeq)
    val rows = ds.mapPartitions { iter =>
      val localM = bcM.value
      iter.map { t =>
        val t0 = System.nanoTime()
        val mr = localM.matchTraj(t)
        val dt = (System.nanoTime() - t0) / 1e9
        (Metrics.mapMatch(t, mr.route), dt)
      }
    }.collect()
    val df = rows.map(_._1).toSeq.toDF()
    val per1000 = rows.map(_._2).sum / rows.length * 1000
    (df, per1000)
  }
}
