package repro.eval

import org.scalatest.funsuite.AnyFunSuite
import repro.TestWorld
import repro.geo.ShortestPath
import repro.traj.{MatchedPoint, Traj}

class MetricsSpec extends AnyFunSuite {
  private val net = TestWorld.net
  private lazy val t: Traj = TestWorld.testSet.head
  private lazy val cache = new ShortestPath.DistCache(net)

  test("perfect recovery scores 1.0 everywhere with zero error") {
    val row = Metrics.recovery(net, t, t.dense, cache)
    assert(row.recall == 1.0 && row.precision == 1.0 && row.f1 == 1.0 && row.accuracy == 1.0)
    assert(row.mae == 0.0 && row.rmse == 0.0)
  }

  test("perfect map matching scores 1.0 everywhere") {
    val row = Metrics.mapMatch(t, t.route)
    assert(row.precision == 1.0 && row.recall == 1.0 && row.f1 == 1.0 && row.jaccard == 1.0)
  }

  test("hand-worked set metrics") {
    val pred = Array(1, 2, 3, 4) // truth route will be {1,2,5,6}
    val fake = t.copy(route = Array(1, 2, 5, 6))
    val row = Metrics.mapMatch(fake, pred)
    assert(math.abs(row.precision - 0.5) < 1e-12)
    assert(math.abs(row.recall - 0.5) < 1e-12)
    assert(math.abs(row.f1 - 0.5) < 1e-12)
    assert(math.abs(row.jaccard - 2.0 / 6.0) < 1e-12)
  }

  test("accuracy counts positional exact matches") {
    val rec = t.dense.zipWithIndex.map { case (mp, i) =>
      if (i % 2 == 0) mp else MatchedPoint((mp.seg + 1) % net.numSegments, mp.r, mp.t)
    }
    val row = Metrics.recovery(net, t, rec, cache)
    val expect = t.dense.indices.count(_ % 2 == 0).toDouble / t.dense.length
    assert(math.abs(row.accuracy - expect) < 1e-9)
  }

  test("MAE reflects a known positional offset on the same segment") {
    // Shift every point's ratio by a fixed distance along its own segment.
    val shiftM = 30.0
    val rec = t.dense.map { mp =>
      val len = net.segments(mp.seg).lengthM
      val r2 = math.min(0.999999, math.max(0.0, mp.r + shiftM / len))
      MatchedPoint(mp.seg, r2, mp.t)
    }
    val row = Metrics.recovery(net, t, rec, cache)
    // Most shifts are exactly shiftM (clamped at segment ends can shrink).
    assert(row.mae <= shiftM + 1e-6 && row.mae > shiftM * 0.5, s"mae ${row.mae}")
    assert(row.rmse >= row.mae - 1e-9)
  }

  test("empty prediction yields zero set metrics") {
    val row = Metrics.mapMatch(t, Array.empty[Int])
    assert(row.precision == 0 && row.recall == 0 && row.f1 == 0 && row.jaccard == 0)
  }

  test("aggregate averages every column except id") {
    val spark = repro.SparkSpec.shared
    import spark.implicits._
    val df = Seq(MatchRow(1, 0.2, 0.4, 0.6, 0.8), MatchRow(2, 0.4, 0.6, 0.8, 1.0)).toDF()
    val agg = Metrics.aggregate(df)
    assert(math.abs(agg("precision") - 0.3) < 1e-12)
    assert(math.abs(agg("recall") - 0.5) < 1e-12)
    assert(math.abs(agg("f1") - 0.7) < 1e-12)
    assert(math.abs(agg("jaccard") - 0.9) < 1e-12)
    assert(!agg.contains("id"))
  }

  test("aggregate matches DuckDB oracle on map-matching rows") {
    val spark = repro.SparkSpec.shared
    import spark.implicits._
    val rows = (1 to 20).map(i => MatchRow(i, i / 20.0, (i % 7) / 7.0, (i % 3) / 3.0, (i % 5) / 5.0))
    val df = rows.toDF()
    val agg = df.selectExpr("avg(precision) as precision", "avg(recall) as recall",
      "avg(f1) as f1", "avg(jaccard) as jaccard")
    repro.Oracle.assertEquivalent(agg,
      "SELECT avg(CAST(precision AS DOUBLE)) AS precision, avg(CAST(recall AS DOUBLE)) AS recall, " +
        "avg(CAST(f1 AS DOUBLE)) AS f1, avg(CAST(jaccard AS DOUBLE)) AS jaccard FROM rows",
      "rows" -> df)
  }
}
