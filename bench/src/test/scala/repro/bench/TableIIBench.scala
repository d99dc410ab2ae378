package repro.bench

import repro.SparkSpec
import repro.eval.{Harness, Scale, Tables}

/** Reproduces Table II (dataset statistics) at bench scale. Training for
  * the whole 4-city matrix happens once in this JVM (Harness caches per
  * city); the later Table III/IV/V suites reuse it.
  */
class TableIIBench extends SparkSpec {

  private lazy val evs = Tables.evalAll(spark, Scale.bench, Console.err.println)

  test("Table II: dataset statistics") {
    val table = Tables.tableII(evs)
    info("\n=== Table II (dataset statistics) ===\n" + table)
    // Shape checks mirroring the paper: BJ is the largest network with the
    // lowest sampling rate; XA has the most points per trajectory.
    assert(evs("BJ").stats.segments > 2 * evs("PT").stats.segments)
    assert(evs("BJ").stats.epsilonS == 60.0)
    assert(Seq("PT", "XA", "CD").forall(c => evs(c).stats.epsilonS <= 15.0))
    assert(evs("XA").stats.avgPoints == Tables.cities.map(c => evs(c).stats.avgPoints).max)
    assert(evs("BJ").stats.areaKm2 > 4 * evs("XA").stats.areaKm2)
  }
}
