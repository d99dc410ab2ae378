package repro.bench

import repro.SparkSpec
import repro.eval.{Scale, Tables}

/** Reproduces Table IV: ablation study of TRMMA (accuracy %). */
class TableIVBench extends SparkSpec {

  private lazy val evs = Tables.evalAll(spark, Scale.bench, Console.err.println)

  test("Table IV: TRMMA ablations") {
    val table = Tables.tableIV(evs)
    info("\n=== Table IV (ablations, accuracy %) ===\n" + table)

    Tables.cities.foreach { c =>
      val a = evs(c).ablation
      // Paper shape: full TRMMA beats every ablated variant; learned
      // recovery beats its linear-interpolation counterpart on the same
      // matcher tier; MMA-based variants beat Nearest-based ones.
      assert(a("TRMMA") >= a("TRMMA-Near"), s"[$c] $a")
      assert(a("TRMMA") >= a("TRMMA-DI"), s"[$c] $a")
      assert(a("TRMMA") >= a("Nearest+linear"), s"[$c] $a")
      assert(a("TRMMA-Near") > a("Nearest+linear"), s"[$c] $a")
      assert(a("MMA+linear") > a("Nearest+linear"), s"[$c] $a")
    }
  }
}
