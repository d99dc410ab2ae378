package repro

import repro.eval.{Harness, Scale}

/** Scratch: run the full harness for one city at bench scale.
  * `sbt "Test/runMain repro.CityProbe XA"`.
  */
object CityProbe {
  def main(args: Array[String]): Unit = {
    val city = args.headOption.getOrElse("XA")
    val t0 = System.nanoTime()
    Harness.evalCity(SparkSpec.shared, city, Scale.bench, println)
    println(f"total ${(System.nanoTime() - t0) / 1e9}%.0f s")
  }
}
