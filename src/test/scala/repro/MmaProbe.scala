package repro

import repro.core.{Mma, MmaConfig, MmaModel}
import repro.eval.Metrics
import repro.geo.RoutePlanner
import repro.mm.{HmmMatcher, Lhmm, MapMatcher}
import repro.nn.Node2Vec
import repro.traj.{Datasets, Traj, TrajGen}

/** Scratch: MMA vs LHMM point accuracy and route F1 at bench scale. */
object MmaProbe {
  def main(args: Array[String]): Unit = {
    val cd = Datasets("XA")
    val all = TrajGen.generateLocal(cd.net, cd.gen, 2000, seed = "XA".hashCode.toLong)
    val split = Datasets.split(all)
    val n2v = Node2Vec.train(cd.net, dim = 32, epochs = 1, walksPerSeg = 3)
    val planner = RoutePlanner.fit(cd.net, split.train.map(_.route.toSeq))

    def pointAcc(f: Traj => Array[Int]): Double = {
      var hit = 0; var tot = 0
      split.test.foreach { t =>
        val p = f(t)
        p.indices.foreach { i => if (p(i) == t.sparseTruthSeg(i)) hit += 1; tot += 1 }
      }
      hit.toDouble / tot
    }
    def routeF1(m: MapMatcher): Double = {
      val rows = split.test.map(t => Metrics.mapMatch(t, m.matchTraj(t).route))
      rows.map(_.f1).sum / rows.size
    }

    val lhmm = Lhmm.train(cd.net, planner, split.train)
    println(f"LHMM point acc ${pointAcc(lhmm.matchPoints)}%.4f routeF1 ${routeF1(lhmm)}%.4f")
    val fmm = new HmmMatcher(cd.net, planner)
    println(f"FMM  point acc ${pointAcc(fmm.matchPoints)}%.4f routeF1 ${routeF1(fmm)}%.4f")

    val m = MmaModel.init(cd.net, MmaConfig(), n2v)
    Seq(10, 10, 10).foreach { ep =>
      MmaModel.train(m, split.train, epochs = ep)
      val mma = new Mma(m, planner)
      println(f"MMA after +$ep epochs: point acc ${pointAcc(m.predictSegments)}%.4f routeF1 ${routeF1(mma)}%.4f")
    }
  }
}
