package repro.mm

import org.scalatest.funsuite.AnyFunSuite
import repro.TestWorld
import repro.eval.Metrics
import repro.traj.Traj

/** Classical and learned map matchers on the shared small world. */
class MatcherSpec extends AnyFunSuite {
  import TestWorld._

  private def routeF1(m: MapMatcher, ts: Seq[Traj]): Double = {
    val rows = ts.map(t => Metrics.mapMatch(t, m.matchTraj(t).route))
    rows.map(_.f1).sum / rows.size
  }

  private def pointAcc(f: Traj => Array[Int], ts: Seq[Traj]): Double = {
    var hit = 0; var tot = 0
    ts.foreach { t =>
      val pred = f(t)
      pred.indices.foreach { i => if (pred(i) == t.sparseTruthSeg(i)) hit += 1; tot += 1 }
    }
    hit.toDouble / tot
  }

  private lazy val nearest = new Nearest(net, planner)
  private lazy val fmm = new HmmMatcher(net, planner)
  private lazy val lhmm = Lhmm.train(net, planner, trainSet)

  test("nearest picks the geometrically closest segment") {
    val t = testSet.head
    val per = nearest.matchPoints(t)
    per.indices.foreach { i =>
      val p = repro.geo.XY(t.sparse(i).x, t.sparse(i).y)
      val d = net.rtree.distTo(p, per(i))
      val dAny = net.nearestSegments(p, 1).map(net.rtree.distTo(p, _)).head
      assert(math.abs(d - dAny) < 1e-9)
    }
  }

  test("HMM beats Nearest on point accuracy (direction disambiguation)") {
    val accH = pointAcc(fmm.matchPoints, testSet)
    val accN = pointAcc(nearest.matchPoints, testSet)
    info(f"FMM $accH%.3f vs Nearest $accN%.3f")
    assert(accH > accN + 0.05)
  }

  test("LHMM beats plain FMM on route F1 (learned emission)") {
    val fL = routeF1(lhmm, testSet)
    val fH = routeF1(fmm, testSet)
    info(f"LHMM $fL%.3f vs FMM $fH%.3f")
    assert(fL >= fH - 0.01)
  }

  test("LHMM learned weights favour proximity and forward direction") {
    // Feature 0 is the proximity decay, features 1-4 directional cosines of
    // the true direction of travel; all should get positive weight.
    assert(lhmm.weights(0) > 0, s"${lhmm.weights.toSeq}")
  }

  test("matchers return one segment per sparse point and a route covering them") {
    Seq[MapMatcher](nearest, fmm, lhmm).foreach { m =>
      testSet.take(5).foreach { t =>
        val mr = m.matchTraj(t)
        assert(mr.perPoint.length == t.sparse.length, m.name)
        assert(mr.route.nonEmpty, m.name)
        mr.perPoint.foreach(s => assert(mr.route.contains(s), m.name))
      }
    }
  }

  test("routes are connected chains") {
    Seq[MapMatcher](nearest, fmm, lhmm).foreach { m =>
      testSet.take(5).foreach { t =>
        m.matchTraj(t).route.toSeq.sliding(2).foreach {
          case Seq(a, b) => assert(net.segments(a).to == net.segments(b).from, s"${m.name}: $a->$b")
          case _         => ()
        }
      }
    }
  }

  test("GraphMM trains and predicts candidates near the point") {
    val gm = GraphMmModel.init(net, node2vec)
    val l0 = { implicit val tp: repro.nn.Tape = repro.nn.NoTape; gm.loss(trainSet.head).data(0) }
    GraphMmModel.train(gm, trainSet.take(60), epochs = 2)
    val l1 = { implicit val tp: repro.nn.Tape = repro.nn.NoTape; gm.loss(trainSet.head).data(0) }
    assert(l1 < l0, s"$l0 -> $l1")
    val per = gm.predictSegments(testSet.head)
    assert(per.length == testSet.head.sparse.length)
  }

  test("DeepMM trains and the spatial prior keeps predictions local") {
    val dm = DeepMmModel.init(net)
    DeepMmModel.train(dm, trainSet.take(60), epochs = 2)
    val t = testSet.head
    val per = dm.predictSegments(t)
    per.indices.foreach { i =>
      val p = repro.geo.XY(t.sparse(i).x, t.sparse(i).y)
      val d = net.rtree.distTo(p, per(i))
      assert(d < 2000, s"prediction $d m away")
    }
  }
}
