package repro.recovery

import org.scalatest.funsuite.AnyFunSuite
import repro.TestWorld
import repro.core.TruthMatcher
import repro.traj.{Recovered, Traj}

/** Baseline recoverers on the shared small world. */
class RecoverySpec extends AnyFunSuite {
  import TestWorld._

  private def checkAligned(out: Recovered, t: Traj): Unit = {
    assert(out.points.length == t.dense.length)
    out.points.zip(t.dense).foreach { case (p, d) => assert(math.abs(p.t - d.t) < 1e-6) }
    out.points.foreach(p => assert(p.r >= 0 && p.r < 1))
  }

  test("RouteArc round-trips arc positions") {
    val t = trainSet.head
    val arc = new RouteArc(net, t.route)
    assert(arc.totalLen > 0)
    val rnd = new scala.util.Random(3)
    (1 to 50).foreach { _ =>
      val pos = rnd.nextInt(t.route.length)
      val r = rnd.nextDouble() * 0.98
      val (p2, r2) = arc.atArc(arc.arcOf(pos, r))
      assert(p2 == pos, s"$pos vs $p2")
      assert(math.abs(r2 - r) < 1e-6)
    }
  }

  test("RouteArc.atArc clamps out-of-range") {
    val arc = new RouteArc(net, trainSet.head.route)
    assert(arc.atArc(-5.0)._1 == 0)
    assert(arc.atArc(arc.totalLen + 100)._1 == arc.route.length - 1)
  }

  test("gapCount arithmetic") {
    assert(Recoverer.gapCount(0, 150, 15) == 9)
    assert(Recoverer.gapCount(0, 15, 15) == 0)
    assert(Recoverer.gapCount(0, 0, 15) == 0)
  }

  test("Linear on the truth matcher is exact for constant-speed segments") {
    val lin = new LinearInterp(net, new TruthMatcher, cfg.epsilon, "Linear")
    testSet.take(20).foreach { t =>
      val out = lin.recover(t)
      checkAligned(out, t)
      // observed anchors keep their matched segment
      t.sparseIdxInDense.zipWithIndex.foreach { case (di, si) =>
        assert(out.points(di).seg == t.sparseTruthSeg(si))
      }
    }
  }

  test("Linear recovers within-gap segments in route order") {
    val lin = new LinearInterp(net, new TruthMatcher, cfg.epsilon, "Linear")
    testSet.take(10).foreach { t =>
      val out = lin.recover(t)
      var pos = 0
      out.points.foreach { p =>
        val i = t.route.indexOf(p.seg, pos)
        assert(i >= 0)
        pos = i
      }
    }
  }

  test("SeqRec (mtrajrec) trains, loss decreases, output aligned") {
    val m = SeqRecModel.init(net, SeqRecConfig("mtrajrec"), cfg.epsilon, node2vec)
    val losses = SeqRecModel.train(m, trainSet.take(60), epochs = 2)
    assert(losses.head > losses.last, s"$losses")
    testSet.take(5).foreach(t => checkAligned(m.recover(t), t))
  }

  test("SeqRec pooled variants collapse encoder states to one row") {
    Seq("trajgat", "trajcl", "st2vec").foreach { kind =>
      val m = SeqRecModel.init(net, SeqRecConfig(kind), cfg.epsilon, node2vec)
      implicit val tp: repro.nn.Tape = repro.nn.NoTape
      val s = m.prepare(testSet.head, withLabels = false)
      assert(m.encode(s).rows == 1, kind)
    }
  }

  test("SeqRec per-point variants keep one state per sparse point") {
    Seq("mtrajrec", "rntrajrec", "mmstged").foreach { kind =>
      val m = SeqRecModel.init(net, SeqRecConfig(kind), cfg.epsilon, node2vec)
      implicit val tp: repro.nn.Tape = repro.nn.NoTape
      val s = m.prepare(testSet.head, withLabels = false)
      assert(m.encode(s).rows == testSet.head.sparse.length, kind)
    }
  }

  test("SeqRec masks contain the truth segment for most slots") {
    val m = SeqRecModel.init(net, SeqRecConfig("mtrajrec"), cfg.epsilon, node2vec)
    val hits = trainSet.take(30).map { t =>
      val s = m.prepare(t, withLabels = true)
      s.masks.indices.count(j => s.masks(j).contains(s.targetSeg(j))).toDouble / s.masks.length
    }
    val avg = hits.sum / hits.size
    info(f"mask hit rate $avg%.3f")
    assert(avg > 0.75, f"mask hit rate $avg%.3f")
  }

  test("DHTR trains and snaps output to segments") {
    val m = DhtrModel.init(net, cfg.epsilon)
    val losses = FreeSpaceModel.train(m, trainSet.take(60), epochs = 2)
    assert(losses.head > losses.last, s"$losses")
    testSet.take(5).foreach(t => checkAligned(new FreeSpaceRec(m, "DHTR").recover(t), t))
  }

  test("TERI trains and snaps output to segments") {
    val m = TeriModel.init(net, cfg.epsilon)
    val losses = FreeSpaceModel.train(m, trainSet.take(60), epochs = 2)
    assert(losses.head > losses.last, s"$losses")
    testSet.take(5).foreach(t => checkAligned(new FreeSpaceRec(m, "TERI").recover(t), t))
  }

  test("free-space observed slots snap the GPS point itself") {
    val m = DhtrModel.init(net, cfg.epsilon)
    val out = new FreeSpaceRec(m, "DHTR").recover(testSet.head)
    val t = testSet.head
    t.sparseIdxInDense.zipWithIndex.foreach { case (di, si) =>
      val p = repro.geo.XY(t.sparse(si).x, t.sparse(si).y)
      val d = net.rtree.distTo(p, out.points(di).seg)
      val dBest = net.nearestSegments(p, 1).map(net.rtree.distTo(p, _)).head
      assert(math.abs(d - dBest) < 1e-9)
    }
  }
}
