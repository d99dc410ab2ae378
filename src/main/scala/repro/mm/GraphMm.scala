package repro.mm

import repro.geo.{Geo, RoadNetwork, RoutePlanner, XY}
import repro.nn._
import repro.traj.{MatchedRoute, Traj}
import scala.util.Random

/** GraphMM (paper ref [13]): graph-centric map matching that leverages road
  * and trajectory graph topology. Candidates are scored from their Node2Vec
  * graph embeddings plus the (graph-aggregated) embeddings of the previous
  * and next points' nearest segments — capturing road/trajectory topology
  * correlation — with a proximity feature. Deliberately WITHOUT MMA's
  * sequence transformer and directional cosines, per its design.
  */
final class GraphMmModel(
    val net: RoadNetwork,
    val kc: Int,
    val node2vec: Tensor,
    val scorer: Mlp, // [cand n2v ; prev ctx n2v ; next ctx n2v ; prox] -> 1
) extends Module {

  def params: Seq[Tensor] = scorer.params
  private val d0 = node2vec.cols

  private def n2vRow(sid: Int): Array[Double] =
    Array.tabulate(d0)(j => node2vec(sid, j))

  /** Mean Node2Vec embedding of the top-3 nearest segments of a point. */
  private def ctxEmb(p: XY): Array[Double] = {
    val ids = net.nearestSegments(p, 3)
    val acc = new Array[Double](d0)
    ids.foreach { sid => var j = 0; while (j < d0) { acc(j) += node2vec(sid, j) / ids.length; j += 1 } }
    acc
  }

  def candFeatures(t: Traj, i: Int): (Array[Int], Array[Array[Double]]) = {
    val p = XY(t.sparse(i).x, t.sparse(i).y)
    val cands = net.nearestSegments(p, kc)
    val prevCtx = if (i > 0) ctxEmb(XY(t.sparse(i - 1).x, t.sparse(i - 1).y)) else new Array[Double](d0)
    val nextCtx = if (i + 1 < t.sparse.length) ctxEmb(XY(t.sparse(i + 1).x, t.sparse(i + 1).y)) else new Array[Double](d0)
    val rows = cands.map { sid =>
      val s = net.segments(sid)
      n2vRow(sid) ++ prevCtx ++ nextCtx :+ math.exp(-Geo.pointSegDist(p, s.a, s.b) / 25.0)
    }
    (cands, rows)
  }

  def loss(t: Traj)(implicit tp: Tape): Tensor = {
    val perPoint = t.sparse.indices.map { i =>
      val (cands, rows) = candFeatures(t, i)
      val logits = scorer(Tensor.fromRows(rows.toIndexedSeq))
      val labels = cands.map(sid => if (sid == t.sparseTruthSeg(i)) 1.0 else 0.0)
      Ops.bceLogitsSum(logits, labels)
    }
    Ops.scale(perPoint.reduceLeft(Ops.add(_, _)), 1.0 / t.sparse.length)
  }

  def predictSegments(t: Traj): Array[Int] = {
    implicit val tp: Tape = NoTape
    t.sparse.indices.map { i =>
      val (cands, rows) = candFeatures(t, i)
      val logits = scorer(Tensor.fromRows(rows.toIndexedSeq))
      var best = 0; var bv = Double.NegativeInfinity
      var j = 0
      while (j < logits.rows) { if (logits(j, 0) > bv) { bv = logits(j, 0); best = j }; j += 1 }
      cands(best)
    }.toArray
  }
}

object GraphMmModel {
  def init(net: RoadNetwork, node2vec: Tensor, kc: Int = 10, seed: Long = 61L): GraphMmModel = {
    val rnd = new Random(seed)
    new GraphMmModel(net, kc, node2vec, Mlp(3 * node2vec.cols + 1, 64, 1, rnd))
  }

  def train(model: GraphMmModel, trajs: IndexedSeq[Traj], epochs: Int = 6,
            batchSize: Int = 16, lr: Double = 2e-3, seed: Long = 67L,
            log: String => Unit = _ => ()): Seq[Double] = {
    val opt = new Adam(model.params, lr = lr)
    val rnd = new Random(seed)
    (1 to epochs).map { ep =>
      val losses = rnd.shuffle(trajs).grouped(batchSize).map { b =>
        Trainer.step[Traj](b.toIndexedSeq, model.params, opt, (t, tp) => model.loss(t)(tp))
      }.toSeq
      val mean = losses.sum / losses.size
      log(f"GraphMM epoch $ep loss $mean%.4f")
      mean
    }
  }
}

final class GraphMm(val model: GraphMmModel, planner: RoutePlanner) extends MapMatcher {
  val name = "GraphMM"
  def matchTraj(t: Traj): MatchedRoute = {
    val per = model.predictSegments(t)
    MatchedRoute(t.id, per, planner.stitch(per.toIndexedSeq).toArray)
  }
}
