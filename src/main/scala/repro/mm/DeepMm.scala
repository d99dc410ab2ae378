package repro.mm

import repro.geo.{Geo, RoadNetwork, RoutePlanner, XY}
import repro.nn._
import repro.traj.{MatchedRoute, Traj}
import scala.util.Random

/** DeepMM (paper ref [32]): end-to-end deep map matching. A transformer
  * encoder embeds the GPS sequence; every point is classified with a
  * softmax over ALL n segments of the road network (score = embedding dot
  * product) — no candidate set and no directional features, which is the
  * design contrast with MMA (and the source of its heavier inference cost).
  */
final class DeepMmModel(
    val net: RoadNetwork,
    val encFc: Linear,
    val encoder: TransformerEncoder,
    val segOut: Embedding, // n x dh scoring table
) extends Module {

  def params: Seq[Tensor] = encFc.params ++ encoder.params ++ segOut.params

  private val minX = net.nodes.map(_.x).min
  private val maxX = net.nodes.map(_.x).max
  private val minY = net.nodes.map(_.y).min
  private val maxY = net.nodes.map(_.y).max

  def features(t: Traj): Array[Array[Double]] = {
    val tMax = math.max(1e-9, t.sparse.last.t - t.sparse.head.t)
    t.sparse.map(p => Array(
      (p.x - minX) / math.max(1e-9, maxX - minX),
      (p.y - minY) / math.max(1e-9, maxY - minY),
      (p.t - t.sparse.head.t) / tMax))
  }

  /** Constant spatial-prior bias: each point's nearby segments get a
    * proximity bonus (DeepMM's grid-based spatial encoding analogue; the
    * softmax itself still ranges over ALL n segments). Without it the
    * embedding table would have to memorise the whole city's geometry from
    * a few hundred trajectories.
    */
  private def spatialBias(t: Traj): Tensor = {
    val b = Tensor.zeros(t.sparse.length, net.numSegments)
    t.sparse.indices.foreach { i =>
      val p = XY(t.sparse(i).x, t.sparse(i).y)
      net.nearestSegments(p, 64).foreach { sid =>
        val seg = net.segments(sid)
        b.data(i * net.numSegments + sid) = 3.0 * math.exp(-Geo.pointSegDist(p, seg.a, seg.b) / 40.0)
      }
    }
    b
  }

  /** l x n logits over every segment of the network. */
  def logits(t: Traj)(implicit tp: Tape): Tensor = {
    val enc = encoder(encFc(Tensor.fromRows(features(t).toIndexedSeq)))
    Ops.add(Ops.matmul(enc, Ops.transpose(segOut.table)), spatialBias(t))
  }

  def loss(t: Traj)(implicit tp: Tape): Tensor =
    Ops.scale(Ops.ceRowsSum(logits(t), t.sparseTruthSeg), 1.0 / t.sparse.length)

  def predictSegments(t: Traj): Array[Int] = {
    implicit val tp: Tape = NoTape
    val lg = logits(t)
    Array.tabulate(t.sparse.length) { i =>
      var best = 0; var bv = Double.NegativeInfinity
      var j = 0
      while (j < lg.cols) { if (lg(i, j) > bv) { bv = lg(i, j); best = j }; j += 1 }
      best
    }
  }
}

object DeepMmModel {
  def init(net: RoadNetwork, dh: Int = 32, seed: Long = 53L): DeepMmModel = {
    val rnd = new Random(seed)
    new DeepMmModel(net, Linear(3, dh, rnd),
      TransformerEncoder(dh, 2, 128, 2, rnd), Embedding(net.numSegments, dh, rnd))
  }

  def train(model: DeepMmModel, trajs: IndexedSeq[Traj], epochs: Int = 10,
            batchSize: Int = 16, lr: Double = 2e-3, seed: Long = 59L,
            log: String => Unit = _ => ()): Seq[Double] = {
    val opt = new Adam(model.params, lr = lr)
    val rnd = new Random(seed)
    (1 to epochs).map { ep =>
      val losses = rnd.shuffle(trajs).grouped(batchSize).map { b =>
        Trainer.step[Traj](b.toIndexedSeq, model.params, opt, (t, tp) => model.loss(t)(tp))
      }.toSeq
      val mean = losses.sum / losses.size
      log(f"DeepMM epoch $ep loss $mean%.4f")
      mean
    }
  }
}

final class DeepMm(val model: DeepMmModel, planner: RoutePlanner) extends MapMatcher {
  val name = "DeepMM"
  def matchTraj(t: Traj): MatchedRoute = {
    val per = model.predictSegments(t)
    MatchedRoute(t.id, per, planner.stitch(per.toIndexedSeq).toArray)
  }
}
