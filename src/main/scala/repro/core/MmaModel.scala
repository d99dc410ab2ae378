package repro.core

import repro.geo.{Geo, RoadNetwork, ShortestPath, XY}
import repro.nn._
import repro.traj.Traj
import scala.util.Random

/** Hyperparameters of MMA (paper Section IV-B; widths scaled per DESIGN §3). */
final case class MmaConfig(
    kc: Int = 10,
    d0: Int = 32,  // segment embedding dim (paper 64)
    d1: Int = 64,  // candidate MLP hidden (paper 128)
    d2: Int = 32,  // point/candidate embedding dim (paper 64)
    d3: Int = 64,  // attention MLP hidden (paper 256)
    heads: Int = 2,
    layers: Int = 2,
    dFfn: Int = 128,
    // At reduced data scale the n x d0 segment table (~3 positive examples
    // per segment) overfits badly; freezing it at the Node2Vec values keeps
    // Eq. 1's initialisation as fixed features (DESIGN §3).
    freezeSegEmb: Boolean = true,
    // Ablation flags (paper Table IV):
    useContext: Boolean = true,      // off => TRMMA-C variant of MMA
    useDirectional: Boolean = true,  // off => TRMMA-DI variant of MMA
) extends Serializable

/** A prepared MMA training/inference sample: per-point candidate sets,
  * directional features and normalised inputs, computed once per trajectory
  * (the R-tree queries and geometry do not change across epochs).
  */
final case class MmaSample(
    norm: Array[Array[Double]],       // l x 3 normalised (x, y, t)
    cands: Array[Array[Int]],         // l x <=kc candidate segment ids
    feats: Array[Array[Double]],      // l x (kc*4) directional cosines
    labels: Array[Array[Double]],     // l x kc class labels (may be all zero)
) extends Serializable

/** The MMA network (paper Fig. 3): candidate-segment embedding (Eq. 1-2),
  * transformer point encoding (Eq. 3), candidate-context attention (Eq. 7-8)
  * and sigmoid inner-product scoring (Eq. 9) trained with BCE (Eq. 10).
  */
final class MmaModel(
    val cfg: MmaConfig,
    val net: RoadNetwork,
    val segEmb: Embedding,    // W^C, initialised from Node2Vec (Eq. 1)
    val candMlp: Mlp,         // Eq. 2
    val pointFc: Linear,      // z0 -> z1
    val encoder: TransformerEncoder, // Eq. 3
    val attnMlp: Mlp,         // Eq. 7
) extends Module {

  def params: Seq[Tensor] =
    (if (cfg.freezeSegEmb) Seq.empty else segEmb.params) ++
      candMlp.params ++ pointFc.params ++ encoder.params ++ attnMlp.params

  // ---- sample preparation (geometry only, no learnable state) ----

  private val minX = net.nodes.map(_.x).min
  private val maxX = net.nodes.map(_.x).max
  private val minY = net.nodes.map(_.y).min
  private val maxY = net.nodes.map(_.y).max

  /** Point-sequence input rows: min-max normalised (x, y, t) plus the
    * displacements to the previous/next GPS points (the raw sequence signal
    * the transformer of Eq. 3 consumes).
    */
  def normalise(t: Traj): Array[Array[Double]] = {
    val tMax = math.max(1e-9, t.sparse.last.t - t.sparse.head.t)
    t.sparse.indices.map { i =>
      val p = t.sparse(i)
      val (dxp, dyp) = if (i == 0) (0.0, 0.0)
        else ((p.x - t.sparse(i - 1).x) / 500.0, (p.y - t.sparse(i - 1).y) / 500.0)
      val (dxn, dyn) = if (i + 1 == t.sparse.length) (0.0, 0.0)
        else ((t.sparse(i + 1).x - p.x) / 500.0, (t.sparse(i + 1).y - p.y) / 500.0)
      Array((p.x - minX) / math.max(1e-9, maxX - minX),
            (p.y - minY) / math.max(1e-9, maxY - minY),
            (p.t - t.sparse.head.t) / tMax, dxp, dyp, dxn, dyn)
    }.toArray
  }

  /** Relationship features of candidate `sid` w.r.t. point i (Section IV-B):
    * the four directional cosines (seg vs entrance->p, seg vs p->exit, seg
    * vs p_{i-1}->p_i, seg vs p_i->p_{i+1}) plus an exponentially decayed
    * perpendicular-distance feature (part of the candidate's "relationship
    * with p_i"; minor extension documented in DESIGN §3). The cosines are
    * zeroed when `useDirectional` is off (TRMMA-DI).
    */
  private def dirFeats(t: Traj, i: Int, sid: Int, dMin: Double): Array[Double] = {
    val s = net.segments(sid)
    val p = XY(t.sparse(i).x, t.sparse(i).y)
    val dist = Geo.pointSegDist(p, s.a, s.b)
    // Absolute proximity at two scales plus rank-relative proximity — the
    // relative term stays discriminative on heavy-tailed outlier points
    // where every absolute distance is large.
    val prox = Array(math.exp(-dist / 25.0), math.exp(-dist / 75.0),
      math.exp(-(dist - dMin) / 15.0))
    if (!cfg.useDirectional) return Array(0.0, 0.0, 0.0, 0.0) ++ prox
    val d = s.dir
    val prev =
      if (i > 0) Geo.cosine(d, p - XY(t.sparse(i - 1).x, t.sparse(i - 1).y)) else 0.0
    val next =
      if (i + 1 < t.sparse.length) Geo.cosine(d, XY(t.sparse(i + 1).x, t.sparse(i + 1).y) - p) else 0.0
    Array(Geo.cosine(d, p - s.a), Geo.cosine(d, s.b - p), prev, next) ++ prox
  }

  def prepare(t: Traj, withLabels: Boolean): MmaSample = {
    val l = t.sparse.length
    val cands = Array.tabulate(l)(i => net.nearestSegments(XY(t.sparse(i).x, t.sparse(i).y), cfg.kc))
    // Transition-plausibility features (road-network context, Section IV-B):
    // how consistent each candidate is with the nearest candidates of the
    // neighbouring points, measured as |network travel distance - straight
    // line| (the same signal an HMM's transition uses, here consumed as a
    // learned per-candidate feature).
    // Bounded multi-source Dijkstra tables: for each point, the network
    // distances from every distinct candidate exit node (amortises the
    // otherwise quadratic per-pair A* cost of the transition features).
    val maxGap = (1 until l).map(i =>
      XY(t.sparse(i).x, t.sparse(i).y).dist(XY(t.sparse(i - 1).x, t.sparse(i - 1).y)))
      .foldLeft(500.0)(math.max)
    val bound = maxGap * 2.5 + 1500
    val exitDist: Array[Map[Int, Array[Double]]] = Array.tabulate(l) { i =>
      cands(i).map(sid => net.segments(sid).to).distinct
        .map(node => node -> ShortestPath.dijkstra(net, node, maxDist = bound)).toMap
    }
    def directed(iFrom: Int, sf: Int, rf: Double, sTo: Int, rTo: Double): Double = {
      val a = net.segments(sf); val b = net.segments(sTo)
      if (sf == sTo && rTo >= rf) return (rTo - rf) * a.lengthM
      val d = exitDist(iFrom)(a.to)(b.from)
      (1 - rf) * a.lengthM + d + rTo * b.lengthM
    }
    // Plausibility vs a neighbour point: expected transition consistency
    // over the neighbour's candidates, weighted by their emission proximity
    // (a soft one-step Viterbi message), at two decay scales.
    def plaus(iNb: Int, segFrom: Seq[Int], p0: XY, p1: XY, sid: Int, rSid: Double,
              forward: Boolean, iSelf: Int): (Double, Double) = {
      val gc = p0.dist(p1)
      var wSum = 0.0; var f60 = 0.0; var f200 = 0.0
      segFrom.foreach { sf =>
        val seg = net.segments(sf)
        val rf = Geo.projectRatio(p0, seg.a, seg.b)
        val dEmit = Geo.pointSegDist(p0, seg.a, seg.b)
        val wNb = math.exp(-dEmit * dEmit / (2 * 10.0 * 10.0)) + 1e-6
        val d = if (forward) directed(iNb, sf, rf, sid, rSid)
                else directed(iSelf, sid, rSid, sf, rf)
        val diff = math.abs(d - gc)
        wSum += wNb
        // Gap-adaptive decay scales: a 100 m detour matters on a 500 m gap
        // but is noise on a 4 km one (BJ's 600 s gaps).
        f60 += wNb * math.exp(-diff / (30.0 + 0.05 * gc))
        f200 += wNb * math.exp(-diff / (100.0 + 0.2 * gc))
      }
      (f60 / wSum, f200 / wSum)
    }
    val feats = Array.tabulate(l) { i =>
      val p = XY(t.sparse(i).x, t.sparse(i).y)
      val dMin = cands(i).map(sid => net.rtree.distTo(p, sid)).min
      cands(i).flatMap { sid =>
        val seg = net.segments(sid)
        val r = Geo.projectRatio(p, seg.a, seg.b)
        val (fPrev60, fPrev200) = if (i == 0) (1.0, 1.0) else {
          val q = XY(t.sparse(i - 1).x, t.sparse(i - 1).y)
          plaus(i - 1, cands(i - 1).toSeq, q, p, sid, r, forward = true, iSelf = i)
        }
        val (fNext60, fNext200) = if (i + 1 == l) (1.0, 1.0) else {
          val q = XY(t.sparse(i + 1).x, t.sparse(i + 1).y)
          plaus(i + 1, cands(i + 1).toSeq, q, p, sid, r, forward = false, iSelf = i)
        }
        dirFeats(t, i, sid, dMin) ++ Array(fPrev60, fPrev200, fNext60, fNext200)
      }
    }
    val labels =
      if (withLabels)
        Array.tabulate(l)(i => cands(i).map(sid => if (sid == t.sparseTruthSeg(i)) 1.0 else 0.0))
      else Array.tabulate(l)(i => new Array[Double](cands(i).length))
    MmaSample(normalise(t), cands, feats, labels)
  }

  // ---- forward ----

  /** Sequence embeddings Z2 (Eq. 3) for all points of the trajectory. */
  def encodePoints(s: MmaSample)(implicit tp: Tape): Tensor =
    encoder(pointFc(Tensor.fromRows(s.norm.toIndexedSeq)))

  /** Candidate embeddings c_j (Eq. 1-2) for point i: (kc x d2). */
  def candEmbed(s: MmaSample, i: Int)(implicit tp: Tape): Tensor = {
    val e = segEmb(s.cands(i))
    val k = s.cands(i).length
    val f = new Tensor(k, MmaModel.NumFeats, s.feats(i).clone())
    candMlp(Ops.concatCols(e, f))
  }

  /** Per-candidate logits (before sigmoid) for point i (Eq. 7-9). */
  def logitsFor(z2i: Tensor, c: Tensor)(implicit tp: Tape): Tensor = {
    val p =
      if (cfg.useContext) {
        val zTiled = Ops.tileRows(z2i, c.rows)
        val scores = attnMlp(Ops.concatCols(zTiled, c)) // kc x 1
        val alpha = Ops.softmaxRows(Ops.transpose(scores)) // 1 x kc
        Ops.add(z2i, Ops.matmul(alpha, c)) // Eq. 8
      } else z2i
    Ops.matmul(c, Ops.transpose(p)) // kc x 1 inner products
  }

  /** Training loss of one prepared trajectory (Eq. 10, mean over points). */
  def loss(s: MmaSample)(implicit tp: Tape): Tensor = {
    val z2 = encodePoints(s)
    val perPoint = s.cands.indices.map { i =>
      val c = candEmbed(s, i)
      val logits = logitsFor(Ops.sliceRows(z2, i, i + 1), c)
      Ops.bceLogitsSum(logits, s.labels(i))
    }
    Ops.scale(perPoint.reduceLeft(Ops.add(_, _)), 1.0 / s.cands.length)
  }

  /** Map every sparse point of `t` to its argmax candidate (Alg. 1 l.1-9). */
  def predictSegments(t: Traj): Array[Int] = {
    implicit val tp: Tape = NoTape
    val s = prepare(t, withLabels = false)
    val z2 = encodePoints(s)
    s.cands.indices.map { i =>
      val c = candEmbed(s, i)
      val logits = logitsFor(Ops.sliceRows(z2, i, i + 1), c)
      var best = 0
      var bv = Double.NegativeInfinity
      var j = 0
      while (j < logits.rows) { if (logits(j, 0) > bv) { bv = logits(j, 0); best = j }; j += 1 }
      s.cands(i)(best)
    }.toArray
  }
}

object MmaModel {

  /** Per-candidate relationship features: 4 cosines + 3 proximity terms +
    * 4 transition-plausibility terms (prev/next at two scales).
    */
  val NumFeats = 11

  def init(net: RoadNetwork, cfg: MmaConfig, node2vec: Tensor, seed: Long = 13L): MmaModel = {
    val rnd = new Random(seed)
    require(node2vec.rows == net.numSegments && node2vec.cols == cfg.d0)
    new MmaModel(cfg, net,
      Embedding.fromPretrained(node2vec),
      Mlp(cfg.d0 + MmaModel.NumFeats, cfg.d1, cfg.d2, rnd),
      Linear(7, cfg.d2, rnd),
      TransformerEncoder(cfg.d2, cfg.heads, cfg.dFfn, cfg.layers, rnd),
      Mlp(2 * cfg.d2, cfg.d3, 1, rnd))
  }

  /** Train on prepared samples with Adam; returns per-epoch mean losses. */
  def train(
      model: MmaModel,
      trajs: IndexedSeq[Traj],
      epochs: Int = 3,
      batchSize: Int = 32,
      lr: Double = 1e-3,
      seed: Long = 17L,
      log: String => Unit = _ => (),
  ): Seq[Double] = {
    val samples = trajs.map(model.prepare(_, withLabels = true))
    val opt = new Adam(model.params, lr = lr)
    val rnd = new Random(seed)
    (1 to epochs).map { ep =>
      val shuffled = rnd.shuffle(samples)
      val losses = shuffled.grouped(batchSize).map { batch =>
        Trainer.step[MmaSample](batch.toIndexedSeq, model.params, opt,
          (s, tp) => model.loss(s)(tp))
      }.toSeq
      val mean = losses.sum / losses.size
      log(f"MMA epoch $ep loss $mean%.4f")
      mean
    }
  }
}
