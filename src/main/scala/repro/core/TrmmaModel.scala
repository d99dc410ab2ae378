package repro.core

import repro.geo.{Geo, RoadNetwork, XY}
import repro.nn._
import repro.recovery.RouteArc
import repro.traj.{MatchedPoint, Traj}
import scala.util.Random

/** Hyperparameters of TRMMA (paper Section V; widths scaled per DESIGN §3). */
final case class TrmmaConfig(
    d0: Int = 32,     // segment id embedding dim inside T0 (paper 64)
    dh: Int = 32,     // transformer model dim (paper 64)
    heads: Int = 2,   // paper 4
    layers: Int = 2,  // DualFormer layers (paper 4)
    dFfn: Int = 128,  // paper 512
    lambda: Double = 5.0, // ratio-loss weight (Eq. 21)
    useDualFormer: Boolean = true, // off => TRMMA-DF (H = R)
) extends Serializable

/** A prepared TRMMA sample: encoder inputs plus the decoder walk over the
  * dense timeline.
  *
  * `routeFeat` carries per-route-position observable geometry (cumulative
  * arc fraction, normalised length) and `slotFeat` per-slot gap anchors
  * (fraction within the gap, bracketing anchors' arc fractions) — scaled-
  * data adaptations (DESIGN §3) that make the interpolation prior cheaply
  * representable so training capacity goes into the learnable structure
  * (per-segment speeds), which is where TRMMA's advantage over linear
  * interpolation comes from.
  */
final case class TrmmaSample(
    coords: Array[Array[Double]],  // l x 4: normalised x, y, t and ratio r
    segs: Array[Int],              // l matched segments of the sparse points
    route: Array[Int],             // route segments (candidate pool)
    routeFeat: Array[Array[Double]], // lR x 3: [cumStartFrac, cumEndFrac, lenNorm]
    denseSeg: Array[Int],          // dense timeline: segment per slot
    denseR: Array[Double],         // dense timeline: ratio per slot
    densePos: Array[Int],          // dense timeline: position of seg in route
    observed: Array[Boolean],      // dense timeline: true at sparse slots
    slotFeat: Array[Array[Double]], // L x 4: [fGap, arcPrevFrac, arcNextFrac, arcLinear]
    slotLo: Array[Int],            // route position of the gap's left anchor
    slotHi: Array[Int],            // route position of the gap's right anchor
) extends Serializable

/** The TRMMA network (paper Fig. 4): DualFormer encoding (Eq. 11-14) and the
  * GRU multitask decoder (Eq. 15-18) with binary classification over the
  * route's segments and position-ratio regression, trained with Eq. 19-21.
  */
final class TrmmaModel(
    val cfg: TrmmaConfig,
    val net: RoadNetwork,
    val segEmbT: Embedding, // id embedding inside T0 and for decoder inputs
    val fcT: Linear,        // W6 (Eq. 11)
    val transT: TransformerEncoder,
    val segEmbR: Embedding, // W7 (Eq. 12)
    val fcR: Linear,        // [segEmbR ; routeFeat] -> dh
    val transR: TransformerEncoder,
    val gru: GruCell,
    val clsMlp: Mlp,        // W8/W9 (Eq. 15), input [H[k]; h; routeFeat[k]; slotFeat]
    val clsGeo: Mlp,        // residual geometric scoring head (DESIGN §3)
    val ratioMlp: Mlp,      // W10/W11 (Eq. 18), input [h; psi H; H[k]; feats]
    val ratioGeo: Mlp,      // residual geometric ratio head
) extends Module {

  def params: Seq[Tensor] =
    segEmbT.params ++ fcT.params ++ transT.params ++ segEmbR.params ++ fcR.params ++
      transR.params ++ gru.params ++ clsMlp.params ++ clsGeo.params ++
      ratioMlp.params ++ ratioGeo.params

  private val minX = net.nodes.map(_.x).min
  private val maxX = net.nodes.map(_.x).max
  private val minY = net.nodes.map(_.y).min
  private val maxY = net.nodes.map(_.y).max
  private val maxSegLen = net.segments.map(_.lengthM).max

  /** Projection ratio of a GPS point onto a segment (Alg. 2 line 4). */
  def projRatio(p: XY, segId: Int): Double = {
    val s = net.segments(segId)
    Geo.projectRatio(p, s.a, s.b)
  }

  /** Build a sample from observed sparse points with their matched segments
    * (`segs`), a route, and the dense timeline (segments/ratios known only
    * at observed slots for inference; everywhere for training).
    */
  def prepare(t: Traj, segs: Array[Int], route: Array[Int],
              denseSeg: Array[Int], denseR: Array[Double], observed: Array[Boolean]): TrmmaSample = {
    val tMax = math.max(1e-9, t.sparse.last.t - t.sparse.head.t)
    val coords = t.sparse.indices.map { i =>
      val p = t.sparse(i)
      Array((p.x - minX) / math.max(1e-9, maxX - minX),
            (p.y - minY) / math.max(1e-9, maxY - minY),
            (p.t - t.sparse.head.t) / tMax,
            projRatio(XY(p.x, p.y), segs(i)))
    }.toArray
    val arc = new RouteArc(net, route)
    val total = math.max(1e-9, arc.totalLen)
    val routeFeat = Array.tabulate(route.length)(k =>
      Array(arc.cum(k) / total, arc.cum(k + 1) / total,
            net.segments(route(k)).lengthM / maxSegLen))
    // Monotone position of each dense slot's segment within the route.
    val pos = new Array[Int](denseSeg.length)
    var cur = 0
    var j = 0
    while (j < denseSeg.length) {
      var p = cur
      while (p < route.length && route(p) != denseSeg(j)) p += 1
      if (p < route.length) cur = p
      pos(j) = cur
      j += 1
    }
    // Per-slot gap anchors from the OBSERVED slots only (inference-safe):
    // fraction within the gap and the bracketing anchors' arc fractions.
    val slotFeat = new Array[Array[Double]](denseSeg.length)
    val slotLo = new Array[Int](denseSeg.length)
    val slotHi = new Array[Int](denseSeg.length)
    val obsIdx = denseSeg.indices.filter(observed(_)).toArray
    var oi = 0
    j = 0
    while (j < denseSeg.length) {
      while (oi + 1 < obsIdx.length && obsIdx(oi + 1) <= j) oi += 1
      val lo = obsIdx(oi)
      val hi = if (oi + 1 < obsIdx.length) obsIdx(oi + 1) else lo
      val f = if (hi == lo) 0.0 else (j - lo).toDouble / (hi - lo)
      val arcLo = arc.arcOf(pos(lo), denseR(lo)) / total
      val arcHi = arc.arcOf(pos(hi), denseR(hi)) / total
      // arcLinear: where constant-speed interpolation would place this slot.
      slotFeat(j) = Array(f, arcLo, arcHi, arcLo + f * (arcHi - arcLo))
      slotLo(j) = pos(lo)
      slotHi(j) = math.max(pos(lo), pos(hi))
      j += 1
    }
    TrmmaSample(coords, segs, route, routeFeat, denseSeg, denseR, pos, observed, slotFeat,
      slotLo, slotHi)
  }

  /** Ground-truth training sample (teacher forcing over `t.dense`). */
  def prepareTrain(t: Traj): TrmmaSample = {
    val observed = Array.fill(t.dense.length)(false)
    t.sparseIdxInDense.foreach(observed(_) = true)
    prepare(t, t.sparseTruthSeg, t.route, t.dense.map(_.seg), t.dense.map(_.r), observed)
  }

  /** DualFormer encoding H (Eq. 11-14). */
  def encode(s: TrmmaSample)(implicit tp: Tape): Tensor = {
    val r1 = fcR(Ops.concatCols(segEmbR(s.route), Tensor.fromRows(s.routeFeat.toIndexedSeq)))
    val r = transR(r1)
    if (!cfg.useDualFormer) return r // TRMMA-DF: H = R
    val t0 = Ops.concatCols(Tensor.fromRows(s.coords.toIndexedSeq), segEmbT(s.segs))
    val tEnc = transT(fcT(t0))
    val b = Ops.matmul(r, Ops.transpose(tEnc)) // lR x l
    val beta = Ops.softmaxRows(b)              // Eq. 13
    Ops.add(r, Ops.matmul(beta, tEnc))         // Eq. 14
  }

  /** Decoder GRU input: previous point (segment id + ratio), the normalised
    * slot time, and the slot's gap-anchor features.
    */
  private def gruInput(seg: Int, r: Double, tNorm: Double, slotFeat: Array[Double])(implicit tp: Tape): Tensor =
    Ops.concatCols(segEmbT(Array(seg)),
      new Tensor(1, 6, Array(r, tNorm, slotFeat(0), slotFeat(1), slotFeat(2), slotFeat(3))))

  /** Per-(slot, candidate) geometric features, pre-differenced and scaled
    * to segment-width resolution so the interpolation prior is linearly
    * separable (raw [0,1] arc fractions would need segment-width-resolution
    * hinges, which small MLPs cannot learn in few steps):
    * [d1, d2, distMid, lenNorm, fGap, arcLo, arcHi, aLin] where
    * d1 = (aLin - start_k)/len_k and d2 = (end_k - aLin)/len_k.
    */
  def geoFeats(s: TrmmaSample, j: Int, lo: Int, hi: Int): Array[Array[Double]] = {
    val sf = s.slotFeat(j)
    val aLin = sf(3)
    Array.tabulate(hi + 1 - lo) { k0 =>
      val k = lo + k0
      val start = s.routeFeat(k)(0); val end = s.routeFeat(k)(1)
      val len = math.max(1e-6, end - start)
      def clip(v: Double) = math.max(-4.0, math.min(4.0, v))
      Array(clip((aLin - start) / len), clip((end - aLin) / len),
        clip((aLin - (start + end) / 2) / len),
        s.routeFeat(k)(2), sf(0), sf(1), sf(2), aLin)
    }
  }

  /** Per-route-segment logits w_{k,j} given hidden state h (Eq. 15). */
  def classLogits(h: Tensor, hEnc: Tensor, geo: Tensor)(implicit tp: Tape): Tensor = {
    val full = Ops.concatCols(Ops.concatCols(hEnc, Ops.tileRows(h, hEnc.rows)), geo)
    // Residual split: a small head over the geometry alone learns the
    // interpolation prior in a few steps; the full head learns corrections
    // (per-segment speeds etc.) on top.
    Ops.add(clsMlp(full), clsGeo(geo))
  }

  /** Predicted ratio (Eq. 18) from hidden state, logits and the (teacher-
    * forced or argmax) candidate position's encoder row and features.
    */
  def ratioHead(h: Tensor, hEnc: Tensor, w: Tensor, kPos: Int, geo: Tensor)(implicit tp: Tape): Tensor = {
    val psi = Ops.softmaxRows(Ops.transpose(w)) // 1 x lR
    val ctx = Ops.matmul(psi, hEnc)
    val hk = Ops.sliceRows(hEnc, kPos, kPos + 1)
    val fk = Ops.sliceRows(geo, kPos, kPos + 1)
    val full = ratioMlp(Ops.concatCols(Ops.concatCols(Ops.concatCols(h, ctx), hk), fk))
    Ops.sigmoid(Ops.add(full, ratioGeo(fk)))
  }

  /** Teacher-forced training loss over the dense timeline (Eq. 19-21). */
  def loss(s: TrmmaSample)(implicit tp: Tape): Tensor = {
    val hEnc = encode(s)
    var h = Ops.meanRows(hEnc)
    var lossAcc: Tensor = null
    var nMissing = 0
    val lastT = math.max(1, s.denseSeg.length - 1).toDouble
    var j = 1
    while (j < s.denseSeg.length) {
      // Advance the hidden state with the previous (true) point.
      h = gru(gruInput(s.denseSeg(j - 1), s.denseR(j - 1), j / lastT, s.slotFeat(j)), h)
      if (!s.observed(j)) {
        nMissing += 1
        // Everything is restricted to the gap's candidate window: segments
        // of the route between the two bracketing observed anchors (the
        // right anchor is as observable as Eq. 17's left one; DESIGN §3).
        // This is also what makes decoding cost |window|, not |route|.
        val lo = s.slotLo(j); val hi = s.slotHi(j)
        val hWin = Ops.sliceRows(hEnc, lo, hi + 1)
        val geo = Tensor.fromRows(geoFeats(s, j, lo, hi).toIndexedSeq)
        val wWin = classLogits(h, hWin, geo)
        val labels = new Array[Double](hi + 1 - lo)
        labels(math.min(hi, math.max(lo, s.densePos(j))) - lo) = 1.0
        val lSeg = Ops.bceLogitsSum(wWin, labels)
        val r = ratioHead(h, hWin, wWin, math.min(hi, math.max(lo, s.densePos(j))) - lo, geo)
        val lR = Ops.maeSum(r, Array(s.denseR(j)))
        val l = Ops.add(lSeg, Ops.scale(lR, cfg.lambda))
        lossAcc = if (lossAcc == null) l else Ops.add(lossAcc, l)
      }
      j += 1
    }
    if (lossAcc == null) new Tensor(1, 1, Array(0.0))
    else Ops.scale(lossAcc, 1.0 / math.max(1, nMissing))
  }

  /** Greedy decoding (Algorithm 2): fill every missing slot with the
    * order-constrained argmax segment (Eq. 17) and the regressed ratio.
    * `denseT` carries the slot timestamps; observed slots keep their
    * matched points.
    */
  def decode(s: TrmmaSample, denseT: Array[Double]): Array[MatchedPoint] = {
    implicit val tp: Tape = NoTape
    val hEnc = encode(s)
    var h = Ops.meanRows(hEnc)
    val L = denseT.length
    val out = new Array[MatchedPoint](L)
    var prevSeg = s.denseSeg(0)
    var prevR = s.denseR(0)
    var prevPos = s.densePos(0)
    out(0) = MatchedPoint(prevSeg, prevR, denseT(0))
    val lastT = math.max(1, L - 1).toDouble
    var j = 1
    while (j < L) {
      h = gru(gruInput(prevSeg, prevR, j / lastT, s.slotFeat(j)), h)
      if (s.observed(j)) {
        prevSeg = s.denseSeg(j); prevR = s.denseR(j)
        // Advance the route position monotonically to this observed segment.
        var p = prevPos
        while (p < s.route.length && s.route(p) != prevSeg) p += 1
        if (p < s.route.length) prevPos = p
        out(j) = MatchedPoint(prevSeg, prevR, denseT(j))
      } else {
        val lo = s.slotLo(j); val hi = math.max(s.slotLo(j), s.slotHi(j))
        val hWin = Ops.sliceRows(hEnc, lo, hi + 1)
        val geo = Tensor.fromRows(geoFeats(s, j, lo, hi).toIndexedSeq)
        val w = classLogits(h, hWin, geo)
        // Order constraint (Eq. 17) extended with the gap's right anchor:
        // candidates from max(prev position, left anchor) to right anchor.
        val kFrom = math.max(prevPos, lo)
        var best = kFrom
        var bv = Double.NegativeInfinity
        var k = kFrom
        while (k <= hi) {
          if (w(k - lo, 0) > bv) { bv = w(k - lo, 0); best = k }
          k += 1
        }
        val r = ratioHead(h, hWin, w, best - lo, geo).data(0)
        prevSeg = s.route(best); prevR = math.min(0.999999, r); prevPos = best
        out(j) = MatchedPoint(prevSeg, prevR, denseT(j))
      }
      j += 1
    }
    out
  }
}

object TrmmaModel {

  def init(net: RoadNetwork, cfg: TrmmaConfig, node2vec: Tensor, seed: Long = 19L): TrmmaModel = {
    val rnd = new Random(seed)
    require(node2vec.rows == net.numSegments && node2vec.cols == cfg.d0)
    new TrmmaModel(cfg, net,
      Embedding.fromPretrained(node2vec),
      Linear(4 + cfg.d0, cfg.dh, rnd),
      TransformerEncoder(cfg.dh, cfg.heads, cfg.dFfn, cfg.layers, rnd),
      Embedding(net.numSegments, cfg.dh, rnd),
      Linear(cfg.dh + 3, cfg.dh, rnd),
      TransformerEncoder(cfg.dh, cfg.heads, cfg.dFfn, cfg.layers, rnd),
      GruCell(cfg.d0 + 6, cfg.dh, rnd),
      Mlp(2 * cfg.dh + 8, 64, 1, rnd),
      Mlp(8, 32, 1, rnd),
      Mlp(3 * cfg.dh + 8, 64, 1, rnd),
      Mlp(8, 32, 1, rnd))
  }

  def train(
      model: TrmmaModel,
      trajs: IndexedSeq[Traj],
      epochs: Int = 10,
      batchSize: Int = 16,
      lr: Double = 2e-3,
      seed: Long = 23L,
      log: String => Unit = _ => (),
  ): Seq[Double] = {
    val samples = trajs.map(model.prepareTrain)
    val opt = new Adam(model.params, lr = lr, clipNorm = 50.0)
    val rnd = new Random(seed)
    (1 to epochs).map { ep =>
      val shuffled = rnd.shuffle(samples)
      val losses = shuffled.grouped(batchSize).map { batch =>
        Trainer.step[TrmmaSample](batch.toIndexedSeq, model.params, opt,
          (s, tp) => model.loss(s)(tp))
      }.toSeq
      val mean = losses.sum / losses.size
      log(f"TRMMA epoch $ep loss $mean%.4f")
      mean
    }
  }
}
