package repro.recovery

import repro.geo.{Geo, RoadNetwork, XY}
import repro.nn._
import repro.traj.{MatchedPoint, Recovered, Traj}
import scala.collection.mutable
import scala.util.Random

/** Configuration of the MTrajRec-family seq2seq recovery baselines.
  *
  * `kind` selects the encoder (the decoders are shared, per the paper's
  * comparison setup which plugs MTrajRec's decoder onto the representation-
  * learning encoders):
  *
  *  - `mtrajrec`:  BiGRU over GPS features (MTrajRec [14])
  *  - `rntrajrec`: transformer over GPS features enriched with the mean
  *                 Node2Vec embedding of the surrounding segments
  *                 (road-subgraph signal of RNTrajRec [10])
  *  - `mmstged`:   transformer with speed features (micro) plus a second
  *                 pass of attention (macro graph) (MM-STGED [19])
  *  - `trajgat`:   structure-only features, POOLED to one vector (TrajGAT+Dec)
  *  - `trajcl`:    dual features (spatial+structural), POOLED (TrajCL+Dec)
  *  - `st2vec`:    spatial+temporal-frequency features, POOLED (ST2Vec+Dec)
  *
  * All of them decode with a GRU whose per-slot candidate pool is the
  * `maskK` nearest segments to the time-interpolated GPS position — the
  * "constraint mask over the whole network" approach the paper contrasts
  * with TRMMA's route-restricted decoding. Pooled variants condition only on
  * one trajectory vector (no per-point encoder states), which is exactly
  * why they trail the specialised methods.
  */
final case class SeqRecConfig(
    kind: String,
    d0: Int = 32,
    dh: Int = 32,
    maskK: Int = 40,
    heads: Int = 2,
    dFfn: Int = 128,
    lambda: Double = 5.0,
) extends Serializable {
  def pooled: Boolean = kind == "trajgat" || kind == "trajcl" || kind == "st2vec"
}

/** Prepared sample: encoder features, per-slot candidate masks and targets. */
final case class SeqRecSample(
    feats: Array[Array[Double]],   // l x featDim encoder inputs
    nearSeg: Array[Int],           // nearest segment per sparse point (graph feats)
    masks: Array[Array[Int]],      // L x maskK candidate ids per dense slot
    maskFeat: Array[Array[Double]], // L x (maskK*4) per-candidate geometry
    tNorm: Array[Double],          // L normalised slot times
    targetSeg: Array[Int],         // L ground-truth segments (-1 at inference)
    targetR: Array[Double],        // L ground-truth ratios
) extends Serializable

final class SeqRecModel(
    val cfg: SeqRecConfig,
    val net: RoadNetwork,
    val epsilon: Double,
    val segIn: Embedding,    // decoder input embedding (Node2Vec-initialised)
    val segOut: Embedding,   // scoring embedding over all n segments
    val encFc: Linear,
    val encGru: BiGru,                 // used when kind == mtrajrec
    val encTrans: TransformerEncoder,  // used otherwise
    val gru: GruCell,
    val attnProj: Linear,    // decoder->encoder attention query projection
    val clsProj: Linear,     // [h; ctx] -> dh scoring vector
    val geoMlp: Mlp,         // per-candidate geometric score bypass
    val ratioMlp: Mlp,
    val node2vec: Tensor,
) extends Module {

  def params: Seq[Tensor] = {
    val enc = if (cfg.kind == "mtrajrec") encGru.params else encTrans.params
    segIn.params ++ segOut.params ++ encFc.params ++ enc ++ gru.params ++
      attnProj.params ++ clsProj.params ++ geoMlp.params ++ ratioMlp.params
  }

  private val minX = net.nodes.map(_.x).min
  private val maxX = net.nodes.map(_.x).max
  private val minY = net.nodes.map(_.y).min
  private val maxY = net.nodes.map(_.y).max
  private def nx(x: Double) = (x - minX) / math.max(1e-9, maxX - minX)
  private def ny(y: Double) = (y - minY) / math.max(1e-9, maxY - minY)

  /** Per-point encoder features, depending on `kind`. */
  private def pointFeats(t: Traj, i: Int, nearSeg: Int): Array[Double] = {
    val p = t.sparse(i)
    val tMax = math.max(1e-9, t.sparse.last.t - t.sparse.head.t)
    val tn = (p.t - t.sparse.head.t) / tMax
    val (dt, dist) =
      if (i == 0) (0.0, 0.0)
      else {
        val q = t.sparse(i - 1)
        ((p.t - q.t) / tMax, math.hypot(p.x - q.x, p.y - q.y) / 3000.0)
      }
    val base = Array(nx(p.x), ny(p.y), tn, dt, dist)
    val n2v = (0 until cfg.d0).map(j => node2vec(nearSeg, j)).toArray
    cfg.kind match {
      case "mtrajrec" => base
      case "rntrajrec" => base ++ n2v
      case "mmstged" =>
        val speed = if (dt > 0) dist / dt / 10.0 else 0.0
        (base :+ speed) ++ n2v
      case "trajgat" => n2v
      case "trajcl" => base ++ n2v
      case "st2vec" =>
        base ++ Array(math.sin(2 * math.Pi * tn), math.cos(2 * math.Pi * tn),
                      math.sin(4 * math.Pi * tn), math.cos(4 * math.Pi * tn))
      case other => throw new IllegalArgumentException(other)
    }
  }

  def featDim: Int = SeqRecModel.featDim(cfg)

  /** Time-interpolated free-space position at slot time `tt` between the
    * observed points bracketing it — the anchor of the constraint mask.
    */
  private def interpXY(t: Traj, tt: Double): XY = {
    var i = 0
    while (i + 1 < t.sparse.length && t.sparse(i + 1).t < tt) i += 1
    val a = t.sparse(i); val b = t.sparse(math.min(i + 1, t.sparse.length - 1))
    val f = if (b.t - a.t < 1e-9) 0.0 else (tt - a.t) / (b.t - a.t)
    XY(a.x + (b.x - a.x) * f, a.y + (b.y - a.y) * f)
  }

  def prepare(t: Traj, withLabels: Boolean): SeqRecSample = {
    val nearSeg = t.sparse.map(p => net.nearestSegments(XY(p.x, p.y), 1).head)
    val feats = Array.tabulate(t.sparse.length)(i => pointFeats(t, i, nearSeg(i)))
    // Dense slot times from observable timestamps.
    val times = mutable.ArrayBuffer.empty[Double]
    var i = 0
    while (i < t.sparse.length) {
      times += t.sparse(i).t
      if (i + 1 < t.sparse.length) {
        val gaps = Recoverer.gapCount(t.sparse(i).t, t.sparse(i + 1).t, epsilon)
        (1 to gaps).foreach(g => times += t.sparse(i).t + g * epsilon)
      }
      i += 1
    }
    val L = times.length
    val masks = Array.tabulate(L)(j => net.nearestSegments(interpXY(t, times(j)), cfg.maskK))
    val maxLen = net.segments.map(_.lengthM).max
    // Per-candidate geometry: proximity to the interpolated position (two
    // decay scales), direction alignment with the travel direction, and
    // segment length. Without this the scorer must memorise every segment's
    // geometry into its embedding, which needs orders of magnitude more
    // training data than we generate.
    val maskFeat = Array.tabulate(L) { j =>
      val ip = interpXY(t, times(j))
      // travel direction between bracketing observed points
      var i2 = 0
      while (i2 + 1 < t.sparse.length && t.sparse(i2 + 1).t < times(j)) i2 += 1
      val a = t.sparse(i2); val b = t.sparse(math.min(i2 + 1, t.sparse.length - 1))
      val dir = XY(b.x - a.x, b.y - a.y)
      masks(j).flatMap { sid =>
        val seg = net.segments(sid)
        val d = Geo.pointSegDist(ip, seg.a, seg.b)
        Array(math.exp(-d / 50.0), math.exp(-d / 150.0),
          Geo.cosine(seg.dir, dir), seg.lengthM / maxLen)
      }
    }
    val dur = math.max(1e-9, times.last - times.head)
    val tNorm = times.map(tt => (tt - times.head) / dur).toArray
    val (tSeg, tR) =
      if (withLabels) (t.dense.map(_.seg), t.dense.map(_.r))
      else (Array.fill(L)(-1), new Array[Double](L))
    SeqRecSample(feats, nearSeg, masks, maskFeat, tNorm, tSeg, tR)
  }

  /** Encoder states (pooled variants collapse to a single row). */
  def encode(s: SeqRecSample)(implicit tp: Tape): Tensor = {
    val x = encFc(Tensor.fromRows(s.feats.toIndexedSeq))
    val states = cfg.kind match {
      case "mtrajrec" => encGru(x)
      case _          => encTrans(x)
    }
    if (cfg.pooled) Ops.meanRows(states) else states
  }

  private def gruInput(seg: Int, r: Double, tn: Double)(implicit tp: Tape): Tensor =
    Ops.concatCols(segIn(Array(seg)), new Tensor(1, 2, Array(r, tn)))

  /** Decoder attention context over the encoder states. */
  private def context(h: Tensor, enc: Tensor)(implicit tp: Tape): Tensor = {
    val scores = Ops.matmul(attnProj(h), Ops.transpose(enc)) // 1 x l
    Ops.matmul(Ops.softmaxRows(scores), enc)
  }

  /** Candidate logits for slot j: embedding score plus geometric bypass. */
  private def slotLogits(h: Tensor, enc: Tensor, s: SeqRecSample, j: Int)(implicit tp: Tape): (Tensor, Tensor) = {
    val ctx = context(h, enc)
    val q = clsProj(Ops.concatCols(h, ctx)) // 1 x dh
    val mask = s.masks(j)
    val cand = segOut(mask)                 // maskK x dh
    val geo = new Tensor(mask.length, 4, s.maskFeat(j).clone())
    (Ops.add(Ops.matmul(cand, Ops.transpose(q)), geoMlp(geo)), ctx)
  }

  def loss(s: SeqRecSample)(implicit tp: Tape): Tensor = {
    val enc = encode(s)
    var h = Ops.meanRows(enc)
    var acc: Tensor = null
    var count = 0
    var j = 0
    while (j < s.masks.length) {
      if (j > 0) h = gru(gruInput(s.targetSeg(j - 1), s.targetR(j - 1), s.tNorm(j)), h)
      val targetIdx = s.masks(j).indexOf(s.targetSeg(j))
      if (targetIdx >= 0) {
        count += 1
        val (logits, ctx) = slotLogits(h, enc, s, j)
        val lSeg = Ops.ceRowsSum(Ops.transpose(logits), Array(targetIdx))
        val r = Ops.sigmoid(ratioMlp(Ops.concatCols(h, ctx)))
        val lR = Ops.maeSum(r, Array(s.targetR(j)))
        val l = Ops.add(lSeg, Ops.scale(lR, cfg.lambda))
        acc = if (acc == null) l else Ops.add(acc, l)
      }
      j += 1
    }
    if (acc == null) new Tensor(1, 1, Array(0.0)) else Ops.scale(acc, 1.0 / math.max(1, count))
  }

  def recover(t: Traj): Recovered = {
    implicit val tp: Tape = NoTape
    val s = prepare(t, withLabels = false)
    val enc = encode(s)
    var h = Ops.meanRows(enc)
    // Rebuild slot times (prepare discards them).
    val times = mutable.ArrayBuffer.empty[Double]
    var i = 0
    while (i < t.sparse.length) {
      times += t.sparse(i).t
      if (i + 1 < t.sparse.length) {
        val gaps = Recoverer.gapCount(t.sparse(i).t, t.sparse(i + 1).t, epsilon)
        (1 to gaps).foreach(g => times += t.sparse(i).t + g * epsilon)
      }
      i += 1
    }
    val out = new Array[MatchedPoint](s.masks.length)
    var prevSeg = s.masks(0)(0)
    var prevR = 0.0
    var j = 0
    while (j < s.masks.length) {
      if (j > 0) h = gru(gruInput(prevSeg, prevR, s.tNorm(j)), h)
      val (logits, ctx) = slotLogits(h, enc, s, j)
      var best = 0; var bv = Double.NegativeInfinity
      var k = 0
      while (k < logits.rows) { if (logits(k, 0) > bv) { bv = logits(k, 0); best = k }; k += 1 }
      val seg = s.masks(j)(best)
      val r = Ops.sigmoid(ratioMlp(Ops.concatCols(h, ctx))).data(0)
      out(j) = MatchedPoint(seg, math.min(0.999999, r), times(j))
      prevSeg = seg; prevR = r
      j += 1
    }
    Recovered(t.id, out)
  }
}

object SeqRecModel {

  def featDim(cfg: SeqRecConfig): Int = cfg.kind match {
    case "mtrajrec" => 5
    case "rntrajrec" => 5 + cfg.d0
    case "mmstged" => 6 + cfg.d0
    case "trajgat" => cfg.d0
    case "trajcl" => 5 + cfg.d0
    case "st2vec" => 9
    case other => throw new IllegalArgumentException(other)
  }

  def init(net: RoadNetwork, cfg: SeqRecConfig, epsilon: Double, node2vec: Tensor,
           seed: Long = 29L): SeqRecModel = {
    val rnd = new Random(seed)
    new SeqRecModel(cfg, net, epsilon,
      Embedding.fromPretrained(node2vec),
      Embedding(net.numSegments, cfg.dh, rnd),
      Linear(featDim(cfg), cfg.dh, rnd),
      BiGru(cfg.dh, cfg.dh, rnd),
      TransformerEncoder(cfg.dh, cfg.heads, cfg.dFfn, if (cfg.kind == "mmstged") 3 else 2, rnd),
      GruCell(cfg.d0 + 2, cfg.dh, rnd),
      Linear(cfg.dh, cfg.dh, rnd),
      Linear(2 * cfg.dh, cfg.dh, rnd),
      Mlp(4, 16, 1, rnd),
      Mlp(2 * cfg.dh, cfg.dh, 1, rnd),
      node2vec)
  }

  def train(model: SeqRecModel, trajs: IndexedSeq[Traj], epochs: Int = 10,
            batchSize: Int = 16, lr: Double = 2e-3, seed: Long = 31L,
            log: String => Unit = _ => ()): Seq[Double] = {
    val samples = trajs.map(model.prepare(_, withLabels = true))
    val opt = new Adam(model.params, lr = lr)
    val rnd = new Random(seed)
    (1 to epochs).map { ep =>
      val shuffled = rnd.shuffle(samples)
      val losses = shuffled.grouped(batchSize).map { b =>
        Trainer.step[SeqRecSample](b.toIndexedSeq, model.params, opt, (s, tp) => model.loss(s)(tp))
      }.toSeq
      val mean = losses.sum / losses.size
      log(f"${model.cfg.kind} epoch $ep loss $mean%.4f")
      mean
    }
  }
}

/** Recoverer wrapper with the paper's display name. */
final class SeqRec(val model: SeqRecModel, override val name: String) extends Recoverer {
  def recover(t: Traj): Recovered = model.recover(t)
}
