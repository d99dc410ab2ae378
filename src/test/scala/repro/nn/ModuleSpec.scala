package repro.nn

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class ModuleSpec extends AnyFunSuite {
  private val rnd = new Random(42)

  test("tensor shape validation") {
    intercept[IllegalArgumentException](new Tensor(2, 3, new Array[Double](5)))
    val t = Tensor.zeros(2, 3)
    assert(t.size == 6)
    assert(t(1, 2) == 0.0)
  }

  test("fromRows lays out row-major") {
    val t = Tensor.fromRows(Seq(Array(1.0, 2.0), Array(3.0, 4.0)))
    assert(t(0, 1) == 2.0 && t(1, 0) == 3.0)
  }

  test("glorot init is bounded") {
    val t = Tensor.glorot(20, 30, rnd)
    val lim = math.sqrt(6.0 / 50)
    assert(t.data.forall(v => math.abs(v) <= lim))
    assert(t.data.exists(_ != 0.0))
  }

  test("positional encodings are in [-1,1] and distinct per position") {
    val p = Tensor.positional(10, 8)
    assert(p.data.forall(v => v >= -1 && v <= 1))
    val row0 = (0 until 8).map(p(0, _))
    val row5 = (0 until 8).map(p(5, _))
    assert(row0 != row5)
  }

  test("backward on non-scalar fails") {
    val tp = new GradTape
    intercept[IllegalArgumentException](tp.backward(Tensor.zeros(2, 2)))
  }

  test("NoTape grad access fails") {
    intercept[IllegalStateException](NoTape.grad(Tensor.zeros(1, 1)))
  }

  test("linear layer shape and bias") {
    implicit val tp: Tape = NoTape
    val l = new Linear(Tensor(2, 3)((_, _) => 0.0), new Tensor(1, 3, Array(1.0, 2.0, 3.0)))
    val y = l(Tensor.zeros(4, 2))
    assert(y.rows == 4 && y.cols == 3)
    assert(y(2, 1) == 2.0)
  }

  test("mlp output shape") {
    implicit val tp: Tape = NoTape
    val m = Mlp(5, 7, 2, rnd)
    assert(m(Tensor.zeros(3, 5)).cols == 2)
  }

  test("layerNorm normalises rows to mean 0 variance 1 at unit gain") {
    implicit val tp: Tape = NoTape
    val ln = LayerNorm(6)
    val x = Tensor(4, 6)((_, _) => rnd.nextGaussian() * 3 + 2)
    val y = ln(x)
    (0 until 4).foreach { i =>
      val row = (0 until 6).map(y(i, _))
      val mu = row.sum / 6
      val v = row.map(a => (a - mu) * (a - mu)).sum / 6
      assert(math.abs(mu) < 1e-9)
      assert(math.abs(v - 1.0) < 1e-3)
    }
  }

  test("embedding lookup returns rows of the table") {
    implicit val tp: Tape = NoTape
    val e = new Embedding(Tensor(4, 2)((i, j) => i * 10 + j))
    val y = e(Array(3, 0, 3))
    assert(y(0, 0) == 30.0 && y(1, 1) == 1.0 && y(2, 1) == 31.0)
  }

  test("transformer layer preserves shape") {
    implicit val tp: Tape = NoTape
    val l = TransformerLayer(8, 2, 16, rnd)
    val y = l(Tensor.glorot(5, 8, rnd))
    assert(y.rows == 5 && y.cols == 8)
  }

  test("encoder stack preserves shape") {
    implicit val tp: Tape = NoTape
    val enc = TransformerEncoder(8, 2, 16, 3, rnd)
    assert(enc.layers.size == 3)
    val y = enc(Tensor.glorot(7, 8, rnd))
    assert(y.rows == 7 && y.cols == 8)
  }

  test("gru cell output shape and boundedness") {
    implicit val tp: Tape = NoTape
    val g = GruCell(3, 5, rnd)
    val h = g(Tensor.glorot(1, 3, rnd), Tensor.zeros(1, 5))
    assert(h.rows == 1 && h.cols == 5)
    assert(h.data.forall(v => math.abs(v) <= 1.0 + 1e-9)) // convex comb of tanh and 0
  }

  test("multi-head attention requires divisible dims") {
    intercept[IllegalArgumentException](MultiHeadAttention(7, 2, rnd))
  }

  test("adam fits a linear regression") {
    implicit def tp: Tape = NoTape
    val w = Tensor.glorot(3, 1, rnd)
    val opt = new Adam(Seq(w), lr = 0.05)
    val xs = Tensor(64, 3)((_, _) => rnd.nextGaussian())
    val trueW = Array(1.5, -2.0, 0.5)
    val ys = (0 until 64).map(i => (0 until 3).map(j => xs(i, j) * trueW(j)).sum).toArray
    (1 to 300).foreach { _ =>
      val t2 = new GradTape
      val loss = Ops.mseSum(Ops.matmul(xs, w)(t2), ys)(t2)
      t2.backward(loss)
      opt.step(Seq(t2.grad(w)))
    }
    (0 until 3).foreach(j => assert(math.abs(w(j, 0) - trueW(j)) < 0.02, s"w$j=${w(j, 0)}"))
  }

  test("adam + mlp fits XOR") {
    val m = Mlp(2, 8, 1, new Random(7))
    val opt = new Adam(m.params, lr = 0.02)
    val xs = Tensor.fromRows(Seq(Array(0.0, 0), Array(0.0, 1), Array(1.0, 0), Array(1.0, 1)))
    val labels = Array(0.0, 1.0, 1.0, 0.0)
    (1 to 800).foreach { _ =>
      val t2 = new GradTape
      val loss = Ops.bceLogitsSum(m(xs)(t2), labels)(t2)
      t2.backward(loss)
      opt.step(m.params.map(t2.grad))
    }
    implicit val tp: Tape = NoTape
    val out = Ops.sigmoid(m(xs))
    labels.indices.foreach(i => assert(math.abs(out(i, 0) - labels(i)) < 0.1, s"xor $i -> ${out(i, 0)}"))
  }

  test("trainer data-parallel step equals mean-gradient step") {
    // Two params, quadratic loss per sample; check loss decreases and is
    // deterministic across runs with identical inputs.
    val w = new Tensor(1, 1, Array(3.0))
    val opt = new Adam(Seq(w), lr = 0.1)
    val batch = (1 to 8).map(_.toDouble).toIndexedSeq
    val l1 = Trainer.step[Double](batch, Seq(w), opt,
      (x, tp) => Ops.mseSum(Ops.scale(w, x)(tp), Array(0.0))(tp))
    assert(l1 > 0)
    val l2 = Trainer.step[Double](batch, Seq(w), opt,
      (x, tp) => Ops.mseSum(Ops.scale(w, x)(tp), Array(0.0))(tp))
    assert(l2 < l1)
  }

  test("gradient clipping caps the applied norm") {
    val w = new Tensor(1, 1, Array(0.0))
    val opt = new Adam(Seq(w), lr = 1.0, clipNorm = 1.0)
    opt.step(Seq(Array(1000.0)))
    // First Adam step magnitude is lr regardless, but must be finite/sane.
    assert(math.abs(w.data(0)) <= 1.0 + 1e-9)
  }
}
