package repro.nn

import scala.collection.mutable

/** A dense row-major 2-D tensor of doubles.
  *
  * Gradients are NOT stored on the tensor: they live in the [[GradTape]]
  * that recorded the forward pass, keyed by tensor identity. This keeps
  * tensors immutable-by-convention and makes data-parallel training trivial
  * (each worker thread owns a private tape; parameter gradients are summed
  * after backward).
  */
final class Tensor(val rows: Int, val cols: Int, val data: Array[Double]) extends Serializable {
  require(data.length == rows * cols, s"shape ${rows}x$cols != data ${data.length}")
  def apply(i: Int, j: Int): Double = data(i * cols + j)
  def size: Int = data.length
  def copyTensor(): Tensor = new Tensor(rows, cols, data.clone())
  override def toString: String = s"Tensor(${rows}x$cols)"
}

object Tensor {
  def zeros(rows: Int, cols: Int): Tensor = new Tensor(rows, cols, new Array[Double](rows * cols))
  def apply(rows: Int, cols: Int)(f: (Int, Int) => Double): Tensor = {
    val d = new Array[Double](rows * cols)
    var i = 0
    while (i < rows) { var j = 0; while (j < cols) { d(i * cols + j) = f(i, j); j += 1 }; i += 1 }
    new Tensor(rows, cols, d)
  }
  def fromRows(rows: Seq[Array[Double]]): Tensor = {
    require(rows.nonEmpty)
    val c = rows.head.length
    val d = new Array[Double](rows.length * c)
    rows.zipWithIndex.foreach { case (r, i) => System.arraycopy(r, 0, d, i * c, c) }
    new Tensor(rows.length, c, d)
  }
  /** Glorot-uniform initialisation. */
  def glorot(rows: Int, cols: Int, rnd: scala.util.Random): Tensor = {
    val lim = math.sqrt(6.0 / (rows + cols))
    Tensor(rows, cols)((_, _) => (rnd.nextDouble() * 2 - 1) * lim)
  }
  /** Sinusoidal positional encodings (len x d), a constant (no gradient). */
  def positional(len: Int, d: Int): Tensor = Tensor(len, d) { (pos, j) =>
    val exp = (j / 2) * 2.0 / d
    val angle = pos / math.pow(10000.0, exp)
    if (j % 2 == 0) math.sin(angle) else math.cos(angle)
  }
}

/** Recording context for reverse-mode autodiff. [[NoTape]] disables
  * recording (inference); [[GradTape]] records and replays backward.
  */
sealed trait Tape {
  def active: Boolean
  def record(f: () => Unit): Unit
  def grad(t: Tensor): Array[Double]
}

object NoTape extends Tape {
  val active = false
  def record(f: () => Unit): Unit = ()
  def grad(t: Tensor): Array[Double] =
    throw new IllegalStateException("gradients requested outside a GradTape")
}

final class GradTape extends Tape {
  val active = true
  private val ops = mutable.ArrayBuffer.empty[() => Unit]
  private val grads = new java.util.IdentityHashMap[Tensor, Array[Double]]()
  def record(f: () => Unit): Unit = ops += f
  def grad(t: Tensor): Array[Double] = {
    var g = grads.get(t)
    if (g == null) { g = new Array[Double](t.size); grads.put(t, g) }
    g
  }
  /** Seed d(loss)/d(loss)=1 for a 1x1 loss tensor and replay the tape. */
  def backward(loss: Tensor): Unit = {
    require(loss.size == 1, s"backward needs a scalar loss, got $loss")
    grad(loss)(0) = 1.0
    var i = ops.length - 1
    while (i >= 0) { ops(i)(); i -= 1 }
  }
}
