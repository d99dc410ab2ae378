package repro.nn

import java.util.concurrent.Executors
import scala.concurrent.duration.Duration
import scala.concurrent.{Await, ExecutionContext, Future}

/** Adam optimiser with global-norm gradient clipping. */
final class Adam(
    params: Seq[Tensor],
    lr: Double = 1e-3,
    beta1: Double = 0.9,
    beta2: Double = 0.999,
    eps: Double = 1e-8,
    clipNorm: Double = 5.0,
) {
  private val m = params.map(p => new Array[Double](p.size)).toArray
  private val v = params.map(p => new Array[Double](p.size)).toArray
  private var t = 0

  /** Apply one update from per-parameter gradient arrays (aligned with the
    * `params` passed at construction).
    */
  def step(grads: Seq[Array[Double]]): Unit = {
    require(grads.length == params.length)
    t += 1
    var norm2 = 0.0
    grads.foreach(g => { var i = 0; while (i < g.length) { norm2 += g(i) * g(i); i += 1 } })
    val scale = { val n = math.sqrt(norm2); if (n > clipNorm) clipNorm / n else 1.0 }
    val bc1 = 1 - math.pow(beta1, t)
    val bc2 = 1 - math.pow(beta2, t)
    params.indices.foreach { pi =>
      val p = params(pi).data; val g = grads(pi); val mp = m(pi); val vp = v(pi)
      var i = 0
      while (i < p.length) {
        val gi = g(i) * scale
        mp(i) = beta1 * mp(i) + (1 - beta1) * gi
        vp(i) = beta2 * vp(i) + (1 - beta2) * gi * gi
        p(i) -= lr * (mp(i) / bc1) / (math.sqrt(vp(i) / bc2) + eps)
        i += 1
      }
    }
  }
}

/** Data-parallel minibatch trainer: each worker thread forwards/backwards a
  * chunk of the minibatch on its own [[GradTape]]; parameter gradients are
  * summed and one Adam step applied. Mirrors single-GPU batched training on
  * the multicore driver.
  */
object Trainer {

  private lazy val pool = {
    val threads = math.max(2, Runtime.getRuntime.availableProcessors() - 1)
    ExecutionContext.fromExecutorService(Executors.newFixedThreadPool(threads, r => {
      val t = new Thread(r, "nn-trainer"); t.setDaemon(true); t
    }))
  }
  private lazy val nThreads = math.max(2, Runtime.getRuntime.availableProcessors() - 1)

  /** Run one minibatch step. `lossOf` computes the scalar (1x1) loss of one
    * example on the given tape; returns the mean loss value over the batch.
    */
  def step[S](
      batch: IndexedSeq[S],
      params: Seq[Tensor],
      opt: Adam,
      lossOf: (S, Tape) => Tensor,
  ): Double = {
    val chunks = {
      val per = math.max(1, math.ceil(batch.size.toDouble / nThreads).toInt)
      batch.grouped(per).toIndexedSeq
    }
    implicit val ec: ExecutionContext = pool
    val futs = chunks.map { chunk =>
      Future {
        val tp = new GradTape
        var lossSum = 0.0
        val losses = chunk.map { s => val l = lossOf(s, tp); lossSum += l.data(0); l }
        // Single backward over the summed loss of the chunk.
        val total = losses.reduceLeft((a, b) => Ops.add(a, b)(tp))
        tp.backward(total)
        (params.map(p => tp.grad(p)), lossSum)
      }
    }
    val results = Await.result(Future.sequence(futs), Duration.Inf)
    val acc = params.map(p => new Array[Double](p.size))
    var lossSum = 0.0
    results.foreach { case (gs, l) =>
      lossSum += l
      var pi = 0
      while (pi < acc.length) {
        val a = acc(pi); val g = gs(pi)
        var i = 0; while (i < a.length) { a(i) += g(i) / batch.size; i += 1 }
        pi += 1
      }
    }
    opt.step(acc)
    lossSum / batch.size
  }
}
