package repro.nn

/** Differentiable tensor operations. Every op computes the forward value
  * eagerly and, when `tp` is a [[GradTape]], records a closure that
  * accumulates input gradients from the output gradient. All gradients are
  * verified against numerical differentiation in `nn.GradCheckSpec`.
  */
object Ops {

  /** a(m x k) * b(k x n) -> m x n */
  def matmul(a: Tensor, b: Tensor)(implicit tp: Tape): Tensor = {
    require(a.cols == b.rows, s"matmul $a * $b")
    val m = a.rows; val k = a.cols; val n = b.cols
    val out = new Array[Double](m * n)
    var i = 0
    while (i < m) {
      var p = 0
      while (p < k) {
        val av = a.data(i * k + p)
        if (av != 0.0) {
          var j = 0
          val bo = p * n; val oo = i * n
          while (j < n) { out(oo + j) += av * b.data(bo + j); j += 1 }
        }
        p += 1
      }
      i += 1
    }
    val y = new Tensor(m, n, out)
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a); val db = tp.grad(b)
      // dA += dY * B^T
      var i2 = 0
      while (i2 < m) {
        var p2 = 0
        while (p2 < k) {
          var s = 0.0; var j2 = 0
          val yo = i2 * n; val bo = p2 * n
          while (j2 < n) { s += dy(yo + j2) * b.data(bo + j2); j2 += 1 }
          da(i2 * k + p2) += s
          p2 += 1
        }
        i2 += 1
      }
      // dB += A^T * dY
      var p3 = 0
      while (p3 < k) {
        var i3 = 0
        while (i3 < m) {
          val av = a.data(i3 * k + p3)
          if (av != 0.0) {
            var j3 = 0
            val yo = i3 * n; val bo = p3 * n
            while (j3 < n) { db(bo + j3) += av * dy(yo + j3); j3 += 1 }
          }
          i3 += 1
        }
        p3 += 1
      }
    }
    y
  }

  def transpose(a: Tensor)(implicit tp: Tape): Tensor = {
    val y = Tensor(a.cols, a.rows)((i, j) => a(j, i))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0
      while (i < a.rows) { var j = 0; while (j < a.cols) { da(i * a.cols + j) += dy(j * a.rows + i); j += 1 }; i += 1 }
    }
    y
  }

  def add(a: Tensor, b: Tensor)(implicit tp: Tape): Tensor = {
    require(a.rows == b.rows && a.cols == b.cols, s"add $a + $b")
    val y = new Tensor(a.rows, a.cols, Array.tabulate(a.size)(i => a.data(i) + b.data(i)))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a); val db = tp.grad(b)
      var i = 0; while (i < y.size) { da(i) += dy(i); db(i) += dy(i); i += 1 }
    }
    y
  }

  /** Broadcast-add a 1 x n row vector to every row of a (m x n). */
  def addRow(a: Tensor, b: Tensor)(implicit tp: Tape): Tensor = {
    require(b.rows == 1 && a.cols == b.cols, s"addRow $a + $b")
    val n = a.cols
    val y = Tensor(a.rows, n)((i, j) => a(i, j) + b.data(j))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a); val db = tp.grad(b)
      var i = 0
      while (i < a.rows) { var j = 0; while (j < n) { val g = dy(i * n + j); da(i * n + j) += g; db(j) += g; j += 1 }; i += 1 }
    }
    y
  }

  /** Broadcast-multiply every row of a (m x n) by a 1 x n row vector. */
  def mulRow(a: Tensor, b: Tensor)(implicit tp: Tape): Tensor = {
    require(b.rows == 1 && a.cols == b.cols, s"mulRow $a * $b")
    val n = a.cols
    val y = Tensor(a.rows, n)((i, j) => a(i, j) * b.data(j))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a); val db = tp.grad(b)
      var i = 0
      while (i < a.rows) {
        var j = 0
        while (j < n) {
          val g = dy(i * n + j)
          da(i * n + j) += g * b.data(j)
          db(j) += g * a.data(i * n + j)
          j += 1
        }
        i += 1
      }
    }
    y
  }

  def mulElem(a: Tensor, b: Tensor)(implicit tp: Tape): Tensor = {
    require(a.rows == b.rows && a.cols == b.cols, s"mulElem $a * $b")
    val y = new Tensor(a.rows, a.cols, Array.tabulate(a.size)(i => a.data(i) * b.data(i)))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a); val db = tp.grad(b)
      var i = 0; while (i < y.size) { da(i) += dy(i) * b.data(i); db(i) += dy(i) * a.data(i); i += 1 }
    }
    y
  }

  def scale(a: Tensor, c: Double)(implicit tp: Tape): Tensor = {
    val y = new Tensor(a.rows, a.cols, a.data.map(_ * c))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0; while (i < y.size) { da(i) += dy(i) * c; i += 1 }
    }
    y
  }

  def relu(a: Tensor)(implicit tp: Tape): Tensor = {
    val y = new Tensor(a.rows, a.cols, a.data.map(v => if (v > 0) v else 0.0))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0; while (i < y.size) { if (a.data(i) > 0) da(i) += dy(i); i += 1 }
    }
    y
  }

  def sigmoid(a: Tensor)(implicit tp: Tape): Tensor = {
    val y = new Tensor(a.rows, a.cols, a.data.map(v => 1.0 / (1.0 + math.exp(-v))))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0; while (i < y.size) { val s = y.data(i); da(i) += dy(i) * s * (1 - s); i += 1 }
    }
    y
  }

  def tanh(a: Tensor)(implicit tp: Tape): Tensor = {
    val y = new Tensor(a.rows, a.cols, a.data.map(math.tanh))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0; while (i < y.size) { val t = y.data(i); da(i) += dy(i) * (1 - t * t); i += 1 }
    }
    y
  }

  /** Row-wise softmax. */
  def softmaxRows(a: Tensor)(implicit tp: Tape): Tensor = {
    val n = a.cols
    val out = new Array[Double](a.size)
    var i = 0
    while (i < a.rows) {
      var mx = Double.NegativeInfinity
      var j = 0
      while (j < n) { val v = a(i, j); if (v > mx) mx = v; j += 1 }
      var s = 0.0
      j = 0
      while (j < n) { val e = math.exp(a(i, j) - mx); out(i * n + j) = e; s += e; j += 1 }
      j = 0
      while (j < n) { out(i * n + j) /= s; j += 1 }
      i += 1
    }
    val y = new Tensor(a.rows, n, out)
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i2 = 0
      while (i2 < a.rows) {
        var dot = 0.0; var j2 = 0
        while (j2 < n) { dot += dy(i2 * n + j2) * y.data(i2 * n + j2); j2 += 1 }
        j2 = 0
        while (j2 < n) { da(i2 * n + j2) += (dy(i2 * n + j2) - dot) * y.data(i2 * n + j2); j2 += 1 }
        i2 += 1
      }
    }
    y
  }

  /** Row-wise layer normalisation with learnable gain/bias (both 1 x n). */
  def layerNorm(x: Tensor, gain: Tensor, bias: Tensor, eps: Double = 1e-5)(implicit tp: Tape): Tensor = {
    require(gain.rows == 1 && bias.rows == 1 && gain.cols == x.cols && bias.cols == x.cols)
    val n = x.cols
    val xhat = new Array[Double](x.size)
    val invStd = new Array[Double](x.rows)
    var i = 0
    while (i < x.rows) {
      var mu = 0.0; var j = 0
      while (j < n) { mu += x(i, j); j += 1 }
      mu /= n
      var v = 0.0
      j = 0
      while (j < n) { val d = x(i, j) - mu; v += d * d; j += 1 }
      v /= n
      val is = 1.0 / math.sqrt(v + eps)
      invStd(i) = is
      j = 0
      while (j < n) { xhat(i * n + j) = (x(i, j) - mu) * is; j += 1 }
      i += 1
    }
    val y = Tensor(x.rows, n)((i2, j2) => xhat(i2 * n + j2) * gain.data(j2) + bias.data(j2))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val dx = tp.grad(x); val dg = tp.grad(gain); val db = tp.grad(bias)
      var i3 = 0
      while (i3 < x.rows) {
        var mDxh = 0.0; var mDxhXh = 0.0
        var j3 = 0
        while (j3 < n) {
          val g = dy(i3 * n + j3)
          dg(j3) += g * xhat(i3 * n + j3)
          db(j3) += g
          val dxh = g * gain.data(j3)
          mDxh += dxh
          mDxhXh += dxh * xhat(i3 * n + j3)
          j3 += 1
        }
        mDxh /= n; mDxhXh /= n
        j3 = 0
        while (j3 < n) {
          val dxh = dy(i3 * n + j3) * gain.data(j3)
          dx(i3 * n + j3) += invStd(i3) * (dxh - mDxh - xhat(i3 * n + j3) * mDxhXh)
          j3 += 1
        }
        i3 += 1
      }
    }
    y
  }

  def concatCols(a: Tensor, b: Tensor)(implicit tp: Tape): Tensor = {
    require(a.rows == b.rows, s"concatCols $a ++ $b")
    val n = a.cols + b.cols
    val y = Tensor(a.rows, n)((i, j) => if (j < a.cols) a(i, j) else b(i, j - a.cols))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a); val db = tp.grad(b)
      var i = 0
      while (i < a.rows) {
        var j = 0
        while (j < a.cols) { da(i * a.cols + j) += dy(i * n + j); j += 1 }
        j = 0
        while (j < b.cols) { db(i * b.cols + j) += dy(i * n + a.cols + j); j += 1 }
        i += 1
      }
    }
    y
  }

  def concatRows(parts: Seq[Tensor])(implicit tp: Tape): Tensor = {
    require(parts.nonEmpty)
    val n = parts.head.cols
    require(parts.forall(_.cols == n))
    val m = parts.map(_.rows).sum
    val d = new Array[Double](m * n)
    var off = 0
    parts.foreach { p => System.arraycopy(p.data, 0, d, off, p.size); off += p.size }
    val y = new Tensor(m, n, d)
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y)
      var off2 = 0
      parts.foreach { p =>
        val dp = tp.grad(p)
        var i = 0; while (i < p.size) { dp(i) += dy(off2 + i); i += 1 }
        off2 += p.size
      }
    }
    y
  }

  def sliceCols(a: Tensor, from: Int, until: Int)(implicit tp: Tape): Tensor = {
    val w = until - from
    val y = Tensor(a.rows, w)((i, j) => a(i, from + j))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0
      while (i < a.rows) { var j = 0; while (j < w) { da(i * a.cols + from + j) += dy(i * w + j); j += 1 }; i += 1 }
    }
    y
  }

  def sliceRows(a: Tensor, from: Int, until: Int)(implicit tp: Tape): Tensor = {
    val h = until - from
    val y = Tensor(h, a.cols)((i, j) => a(from + i, j))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i = 0; while (i < y.size) { da(from * a.cols + i) += dy(i); i += 1 }
    }
    y
  }

  /** Gather rows `idx` of an embedding matrix; backward scatter-adds. */
  def rows(emb: Tensor, idx: Array[Int])(implicit tp: Tape): Tensor = {
    val n = emb.cols
    val y = Tensor(idx.length, n)((i, j) => emb(idx(i), j))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val de = tp.grad(emb)
      var i = 0
      while (i < idx.length) {
        var j = 0; while (j < n) { de(idx(i) * n + j) += dy(i * n + j); j += 1 }
        i += 1
      }
    }
    y
  }

  /** Column-mean over rows: (m x n) -> (1 x n). */
  def meanRows(a: Tensor)(implicit tp: Tape): Tensor = {
    val n = a.cols; val m = a.rows
    val d = new Array[Double](n)
    var i = 0
    while (i < m) { var j = 0; while (j < n) { d(j) += a(i, j) / m; j += 1 }; i += 1 }
    val y = new Tensor(1, n, d)
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val da = tp.grad(a)
      var i2 = 0
      while (i2 < m) { var j = 0; while (j < n) { da(i2 * n + j) += dy(j) / m; j += 1 }; i2 += 1 }
    }
    y
  }

  def sumAll(a: Tensor)(implicit tp: Tape): Tensor = {
    val y = new Tensor(1, 1, Array(a.data.sum))
    if (tp.active) tp.record { () =>
      val g = tp.grad(y)(0); val da = tp.grad(a)
      var i = 0; while (i < a.size) { da(i) += g; i += 1 }
    }
    y
  }

  /** Repeat a 1 x n row vector into m rows. */
  def tileRows(row: Tensor, m: Int)(implicit tp: Tape): Tensor = {
    require(row.rows == 1, s"tileRows needs a row vector, got $row")
    val n = row.cols
    val y = Tensor(m, n)((_, j) => row.data(j))
    if (tp.active) tp.record { () =>
      val dy = tp.grad(y); val dr = tp.grad(row)
      var i = 0
      while (i < m) { var j = 0; while (j < n) { dr(j) += dy(i * n + j); j += 1 }; i += 1 }
    }
    y
  }

  /** Numerically stable binary-cross-entropy-with-logits, summed: scalar. */
  def bceLogitsSum(logits: Tensor, labels: Array[Double])(implicit tp: Tape): Tensor = {
    require(labels.length == logits.size)
    var loss = 0.0
    var i = 0
    while (i < logits.size) {
      val x = logits.data(i); val z = labels(i)
      loss += math.max(x, 0) - x * z + math.log1p(math.exp(-math.abs(x)))
      i += 1
    }
    val y = new Tensor(1, 1, Array(loss))
    if (tp.active) tp.record { () =>
      val g = tp.grad(y)(0); val dl = tp.grad(logits)
      var i2 = 0
      while (i2 < logits.size) {
        val s = 1.0 / (1.0 + math.exp(-logits.data(i2)))
        dl(i2) += g * (s - labels(i2))
        i2 += 1
      }
    }
    y
  }

  /** Row-wise softmax cross-entropy against integer targets, summed. */
  def ceRowsSum(logits: Tensor, targets: Array[Int])(implicit tp: Tape): Tensor = {
    require(targets.length == logits.rows)
    val n = logits.cols
    val probs = new Array[Double](logits.size)
    var loss = 0.0
    var i = 0
    while (i < logits.rows) {
      var mx = Double.NegativeInfinity; var j = 0
      while (j < n) { if (logits(i, j) > mx) mx = logits(i, j); j += 1 }
      var s = 0.0
      j = 0
      while (j < n) { val e = math.exp(logits(i, j) - mx); probs(i * n + j) = e; s += e; j += 1 }
      j = 0
      while (j < n) { probs(i * n + j) /= s; j += 1 }
      loss += -math.log(math.max(1e-12, probs(i * n + targets(i))))
      i += 1
    }
    val y = new Tensor(1, 1, Array(loss))
    if (tp.active) tp.record { () =>
      val g = tp.grad(y)(0); val dl = tp.grad(logits)
      var i2 = 0
      while (i2 < logits.rows) {
        var j2 = 0
        while (j2 < n) {
          val t = if (j2 == targets(i2)) 1.0 else 0.0
          dl(i2 * n + j2) += g * (probs(i2 * n + j2) - t)
          j2 += 1
        }
        i2 += 1
      }
    }
    y
  }

  /** Sum of absolute errors (subgradient sign at 0). */
  def maeSum(pred: Tensor, target: Array[Double])(implicit tp: Tape): Tensor = {
    require(target.length == pred.size)
    var loss = 0.0
    var i = 0
    while (i < pred.size) { loss += math.abs(pred.data(i) - target(i)); i += 1 }
    val y = new Tensor(1, 1, Array(loss))
    if (tp.active) tp.record { () =>
      val g = tp.grad(y)(0); val dp = tp.grad(pred)
      var i2 = 0
      while (i2 < pred.size) {
        dp(i2) += g * math.signum(pred.data(i2) - target(i2))
        i2 += 1
      }
    }
    y
  }

  /** Sum of squared errors. */
  def mseSum(pred: Tensor, target: Array[Double])(implicit tp: Tape): Tensor = {
    require(target.length == pred.size)
    var loss = 0.0
    var i = 0
    while (i < pred.size) { val d = pred.data(i) - target(i); loss += d * d; i += 1 }
    val y = new Tensor(1, 1, Array(loss))
    if (tp.active) tp.record { () =>
      val g = tp.grad(y)(0); val dp = tp.grad(pred)
      var i2 = 0
      while (i2 < pred.size) { dp(i2) += g * 2 * (pred.data(i2) - target(i2)); i2 += 1 }
    }
    y
  }
}
