package repro.woodblock

import java.util.Random

/** A parameter tensor with gradient and Adam moment buffers. */
final class Param(val rows: Int, val cols: Int, rng: Random, scale: Double) {
  val v: Array[Double] = Array.fill(rows * cols)((rng.nextDouble() * 2 - 1) * scale)
  val g: Array[Double] = new Array[Double](rows * cols)
  val m: Array[Double] = new Array[Double](rows * cols)
  val u: Array[Double] = new Array[Double](rows * cols)
  def zeroGrad(): Unit = java.util.Arrays.fill(g, 0.0)
}

/** Adam optimizer over a set of Params. */
final class Adam(params: Seq[Param], lr: Double, b1: Double = 0.9, b2: Double = 0.999, eps: Double = 1e-8) {
  private var t = 0
  def step(): Unit = {
    t += 1
    val c1 = 1 - math.pow(b1, t)
    val c2 = 1 - math.pow(b2, t)
    for (p <- params) {
      var i = 0
      while (i < p.v.length) {
        p.m(i) = b1 * p.m(i) + (1 - b1) * p.g(i)
        p.u(i) = b2 * p.u(i) + (1 - b2) * p.g(i) * p.g(i)
        p.v(i) -= lr * (p.m(i) / c1) / (math.sqrt(p.u(i) / c2) + eps)
        i += 1
      }
    }
  }
}

/** Forward-pass cache for one state (needed by backprop). */
final case class FwdCache(x: Array[Double], z1: Array[Double], a1: Array[Double],
                          z2: Array[Double], a2: Array[Double],
                          logits: Array[Double], value: Double)

/** The WOODBLOCK network (§5.2.3): two shared fully-connected ReLU layers,
  * a |A|-dim linear policy head and a scalar value head. Implemented with
  * explicit per-sample forward/backward (no autodiff dependency).
  */
final class PolicyValueNet(val inputDim: Int, val hidden: Int, val nActions: Int, seed: Long = 0) {
  private val rng = new Random(seed)
  private def glorot(fanIn: Int, fanOut: Int) = math.sqrt(6.0 / (fanIn + fanOut))

  val w1 = new Param(hidden, inputDim, rng, glorot(inputDim, hidden))
  val b1 = new Param(hidden, 1, rng, 0.0)
  val w2 = new Param(hidden, hidden, rng, glorot(hidden, hidden))
  val b2 = new Param(hidden, 1, rng, 0.0)
  val wp = new Param(nActions, hidden, rng, glorot(hidden, nActions) * 0.1)
  val bp = new Param(nActions, 1, rng, 0.0)
  val wv = new Param(1, hidden, rng, glorot(hidden, 1) * 0.1)
  val bv = new Param(1, 1, rng, 0.0)

  def params: Seq[Param] = Seq(w1, b1, w2, b2, wp, bp, wv, bv)
  def zeroGrads(): Unit = params.foreach(_.zeroGrad())

  private def affine(w: Param, b: Param, x: Array[Double]): Array[Double] = {
    val out = new Array[Double](w.rows)
    var r = 0
    while (r < w.rows) {
      var s = b.v(r)
      val off = r * w.cols
      var c = 0
      while (c < w.cols) { s += w.v(off + c) * x(c); c += 1 }
      out(r) = s
      r += 1
    }
    out
  }

  def forward(x: Array[Double]): FwdCache = {
    require(x.length == inputDim, s"input dim ${x.length} != $inputDim")
    val z1 = affine(w1, b1, x)
    val a1 = z1.map(v => if (v > 0) v else 0.0)
    val z2 = affine(w2, b2, a1)
    val a2 = z2.map(v => if (v > 0) v else 0.0)
    val logits = affine(wp, bp, a2)
    val value = affine(wv, bv, a2)(0)
    FwdCache(x, z1, a1, z2, a2, logits, value)
  }

  /** Accumulate gradients for one sample given upstream dLoss/dLogits and
    * dLoss/dValue. Caller averages by zeroing grads and scaling dLogits.
    */
  def backward(c: FwdCache, dLogits: Array[Double], dValue: Double): Unit = {
    val dA2 = new Array[Double](hidden)
    // Policy head.
    var a = 0
    while (a < nActions) {
      val d = dLogits(a)
      if (d != 0.0) {
        val off = a * hidden
        var h = 0
        while (h < hidden) {
          wp.g(off + h) += d * c.a2(h)
          dA2(h) += d * wp.v(off + h)
          h += 1
        }
        bp.g(a) += d
      }
      a += 1
    }
    // Value head.
    var h = 0
    while (h < hidden) {
      wv.g(h) += dValue * c.a2(h)
      dA2(h) += dValue * wv.v(h)
      h += 1
    }
    bv.g(0) += dValue
    // Layer 2.
    val dA1 = new Array[Double](hidden)
    var r = 0
    while (r < hidden) {
      val dz = if (c.z2(r) > 0) dA2(r) else 0.0
      if (dz != 0.0) {
        val off = r * hidden
        var cc = 0
        while (cc < hidden) {
          w2.g(off + cc) += dz * c.a1(cc)
          dA1(cc) += dz * w2.v(off + cc)
          cc += 1
        }
        b2.g(r) += dz
      }
      r += 1
    }
    // Layer 1.
    r = 0
    while (r < hidden) {
      val dz = if (c.z1(r) > 0) dA1(r) else 0.0
      if (dz != 0.0) {
        val off = r * inputDim
        var cc = 0
        while (cc < inputDim) {
          w1.g(off + cc) += dz * c.x(cc)
          cc += 1
        }
        b1.g(r) += dz
      }
      r += 1
    }
  }
}

object Nn {
  /** Masked log-softmax: illegal actions get -inf logits. Returns log-probs
    * (NaN-free: illegal entries are Double.NegativeInfinity).
    */
  def maskedLogSoftmax(logits: Array[Double], legal: Array[Boolean]): Array[Double] = {
    var mx = Double.NegativeInfinity
    var i = 0
    while (i < logits.length) { if (legal(i) && logits(i) > mx) mx = logits(i); i += 1 }
    var sum = 0.0
    i = 0
    while (i < logits.length) { if (legal(i)) sum += math.exp(logits(i) - mx); i += 1 }
    val lse = mx + math.log(sum)
    logits.indices.map(j => if (legal(j)) logits(j) - lse else Double.NegativeInfinity).toArray
  }

  def probsFromLogProbs(lp: Array[Double]): Array[Double] =
    lp.map(v => if (v == Double.NegativeInfinity) 0.0 else math.exp(v))

  /** Sample an action index from masked probabilities. */
  def sample(probs: Array[Double], rng: Random): Int = {
    val u = rng.nextDouble()
    var acc = 0.0
    var i = 0
    while (i < probs.length) {
      acc += probs(i)
      if (u < acc) return i
      i += 1
    }
    // Numerical fallback: last legal action.
    var j = probs.length - 1
    while (j > 0 && probs(j) == 0.0) j -= 1
    j
  }
}
