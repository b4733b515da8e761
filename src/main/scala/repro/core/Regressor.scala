package repro.core

/** A fitted model for one partition: `predict(i) = floor(theta0 + theta1 * i)`
  * where `i` is the position *within* the partition.
  *
  * Encoding stores `delta(i) = v(i) - predict(i)` biased to be non-negative
  * (the minimum delta is folded into `theta0`, see [[Regressor.fitLinear]]),
  * so the packed width is `bitsFor(deltaMax - deltaMin)` — identical to the
  * paper's θ0-tweak, which centers deltas so that
  * φ = ⌈log2 L⌉ with L = |δmax| + |δmin|.
  */
final case class LinearModel(theta0: Double, theta1: Double) {
  def predict(i: Int): Long = math.floor(theta0 + theta1 * i).toLong
}

/** Result of fitting one partition: the (bias-folded) model and the width of
  * the resulting non-negative delta array.
  */
final case class Fit(model: LinearModel, bitWidth: Int)

/** The LeCo Regressor (§3.1): least-squares linear fit with the θ0 tweak.
  *
  * The classic LSM minimizes the l2 norm of the deltas; LeCo's objective is
  * the *bit width* of the max absolute delta (deltas are stored fixed-width).
  * Shifting the intercept only moves the delta window, so after LSM we fold
  * the minimum delta into θ0, making all deltas non-negative with range
  * `L = δmax − δmin`; the packed width `bitsFor(L)` then equals the paper's
  * minimized φ for this slope.
  */
object Regressor {

  /** Least-squares slope/intercept over positions `0..n-1` of
    * `values(from until until)`, then fold the min delta into θ0.
    */
  def fitLinear(values: Array[Long], from: Int, until: Int): Fit = {
    val n = until - from
    require(n >= 1, "empty partition")
    if (n == 1) return Fit(LinearModel(values(from).toDouble, 0.0), 0)
    // LSM closed form; positions are 0..n-1 so the sums are analytic.
    val sumX  = n.toDouble * (n - 1) / 2.0
    val sumXX = (n - 1).toDouble * n * (2L * n - 1) / 6.0
    var sumY  = 0.0
    var sumXY = 0.0
    var i = 0
    while (i < n) {
      val y = values(from + i).toDouble
      sumY += y; sumXY += i * y
      i += 1
    }
    val denom  = n * sumXX - sumX * sumX
    val theta1 = if (denom == 0) 0.0 else (n * sumXY - sumX * sumY) / denom
    val theta0 = (sumY - theta1 * sumX) / n
    refit(LinearModel(theta0, theta1), values, from, until)
  }

  /** Exact frame min/max (FOR must NOT round the reference through a Double:
    * values above 2^53 would corrupt the offsets).
    */
  def minMax(values: Array[Long], from: Int, until: Int): (Long, Long) = {
    var mn = Long.MaxValue; var mx = Long.MinValue
    var i = from
    while (i < until) { val v = values(i); if (v < mn) mn = v; if (v > mx) mx = v; i += 1 }
    (mn, mx)
  }

  /** The FOR model: a horizontal line at the frame minimum (§2). NOTE the
    * Double θ0 is only the *model view*; FOR encoders must take the exact
    * reference from [[minMax]].
    */
  def fitConstant(values: Array[Long], from: Int, until: Int): Fit = {
    val (mn, mx) = minMax(values, from, until)
    Fit(LinearModel(mn.toDouble, 0.0), BitPack.bitsFor(mx - mn))
  }

  /** Given a candidate model, fold the min delta into θ0 and report the
    * resulting non-negative delta width. Folding an *integer* shift keeps
    * `floor` exact: floor(x + k) = floor(x) + k for integer k.
    */
  def refit(m: LinearModel, values: Array[Long], from: Int, until: Int): Fit = {
    var dMin = Long.MaxValue; var dMax = Long.MinValue
    var i = from
    while (i < until) {
      val d = values(i) - m.predict(i - from)
      if (d < dMin) dMin = d
      if (d > dMax) dMax = d
      i += 1
    }
    Fit(LinearModel(m.theta0 + dMin, m.theta1), BitPack.bitsFor(dMax - dMin))
  }

  /** Exact delta width a linear fit would need on `values(from until until)` —
    * the Δ(v) function of §3.2.2, used by partitioners and tests.
    */
  def linearDeltaBits(values: Array[Long], from: Int, until: Int): Int =
    fitLinear(values, from, until).bitWidth
}
