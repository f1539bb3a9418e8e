package repro.core.model

import java.nio.ByteBuffer
import repro.core.Types.SeriesAgg

/** The linear Swing model type [Elmeleegy et al., PVLDB'09], extended to
  * groups (paper Section V): one linear function `v(t) = intercept + slope·t`
  * (t in sampling ticks from the segment start) represents every active
  * series, so a segment costs 64 bits regardless of its length.
  *
  * Group extension per the paper: the intercept is fitted PMC-Mean-style to
  * the first tick's values; each later value then *swings* the feasible slope
  * interval `[loSlope, hiSlope]` and the model fits while the interval is
  * non-empty. Reconstruction uses the float-rounded (slope, intercept), and
  * every accepted tick is validated against that rounded model, so
  * serialization can never break the error bound.
  */
object Swing extends ModelType {
  override val mid      = 2
  override val name     = "Swing"
  override val lossless = false

  /** Reconstructed value at `tick` — the single definition shared by the
    * fitter's validation, [[decode]] and [[aggregate]] so they agree bit-for-bit.
    */
  @inline def valueAt(slope: Float, intercept: Float, tick: Int): Float =
    (intercept.toDouble + slope.toDouble * tick).toFloat

  override def newFitter(nSeries: Int, epsilonPct: Double, lengthBound: Int): ModelFitter =
    new Fitter(nSeries, epsilonPct)

  private final class Fitter(nSeries: Int, epsilonPct: Double) extends ModelFitter {
    private var ticks     = 0
    private var intercept = 0.0f
    private var loSlope   = Double.NegativeInfinity
    private var hiSlope   = Double.PositiveInfinity
    // Stored float candidate revalidated only when it changes (O(1) amortized).
    private var slopeF    = 0.0f
    // Accepted per-tick feasible value intervals, for full revalidation.
    private val lowers = scala.collection.mutable.ArrayBuffer.empty[Double]
    private val uppers = scala.collection.mutable.ArrayBuffer.empty[Double]

    private def tickBounds(values: Array[Float]): (Double, Double) = {
      var lo = Double.NegativeInfinity; var hi = Double.PositiveInfinity
      var i = 0
      while (i < values.length) {
        val v   = values(i).toDouble
        val tol = ModelType.tolerance(v, epsilonPct)
        if (v - tol > lo) lo = v - tol
        if (v + tol < hi) hi = v + tol
        i += 1
      }
      (lo, hi)
    }

    override def append(values: Array[Float]): Boolean = {
      require(values.length == nSeries, s"expected $nSeries values, got ${values.length}")
      val (lo, hi) = tickBounds(values)
      if (lo > hi) return false
      if (ticks == 0) {
        var sum = 0.0; var i = 0
        while (i < values.length) { sum += values(i); i += 1 }
        val b = math.min(hi, math.max(lo, sum / values.length)).toFloat
        if (b.toDouble < lo || b.toDouble > hi) return false
        intercept = b; lowers += lo; uppers += hi; ticks = 1
        true
      } else {
        val k    = ticks.toDouble
        val nLo  = math.max(loSlope, (lo - intercept) / k)
        val nHi  = math.min(hiSlope, (hi - intercept) / k)
        if (nLo > nHi) return false
        val mid  = if (nLo.isInfinite && nHi.isInfinite) 0.0
                   else if (nLo.isInfinite) nHi else if (nHi.isInfinite) nLo
                   else (nLo + nHi) / 2
        val cand = mid.toFloat
        if (cand == slopeF) {
          // Unchanged stored model: only the new tick needs validation.
          val v = valueAt(cand, intercept, ticks).toDouble
          if (v < lo || v > hi) return false
        } else {
          // Stored slope moved: revalidate every accepted tick plus the new one.
          var j = 0
          while (j < ticks) {
            val v = valueAt(cand, intercept, j).toDouble
            if (v < lowers(j) || v > uppers(j)) return false
            j += 1
          }
          val v = valueAt(cand, intercept, ticks).toDouble
          if (v < lo || v > hi) return false
        }
        loSlope = nLo; hiSlope = nHi; slopeF = cand
        lowers += lo; uppers += hi; ticks += 1
        true
      }
    }

    override def length: Int = ticks
    override def bytes: Int  = 8

    override def serialize(): Array[Byte] = {
      require(ticks > 0, "cannot serialize an empty Swing model")
      ByteBuffer.allocate(8).putFloat(slopeF).putFloat(intercept).array()
    }
  }

  private def parts(params: Array[Byte]): (Float, Float) = {
    val bb = ByteBuffer.wrap(params)
    (bb.getFloat, bb.getFloat)
  }

  override def decode(params: Array[Byte], nSeries: Int, length: Int): Array[Float] = {
    val (a, b) = parts(params)
    val out    = new Array[Float](length * nSeries)
    var t = 0
    while (t < length) {
      val v = valueAt(a, b, t)
      var s = 0
      while (s < nSeries) { out(t * nSeries + s) = v; s += 1 }
      t += 1
    }
    out
  }

  override def aggregate(params: Array[Byte], nSeries: Int, length: Int,
                         fromTick: Int, toTick: Int): Array[SeriesAgg] = {
    require(fromTick >= 0 && toTick < length && fromTick <= toTick,
            s"bad tick range [$fromTick,$toTick] for length $length")
    val (a, b) = parts(params)
    val n      = (toTick - fromTick + 1).toLong
    // Closed-form sum of the exact line; endpoint min/max since it is monotone.
    // (Float rounding per tick is within the error bound by construction.)
    val sumT = (fromTick.toLong + toTick.toLong) * n / 2.0
    val sum  = b.toDouble * n + a.toDouble * sumT
    val v0   = valueAt(a, b, fromTick).toDouble
    val v1   = valueAt(a, b, toTick).toDouble
    Array.fill(nSeries)(SeriesAgg(n, sum, math.min(v0, v1), math.max(v0, v1)))
  }
}
