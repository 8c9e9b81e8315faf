package repro.core

/** Gaussian kernel density estimator — the learned "feature distribution" of §5.
  *
  * Fit with Silverman's rule-of-thumb bandwidth over the (possibly subsampled)
  * training values, then evaluated on a fixed grid so that scoring is O(1) per
  * lookup (the exact sum-of-kernels form is kept as [[pdfExact]] for testing).
  *
  * [[likelihood]] is the density normalized by the maximum density over the
  * grid, giving a *relative* likelihood in (0, 1]. This matches the paper's §6
  * worked example, where feature "scores" are probabilities like 0.37, and
  * makes the `1 − x` application objective function (§5.3) well defined.
  *
  * Instances are immutable and serializable, so a map of fitted KDEs can be
  * broadcast to Spark executors and referenced from scoring UDFs.
  */
final case class Kde(
    samples: Array[Double],
    bandwidth: Double,
    gridLo: Double,
    gridStep: Double,
    gridDensity: Array[Double],
    maxDensity: Double,
) extends Serializable {

  /** Exact sum-of-Gaussians density at x (reference implementation). */
  def pdfExact(x: Double): Double = {
    val h = bandwidth
    var s = 0.0
    var i = 0
    while (i < samples.length) {
      val z = (x - samples(i)) / h
      s += math.exp(-0.5 * z * z)
      i += 1
    }
    s / (samples.length * h * math.sqrt(2.0 * math.Pi))
  }

  /** Grid-interpolated density at x; 0 outside the (±4 bandwidth padded) grid. */
  def pdf(x: Double): Double = {
    val pos = (x - gridLo) / gridStep
    if (pos < 0.0 || pos > gridDensity.length - 1) 0.0
    else {
      val i = math.min(gridDensity.length - 2, pos.toInt)
      val frac = pos - i
      gridDensity(i) * (1.0 - frac) + gridDensity(i + 1) * frac
    }
  }

  /** Max-normalized relative likelihood in [0, 1]. */
  def likelihood(x: Double): Double = math.min(1.0, pdf(x) / maxDensity)
}

object Kde {
  val DefaultGridSize   = 512
  val DefaultMaxSamples = 2000

  /** Robust Silverman rule-of-thumb bandwidth: 1.06 · min(σ, IQR/1.34) ·
    * n^(−1/5), floored so constant data stays usable. The IQR term keeps the
    * bandwidth sane when the training labels contain outliers (e.g. centroid
    * jumps from occasionally merged tracks) — which is exactly the "noisy
    * existing labels" regime the paper learns from.
    */
  def silvermanBandwidth(values: Seq[Double]): Double = {
    val n = values.length
    require(n > 0, "cannot compute a bandwidth over no values")
    val mean = values.sum / n
    val variance = values.map(v => (v - mean) * (v - mean)).sum / n
    val sigma = math.sqrt(variance)
    val sorted = values.sorted
    val iqr = sorted((0.75 * (n - 1)).toInt) - sorted((0.25 * (n - 1)).toInt)
    val spread = if (iqr > 0) math.min(sigma, iqr / 1.34) else sigma
    val scale = math.max(math.abs(mean), 1.0)
    math.max(1.06 * spread * math.pow(n.toDouble, -0.2), 1e-3 * scale)
  }

  /** Fit a KDE over `values`, deterministically subsampling above `maxSamples`. */
  def fit(
      values: Seq[Double],
      maxSamples: Int = DefaultMaxSamples,
      gridSize: Int = DefaultGridSize,
  ): Kde = {
    require(values.nonEmpty, "cannot fit a KDE over no values")
    require(gridSize >= 2, s"gridSize must be >= 2, got $gridSize")
    // Deterministic stride subsample over the sorted values preserves the
    // empirical distribution's shape without an RNG (reproducible fits).
    val sorted = values.sorted
    val kept =
      if (sorted.length <= maxSamples) sorted.toArray
      else {
        val stride = sorted.length.toDouble / maxSamples
        Array.tabulate(maxSamples)(i => sorted(math.min(sorted.length - 1, (i * stride).toInt)))
      }
    val h = silvermanBandwidth(kept.toIndexedSeq)
    val lo = kept.head - 4.0 * h
    val hi = kept.last + 4.0 * h
    val step = (hi - lo) / (gridSize - 1)
    val proto = Kde(kept, h, lo, step, Array.emptyDoubleArray, 1.0)
    val grid = Array.tabulate(gridSize)(i => proto.pdfExact(lo + i * step))
    val maxD = grid.max
    Kde(kept, h, lo, step, grid, if (maxD > 0) maxD else 1.0)
  }
}
