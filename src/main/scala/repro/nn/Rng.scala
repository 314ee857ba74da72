package repro.nn

/** Deterministic SplitMix64 RNG.
  *
  * Every stochastic component in the reproduction (weight init, minibatch
  * shuffling, reparameterization noise, LSH projections, synthetic data)
  * draws from an instance of this class seeded explicitly, so whole-pipeline
  * runs are bit-reproducible.
  */
final class Rng(seed: Long) {
  private var state: Long = seed

  /** Next raw 64-bit value (SplitMix64 step). */
  def nextLong(): Long = {
    state += 0x9E3779B97F4A7C15L
    var z = state
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** Uniform double in [0, 1). */
  def nextDouble(): Double = (nextLong() >>> 11) * 1.1102230246251565e-16

  /** Uniform int in [0, n). */
  def nextInt(n: Int): Int = {
    require(n > 0, s"nextInt bound must be positive, got $n")
    (nextDouble() * n).toInt.min(n - 1)
  }

  private var cachedGaussian: Double = Double.NaN

  /** Standard normal draw (Box–Muller, cached pair). */
  def nextGaussian(): Double = {
    if (!cachedGaussian.isNaN) { val g = cachedGaussian; cachedGaussian = Double.NaN; g }
    else {
      var u = 0.0
      while (u == 0.0) u = nextDouble()
      val v     = nextDouble()
      val r     = math.sqrt(-2.0 * math.log(u))
      val theta = 2.0 * math.Pi * v
      cachedGaussian = r * math.sin(theta)
      r * math.cos(theta)
    }
  }

  /** In-place Fisher–Yates shuffle of an index array. */
  def shuffle(xs: Array[Int]): Unit = {
    var i = xs.length - 1
    while (i > 0) {
      val j = nextInt(i + 1)
      val t = xs(i); xs(i) = xs(j); xs(j) = t
      i -= 1
    }
  }

  /** A child RNG with an independent stream derived from this one. */
  def split(): Rng = new Rng(nextLong())
}
