package repro.util

/** Deterministic, key-addressed randomness.
  *
  * Every stochastic choice in the reproduction (tweet content, simulated
  * Local-EMD detection, synthetic embeddings) is a pure function of a tuple
  * of longs, hashed through splitmix64. This makes generators and simulators
  * deterministic in their seeds, independent of Spark partitioning or task
  * retries, so the DuckDB oracle and reference implementations see identical
  * data.
  */
object Rng {

  /** splitmix64 finalizer — a high-quality 64-bit mixer. */
  def mix(z0: Long): Long = {
    var z = z0 + 0x9e3779b97f4a7c15L
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }

  /** Hash a key tuple into a single 64-bit state. */
  def hash(parts: Long*): Long = {
    var h = 0x632be59bd9b4e019L
    parts.foreach(p => h = mix(h ^ p))
    h
  }

  /** U(0,1) from a key tuple; never exactly 1.0. */
  def unif(parts: Long*): Double =
    (hash(parts: _*) >>> 11).toDouble / (1L << 53).toDouble

  /** Standard Gaussian via Box–Muller from a key tuple. */
  def gaussian(parts: Long*): Double = {
    val h  = hash(parts: _*)
    val u1 = math.max(1e-12, (h >>> 11).toDouble / (1L << 53).toDouble)
    val u2 = (mix(h) >>> 11).toDouble / (1L << 53).toDouble
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Uniform integer in [0, n) from a key tuple. */
  def int(n: Int, parts: Long*): Int = {
    require(n > 0, s"Rng.int bound must be positive, got $n")
    (unif(parts: _*) * n).toInt.min(n - 1)
  }

  /** Zipf(alpha) rank in [1, n] drawn by inverse-CDF over precomputed weights. */
  final class Zipf(n: Int, alpha: Double) extends Serializable {
    require(n > 0)
    private val cdf: Array[Double] = {
      val w = Array.tabulate(n)(k => 1.0 / math.pow(k + 1.0, alpha))
      val s = w.sum
      val c = new Array[Double](n)
      var acc = 0.0
      var i = 0
      while (i < n) { acc += w(i) / s; c(i) = acc; i += 1 }
      c(n - 1) = 1.0
      c
    }
    /** Rank in [1, n] for a uniform draw u in [0,1). */
    def rank(u: Double): Int = {
      val i = java.util.Arrays.binarySearch(cdf, u)
      val idx = if (i >= 0) i else -i - 1
      math.min(idx, n - 1) + 1
    }
  }
}
