package repro.util

/** Deterministic, allocation-free hashing RNG helpers.
  *
  * All synthetic data in this reproduction is a pure function of
  * (sample key, seed) via splitmix64, so generators can be re-evaluated on
  * any machine / any thread count and produce identical datasets — a
  * requirement for the DuckDB oracle and for replaying experiments.
  */
object Rng {

  /** splitmix64 finalizer: high-quality 64-bit mix of the input. */
  def mix(x0: Long): Long = {
    var x = x0 + 0x9E3779B97F4A7C15L
    x = (x ^ (x >>> 30)) * 0xBF58476D1CE4E5B9L
    x = (x ^ (x >>> 27)) * 0x94D049BB133111EBL
    x ^ (x >>> 31)
  }

  /** Combine two 64-bit values into one stream position. */
  def mix2(a: Long, b: Long): Long = mix(mix(a) ^ b)

  /** Uniform double in [0, 1) from a stream position. */
  def uniform(state: Long): Double =
    (mix(state) >>> 11).toDouble * (1.0 / (1L << 53).toDouble)

  /** Standard normal draw from a stream position (Box–Muller, first leg). */
  def gaussian(state: Long): Double = {
    val u1 = math.max(uniform(state), 1e-12)
    val u2 = uniform(state + 0x632BE59BD9B4E019L)
    math.sqrt(-2.0 * math.log(u1)) * math.cos(2.0 * math.Pi * u2)
  }

  /** Uniform int in [0, n). */
  def int(state: Long, n: Int): Int = {
    require(n > 0, "n must be positive")
    ((mix(state) >>> 1) % n).toInt
  }
}
