package repro.graph

/** Deterministic 64-bit mixing utilities shared by the partitioners.
  *
  * All hash-based partitioners in the paper (1D, 2D/Grid, DBH, Hybrid) and
  * the 2D-hash *initial distribution* of Distributed NE need a stateless,
  * well-mixed vertex hash. We use the splitmix64 finalizer, which is cheap,
  * has full avalanche, and is reproducible across JVMs (no
  * `Object.hashCode`).
  */
object Hashing {

  /** splitmix64 finalizer — full-avalanche 64-bit mix. */
  def mix64(x0: Long): Long = {
    var x = x0 + 0x9E3779B97F4A7C15L
    x = (x ^ (x >>> 30)) * 0xBF58476D1CE4E5B9L
    x = (x ^ (x >>> 27)) * 0x94D049BB133111EBL
    x ^ (x >>> 31)
  }

  /** Non-negative bucket of `x` in `[0, n)`. */
  def bucket(x: Long, n: Int, salt: Long = 0L): Int = {
    require(n > 0, s"bucket count must be positive, got $n")
    (java.lang.Long.remainderUnsigned(mix64(x ^ salt), n.toLong)).toInt
  }

  /** Per-element deterministic RNG seed (splittable by index). */
  def seedAt(seed: Long, index: Long): Long = mix64(seed ^ mix64(index))

  /** Uniform double in [0,1) derived from a 64-bit state. */
  def toUnitDouble(bits: Long): Double =
    (bits >>> 11) * (1.0 / (1L << 53))
}
