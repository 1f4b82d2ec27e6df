package repro.core

import scala.util.hashing.MurmurHash3

/** The two hash functions of §3.1 / §3.4.
  *
  * `h` maps key values to integers and serves as the tuple identifier
  * stored in the sketch; the paper uses 32-bit MurmurHash3 (treated as
  * collision-free in the analysis, as in the original implementation).
  *
  * `hu` maps those integers uniformly to the unit interval [0, 1) and
  * drives sample selection (the n keys with smallest `hu` are kept);
  * the paper uses Fibonacci (golden-ratio multiplicative) hashing.
  */
object Hashing {

  /** 64-bit golden ratio 2^64/φ, the classic Fibonacci hashing multiplier. */
  private val GoldenGamma: Long = 0x9E3779B97F4A7C15L

  /** Key-identifier hash `h`: 32-bit MurmurHash3 of the key's string form. */
  def h(key: String): Int = MurmurHash3.stringHash(key)

  /** Unit-interval hash `hu`: Fibonacci hashing of h(k) into [0, 1).
    *
    * The 32-bit identifier is spread by the golden-ratio multiplier and a
    * finalizer-style xor-shift, then the top 53 bits become the mantissa of
    * a double in [0, 1). Deterministic in the identifier, so it never needs
    * to be stored alongside the sketch (Fig. 2 note in the paper).
    */
  def hu(keyHash: Int): Double = {
    var z = keyHash.toLong * GoldenGamma
    // xor-shift finalizer: plain multiplicative hashing keeps low-entropy
    // structure in the low bits for sequential inputs; mixing is required
    // for the "uniform on [0,1)" contract the estimators rely on.
    z ^= (z >>> 31)
    z *= 0xBF58476D1CE4E5B9L
    z ^= (z >>> 27)
    (z >>> 11).toDouble / (1L << 53).toDouble
  }

  /** Composition g = hu ∘ h used throughout the analysis (Theorem 1). */
  def g(key: String): Double = hu(h(key))
}
