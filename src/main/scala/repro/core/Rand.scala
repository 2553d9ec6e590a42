package repro.core

import scala.util.Random

/** Seed hygiene for derived RNGs.
  *
  * `java.util.Random` instances built from *sequential* seeds produce
  * strongly correlated first draws (the LCG scrambler only perturbs the low
  * bits), which silently biases anything that derives one RNG per row/walk
  * from `baseSeed + id`. Every derived seed in this codebase goes through
  * the splitmix64 finalizer first.
  */
object Rand {

  /** splitmix64 finalizer — a bijective avalanche mix. */
  def mix64(z0: Long): Long = {
    var z = z0 + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }

  /** A Random whose stream is decorrelated from nearby seeds. */
  def of(seed: Long): Random = new Random(mix64(seed))

  def of(seed: Long, id: Long): Random = new Random(mix64(mix64(seed) ^ id))

  def of(seed: Long, id: Long, sub: Long): Random =
    new Random(mix64(mix64(mix64(seed) ^ id) ^ sub))
}
