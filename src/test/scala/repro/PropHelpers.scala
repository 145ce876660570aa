package repro

import java.util.SplittableRandom

/** Tiny deterministic property-test helper (the offline cache has no
  * scalatest/scalacheck bridge, so suites drive scalacheck-style sweeps by
  * hand with seeded RNGs).
  */
trait PropHelpers {
  /** Run `f` over `n` deterministic seeds. */
  def forSeeds(n: Int, base: Long = 12345L)(f: Long => Unit): Unit =
    (0 until n).foreach(i => f(base + i * 7919L))

  /** Run `f` over `n` random ints in [lo, hi]. */
  def forRandomInts(n: Int, lo: Int, hi: Int, seed: Long = 999L)(f: Int => Unit): Unit = {
    val rng = new SplittableRandom(seed)
    (0 until n).foreach(_ => f(lo + rng.nextInt(hi - lo + 1)))
  }
}
