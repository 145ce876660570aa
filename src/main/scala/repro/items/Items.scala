package repro.items

import java.util.SplittableRandom

/** Bitmask helpers for itemsets. Items are `0 until k` (k ≤ 20); an itemset
  * is an `Int` mask with bit `i` set iff item `i` is in the set.
  */
object Itemsets {
  def size(mask: Int): Int = Integer.bitCount(mask)

  def items(mask: Int): Seq[Int] =
    (0 until 32).filter(i => (mask & (1 << i)) != 0)

  def full(k: Int): Int = (1 << k) - 1

  /** All non-empty subsets of `mask`. */
  def nonEmptySubsets(mask: Int): Seq[Int] = {
    val out = scala.collection.mutable.ArrayBuffer.empty[Int]
    var s = mask
    while (s != 0) { out += s; s = (s - 1) & mask }
    out.toSeq
  }

  /** Format a mask as `{i1,i3}` (1-based, paper style). */
  def show(mask: Int): String =
    items(mask).map(i => s"i${i + 1}").mkString("{", ",", "}")
}

/** A valuation function `V : 2^I -> R` over item masks. Implementations
  * used in the paper's experiments are monotone and supermodular (the
  * learned Table-5 valuation is the documented exception, see DESIGN.md).
  */
trait Valuation extends Serializable {
  /** Number of items in the universe. */
  def k: Int
  /** Value of the itemset `mask`; `apply(0) == 0`. */
  def apply(mask: Int): Double
  /** Materialise as a dense table over all `2^k` masks. */
  final def toTable: Array[Double] = Array.tabulate(1 << k)(apply)
}

/** Valuation given explicitly for every one of the `2^k` masks. */
final case class TableValuation(values: Array[Double]) extends Valuation {
  require((values.length & (values.length - 1)) == 0, "table length must be 2^k")
  require(values(0) == 0.0, "V(empty) must be 0")
  val k: Int = Integer.numberOfTrailingZeros(values.length)
  def apply(mask: Int): Double = values(mask)
}

/** Additive (modular) valuation: `V(S) = sum of per-item values`. */
final case class AdditiveValuation(perItem: Array[Double]) extends Valuation {
  val k: Int = perItem.length
  def apply(mask: Int): Double = {
    var v = 0.0; var i = 0
    while (i < k) { if ((mask & (1 << i)) != 0) v += perItem(i); i += 1 }
    v
  }
}

/** Two-item supermodular valuation from Table 3: `V(i1)`, `V(i2)`,
  * `V({i1,i2})` with `V(both) >= V(i1)+V(i2)`.
  */
final case class TwoItemValuation(v1: Double, v2: Double, v12: Double) extends Valuation {
  val k: Int = 2
  def apply(mask: Int): Double = mask match {
    case 0 => 0.0
    case 1 => v1
    case 2 => v2
    case _ => v12
  }
}

/** "Cone" valuation of Configurations 8/9: supersets of the `core` item have
  * deterministic utility `5 + 2*(|S|-1)` (given unit prices), every other
  * set has negative utility. `V(S) = |S| + 5 + 2(|S|-1)` when core present,
  * 0 otherwise — monotone and supermodular (see DESIGN.md).
  */
final case class ConeValuation(k: Int, core: Int) extends Valuation {
  def apply(mask: Int): Double =
    if ((mask & (1 << core)) == 0) 0.0
    else {
      val s = Integer.bitCount(mask)
      s + 5.0 + 2.0 * (s - 1)
    }
}

object LevelWiseValuation {

  /** Configuration 10: a random monotone SUPERMODULAR valuation built
    * level-by-level in the itemset lattice.
    *
    * Reproduction note: the paper's Eq. (6) assigns the marginal of `i`
    * given `A\{i}` as the best lower-level marginal plus `eps ~ U[1,5]`
    * and then assembles `V(A)` with a max over last-item chains. That
    * assembly is NOT supermodular for all random draws (counterexamples
    * exist at k = 4; the max can make a later marginal smaller than an
    * earlier one). We therefore use the equivalent-in-spirit construction
    * documented in DESIGN.md: random NON-NEGATIVE interaction weights
    * `w(T)` on every lattice set `T` (level-wise: pairs draw the paper's
    * `eps ~ U[1,5]`, higher levels draw geometrically damped boosts) and
    * `V(S) = sum of w(T) over T ⊆ S`. Non-negative weights on |T| >= 2
    * make V supermodular; non-negative singleton weights make it
    * monotone; level-1 utilities still have the paper's mixed signs.
    */
  def build(k: Int, prices: Array[Double], seed: Long): TableValuation = {
    require(prices.length == k)
    val rng = new SplittableRandom(seed)
    val nMasks = 1 << k
    val w = new Array[Double](nMasks)

    // Level 1: a random ~half of the items get non-negative utility.
    // Values stay strictly positive so V remains monotone (§3.1).
    for (i <- 0 until k) {
      val positive = rng.nextBoolean()
      w(1 << i) =
        if (positive) prices(i) + rng.nextDouble() * 2.0
        else prices(i) * (0.05 + rng.nextDouble() * 0.85)
    }

    // Levels 2..k: pairs get eps ~ U[1,5] (the paper's boost); larger
    // sets get damped boosts so marginals grow roughly linearly per
    // level, like Eq. (6).
    for (mask <- 1 until nMasks) {
      val t = Integer.bitCount(mask)
      if (t >= 2) {
        val damp = math.pow(2.0, -(t - 2).toDouble)
        w(mask) = (1.0 + rng.nextDouble() * 4.0) * damp / math.max(1, t - 1)
      }
    }

    // V(S) = sum over subsets T of S of w(T), via sum-over-subsets DP.
    val v = w.clone()
    for (i <- 0 until k; mask <- 0 until nMasks if (mask & (1 << i)) != 0)
      v(mask) += v(mask & ~(1 << i))
    TableValuation(v)
  }
}

/** Per-item zero-mean Gaussian noise, additive across items (§3.1). */
final case class NoiseSpec(stds: Array[Double]) extends Serializable {
  def k: Int = stds.length

  /** One noise world: a draw of per-item noise terms. */
  def sample(rng: SplittableRandom): Array[Double] =
    stds.map(s => if (s == 0.0) 0.0 else rng.nextGaussian() * s)

  /** The zero noise world (deterministic utilities). */
  def zero: Array[Double] = new Array[Double](k)
}

object NoiseSpec {
  def uniform(k: Int, std: Double): NoiseSpec = NoiseSpec(Array.fill(k)(std))
  def none(k: Int): NoiseSpec = NoiseSpec(Array.fill(k)(0.0))
}

/** The full EPIC utility model `U(S) = V(S) - P(S) + N(S)` (Param in the
  * paper): supermodular valuation, additive price, additive zero-mean noise.
  */
final case class UtilityModel(valuation: Valuation, prices: Array[Double], noise: NoiseSpec)
    extends Serializable {
  require(prices.length == valuation.k && noise.k == valuation.k)
  def k: Int = valuation.k

  /** Utility table for a given noise world: `U(mask)` for every mask. */
  def utilityTable(noiseSample: Array[Double]): Array[Double] = {
    val nMasks = 1 << k
    val out = new Array[Double](nMasks)
    var mask = 0
    while (mask < nMasks) {
      var pn = 0.0
      var i = 0
      while (i < k) {
        if ((mask & (1 << i)) != 0) pn += noiseSample(i) - prices(i)
        i += 1
      }
      out(mask) = valuation(mask) + pn
      mask += 1
    }
    out
  }

  /** Deterministic utility `V(S) - P(S)` (noise ignored), as used by
    * bundle-disj and in the configuration tables.
    */
  def deterministicUtility: Array[Double] = utilityTable(noise.zero)

  /** Sample a noise world and return its utility table. */
  def sampleUtilityTable(rng: SplittableRandom): Array[Double] =
    utilityTable(noise.sample(rng))
}

/** Set-function property checks used by tests and configuration builders. */
object SetFunctions {
  /** True iff `f` (as a dense table over `2^k` masks) is supermodular:
    * `f(S+i) - f(S) <= f(T+i) - f(T)` for all `S ⊆ T`, `i ∉ T`.
    */
  def isSupermodular(f: Array[Double], tol: Double = 1e-9): Boolean = {
    val k = Integer.numberOfTrailingZeros(f.length)
    // Equivalent local criterion: for all masks S and i != j not in S:
    // f(S+i+j) - f(S+j) >= f(S+i) - f(S).
    var s = 0
    while (s < f.length) {
      var i = 0
      while (i < k) {
        if ((s & (1 << i)) == 0) {
          var j = i + 1
          while (j < k) {
            if ((s & (1 << j)) == 0) {
              val lhs = f(s | (1 << i) | (1 << j)) - f(s | (1 << j))
              val rhs = f(s | (1 << i)) - f(s)
              if (lhs < rhs - tol) return false
            }
            j += 1
          }
        }
        i += 1
      }
      s += 1
    }
    true
  }

  /** True iff `f` is monotone non-decreasing under set inclusion. */
  def isMonotone(f: Array[Double], tol: Double = 1e-9): Boolean = {
    val k = Integer.numberOfTrailingZeros(f.length)
    var s = 0
    while (s < f.length) {
      var i = 0
      while (i < k) {
        if ((s & (1 << i)) == 0 && f(s | (1 << i)) < f(s) - tol) return false
        i += 1
      }
      s += 1
    }
    true
  }
}
