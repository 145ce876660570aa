package repro.items

import java.util.SplittableRandom

import org.scalatest.funsuite.AnyFunSuite

import repro.PropHelpers

class ValuationSpec extends AnyFunSuite with PropHelpers {

  test("AdditiveValuation sums per-item values and is modular") {
    val v = AdditiveValuation(Array(1.0, 2.0, 3.0))
    assert(v(0) == 0.0)
    assert(v(0b101) == 4.0)
    assert(v(0b111) == 6.0)
    val t = v.toTable
    assert(SetFunctions.isSupermodular(t))
    assert(SetFunctions.isMonotone(t))
  }

  test("TwoItemValuation matches Table 3 shapes and is supermodular") {
    val v = TwoItemValuation(1.7, 2.7, 8.0)
    assert(v(1) == 1.7 && v(2) == 2.7 && v(3) == 8.0 && v(0) == 0.0)
    assert(SetFunctions.isSupermodular(v.toTable))
    assert(SetFunctions.isMonotone(v.toTable))
  }

  test("TwoItemValuation with subadditive bundle is NOT supermodular") {
    val v = TwoItemValuation(3.0, 3.0, 4.0)
    assert(!SetFunctions.isSupermodular(v.toTable))
  }

  test("ConeValuation is monotone and supermodular for every core") {
    for (k <- 2 to 6; core <- 0 until k) {
      val t = ConeValuation(k, core).toTable
      assert(SetFunctions.isSupermodular(t), s"k=$k core=$core")
      assert(SetFunctions.isMonotone(t), s"k=$k core=$core")
    }
  }

  test("ConeValuation deterministic utility: 5 + 2(|S|-1) with core, negative without") {
    val k = 5; val core = 2
    val v = ConeValuation(k, core)
    val prices = Array.fill(k)(1.0)
    val m = UtilityModel(v, prices, NoiseSpec.none(k))
    val det = m.deterministicUtility
    for (mask <- 1 until (1 << k)) {
      val s = Integer.bitCount(mask)
      if ((mask & (1 << core)) != 0) assert(det(mask) == 5.0 + 2.0 * (s - 1), s"mask=$mask")
      else assert(det(mask) < 0, s"mask=$mask")
    }
  }

  test("TableValuation rejects non-power-of-two tables and nonzero V(empty)") {
    intercept[IllegalArgumentException](TableValuation(Array(0.0, 1.0, 2.0)))
    intercept[IllegalArgumentException](TableValuation(Array(1.0, 1.0)))
  }

  test("LevelWiseValuation (Config 10) is well-defined, monotone and supermodular across seeds") {
    forSeeds(25) { seed =>
      val rng = new SplittableRandom(seed)
      val k = 3 + rng.nextInt(4) // 3..6 items
      val prices = Array.fill(k)(1.0 + rng.nextDouble() * 4.0)
      val v = LevelWiseValuation.build(k, prices, rng.nextLong())
      assert(v(0) == 0.0)
      assert(SetFunctions.isMonotone(v.values), s"seed=$seed k=$k not monotone")
      assert(SetFunctions.isSupermodular(v.values), s"seed=$seed k=$k not supermodular")
    }
  }

  test("LevelWiseValuation level-1 utilities are mixed in sign (some non-negative exists eventually)") {
    var sawPositive = false
    var sawNegative = false
    forSeeds(20) { seed =>
      val prices = Array.fill(4)(3.0)
      val v = LevelWiseValuation.build(4, prices, seed)
      for (i <- 0 until 4) {
        val u = v(1 << i) - prices(i)
        if (u >= 0) sawPositive = true else sawNegative = true
      }
    }
    assert(sawPositive && sawNegative)
  }

  test("SetFunctions.isSupermodular detects a violation") {
    // f(S) = sqrt(|S|) is submodular, not supermodular
    val f = Array.tabulate(16)(m => math.sqrt(Integer.bitCount(m).toDouble))
    assert(!SetFunctions.isSupermodular(f))
  }

  test("SetFunctions.isMonotone detects a violation") {
    val f = Array(0.0, 1.0, 2.0, 1.5) // f({1,2}) < f({2})
    assert(!SetFunctions.isMonotone(f))
  }
}
