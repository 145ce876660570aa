package repro.comic

import java.util.SplittableRandom

import org.scalatest.funsuite.AnyFunSuite

import repro.{PropHelpers, SparkSpec}
import repro.core.Configs
import repro.graph.{GraphGen, SocialGraph}
import repro.im.PRIMM

class ComicBaselinesSpec extends AnyFunSuite with SparkSpec with PropHelpers {

  private lazy val g = GraphGen.powerLawDirected("t", 300, 2400, seed = 21)

  test("forwardSpread with q=1 and p=1 floods reachable nodes") {
    val chain = SocialGraph.fromEdgesWithProb("c", 4, Array((0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0)))
    val adopted = ComicBaselines.forwardSpread(chain, w = 5, seeds = Array(0),
      qSelf = 1.0, qBoost = 1.0, boosted = _ => false, salt = 13)
    assert(adopted.forall(identity))
  }

  test("forwardSpread with q=0 adopts nothing") {
    val chain = SocialGraph.fromEdgesWithProb("c", 3, Array((0, 1, 1.0), (1, 2, 1.0)))
    val adopted = ComicBaselines.forwardSpread(chain, w = 5, seeds = Array(0),
      qSelf = 0.0, qBoost = 0.0, boosted = _ => false, salt = 13)
    assert(!adopted.exists(identity))
  }

  test("reverseAdoptingSet with passing predicate equals the RR ancestor set") {
    val chain = SocialGraph.fromEdgesWithProb("c", 4, Array((0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0)))
    val rr = ComicBaselines.reverseAdoptingSet(chain, w = 5, root = 3, adopts = _ => true)
    assert(rr.toSet == Set(0, 1, 2, 3))
  }

  test("reverseAdoptingSet is empty when the root fails the predicate") {
    val chain = SocialGraph.fromEdgesWithProb("c", 2, Array((0, 1, 1.0)))
    val rr = ComicBaselines.reverseAdoptingSet(chain, w = 5, root = 1, adopts = _ != 1)
    assert(rr.isEmpty)
  }

  test("RRSimSampler yields non-empty sets at boosted rates under strong complementarity") {
    val gap = Configs.config1.gap // qA0 ~ 0.1, qAB ~ 0.99
    val seedsB = PRIMM.imm(spark, g, 10, eps = 0.5, seed = 1).seeds
    val sampler = new ComicBaselines.RRSimSampler(g, seedsB, gap)
    val rng = new SplittableRandom(4)
    val sets = (0 until 800).map(_ => sampler.sample(rng))
    val nonEmpty = sets.count(_.nonEmpty)
    // baseline alone would give ~ qA0 = 10%; boosting must lift it
    assert(nonEmpty > 80, s"nonEmpty=$nonEmpty of 800")
  }

  test("rrSimPlus respects budgets and returns distinct seeds") {
    val gap = Configs.config1.gap
    val (sA, sB) = ComicBaselines.rrSimPlus(spark, g, budgetA = 5, budgetB = 5, gap,
      eps = 0.5, seed = 3, maxRR = 5000)
    assert(sA.length == 5 && sB.length == 5)
    assert(sA.distinct.length == 5 && sB.distinct.length == 5)
  }

  test("rrCim respects budgets and returns distinct seeds") {
    val gap = Configs.config1.gap
    val (sA, sB) = ComicBaselines.rrCim(spark, g, budgetA = 5, budgetB = 5, gap,
      eps = 0.5, seed = 3, maxRR = 5000)
    assert(sA.length == 5 && sB.length == 5)
    assert(sB.distinct.length == 5)
  }

  test("under strong complementarity RR-SIM+ seeds overlap heavily with IMM top spreaders") {
    val gap = Configs.config1.gap
    val imm = PRIMM.imm(spark, g, 20, eps = 0.5, seed = 5).seeds.toSet
    val (sA, _) = ComicBaselines.rrSimPlus(spark, g, budgetA = 10, budgetB = 10, gap,
      eps = 0.5, seed = 5, maxRR = 20000)
    val overlap = sA.count(imm.contains)
    assert(overlap >= 5, s"only $overlap of 10 RR-SIM+ seeds among IMM top-20")
  }
}
