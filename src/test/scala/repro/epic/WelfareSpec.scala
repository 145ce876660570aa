package repro.epic

import org.scalatest.funsuite.AnyFunSuite
import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.graph.SocialGraph
import repro.items._

class WelfareSpec extends AnyFunSuite with SparkSpec {
  import Example1._

  test("MC estimate is exact on a deterministic instance (p=1, no noise)") {
    val est = Welfare.estimate(spark, g, greedyAlloc, model, runs = 8, seed = 3)
    assert(est.welfare == 15.0)
    assert(est.adoptions == 15.0)
    assert(est.perRunWelfare.forall(_ == 15.0))
  }

  test("MC estimate on the alternative allocation: welfare 11, adoptions 16") {
    val est = Welfare.estimate(spark, g, altAlloc, model, runs = 8, seed = 3)
    assert(est.welfare == 11.0 && est.adoptions == 16.0)
  }

  test("estimate is deterministic in the seed") {
    val chain = SocialGraph.fromEdges("chain", 3, Array((0, 1), (1, 2)))
    val m2 = UtilityModel(TwoItemValuation(2, 2, 5), Array(1.0, 1.0), NoiseSpec.uniform(2, 1.0))
    val e1 = Welfare.estimate(spark, chain, Map(0 -> 3), m2, runs = 16, seed = 11)
    val e2 = Welfare.estimate(spark, chain, Map(0 -> 3), m2, runs = 16, seed = 11)
    assert(e1.perRunWelfare.toSeq == e2.perRunWelfare.toSeq)
  }

  test("expected welfare on a single edge matches the closed form") {
    // one item, V=2, P=1 (U=1, no noise); edge prob 0.5:
    // E[welfare] = U(seed) + 0.5 * U = 1.5
    val g2 = SocialGraph.fromEdgesWithProb("e", 2, Array((0, 1, 0.5)))
    val m1 = UtilityModel(AdditiveValuation(Array(2.0)), Array(1.0), NoiseSpec.none(1))
    val est = Welfare.estimate(spark, g2, Map(0 -> 1), m1, runs = 4000, seed = 5)
    assert(math.abs(est.welfare - 1.5) < 0.05, s"got ${est.welfare}")
    assert(math.abs(est.adoptions - 1.5) < 0.05)
  }

  test("noise shifts realised welfare run-to-run but preserves the mean") {
    val g2 = SocialGraph.fromEdgesWithProb("e", 1, Array.empty[(Int, Int, Double)])
    val m1 = UtilityModel(AdditiveValuation(Array(5.0)), Array(1.0), NoiseSpec.uniform(1, 1.0))
    val est = Welfare.estimate(spark, g2, Map(0 -> 1), m1, runs = 4000, seed = 9)
    // seed adopts iff 4 + N >= 0 (virtually always); E[U] = 4.
    assert(math.abs(est.welfare - 4.0) < 0.1, s"got ${est.welfare}")
    assert(est.perRunWelfare.distinct.length > 100)
  }

  test("Oracle: per-run welfare aggregation matches DuckDB") {
    val df = Welfare.estimateDF(spark, g, greedyAlloc, model, runs = 10, seed = 4)
    val agg = df.agg(
      round(avg(col("welfare")), 4) as "avg_welfare",
      round(avg(col("adoptions")), 4) as "avg_adoptions",
      count(lit(1)) as "n_runs",
    )
    Oracle.assertEquivalent(
      agg,
      "SELECT round(avg(CAST(welfare AS DOUBLE)), 4) AS avg_welfare, " +
        "round(avg(CAST(adoptions AS DOUBLE)), 4) AS avg_adoptions, " +
        "count(*) AS n_runs FROM runs",
      "runs" -> df,
    )
  }

  test("zero-budget (empty) allocation has zero welfare") {
    val est = Welfare.estimate(spark, g, Map.empty, model, runs = 4, seed = 2)
    assert(est.welfare == 0.0 && est.adoptions == 0.0)
  }
}
