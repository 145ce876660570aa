package repro.im

import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec
import repro.graph.{GraphGen, SocialGraph}

class PRIMMSpec extends AnyFunSuite with SparkSpec {

  test("logBinom matches direct computation") {
    assert(math.abs(PRIMM.logBinom(10, 0)) < 1e-12)
    assert(math.abs(PRIMM.logBinom(10, 1) - math.log(10)) < 1e-9)
    assert(math.abs(PRIMM.logBinom(10, 3) - math.log(120)) < 1e-9)
    assert(math.abs(PRIMM.logBinom(52, 5) - math.log(2598960.0)) < 1e-6)
  }

  test("budgets must be sorted non-increasingly") {
    val g = GraphGen.uniformDirected("t", 20, 60, seed = 1)
    intercept[IllegalArgumentException](PRIMM.run(spark, g, Seq(1, 3)))
  }

  // --- deterministic (p = 1) graph: sigma is exact reachability --------

  /** 40-node graph, p = 1: three hubs with disjoint-ish audiences. */
  private def detGraph: SocialGraph = {
    val edges = scala.collection.mutable.ArrayBuffer.empty[(Int, Int, Double)]
    // hub 0 -> 1..12, hub 13 -> 14..22, hub 23 -> 24..29; chain 30..39
    (1 to 12).foreach(v => edges += ((0, v, 1.0)))
    (14 to 22).foreach(v => edges += ((13, v, 1.0)))
    (24 to 29).foreach(v => edges += ((23, v, 1.0)))
    (30 until 39).foreach(v => edges += ((v, v + 1, 1.0)))
    SocialGraph.fromEdgesWithProb("det", 40, edges.toArray)
  }

  private def reachSets(g: SocialGraph): Array[Set[Int]] =
    Array.tabulate(g.n) { v =>
      val seen = scala.collection.mutable.Set(v)
      val stack = scala.collection.mutable.Stack(v)
      while (stack.nonEmpty) {
        val u = stack.pop()
        (g.fwdOff(u) until g.fwdOff(u + 1)).map(g.fwdDst).foreach { w =>
          if (!seen.contains(w)) { seen += w; stack.push(w) }
        }
      }
      seen.toSet
    }

  private def sigma(reach: Array[Set[Int]], seeds: Seq[Int]): Int =
    seeds.foldLeft(Set.empty[Int])(_ ++ reach(_)).size

  private def bruteOpt(reach: Array[Set[Int]], n: Int, k: Int): Int =
    (0 until n).combinations(k).map(c => sigma(reach, c)).max

  test("IMM finds the optimal seed on a deterministic graph (k=1)") {
    val g = detGraph
    val reach = reachSets(g)
    val res = PRIMM.imm(spark, g, 1, eps = 0.3, seed = 2)
    assert(sigma(reach, res.seeds.take(1)) == bruteOpt(reach, g.n, 1))
    assert(res.seeds.head == 0) // hub 0 reaches 13 nodes
  }

  test("IMM top-3 on the deterministic graph picks the three hubs") {
    val g = detGraph
    val reach = reachSets(g)
    val res = PRIMM.imm(spark, g, 3, eps = 0.3, seed = 2)
    val opt = bruteOpt(reach, g.n, 3)
    assert(sigma(reach, res.seeds.take(3)) >= math.ceil((1 - 1.0 / math.E - 0.3) * opt))
    // hub 0 reaches 13 nodes, hub 13 and chain head 30 reach 10 each —
    // together they dominate hub 23's 7.
    assert(res.seeds.take(3).toSet == Set(0, 13, 30))
  }

  test("PRIMM prefix property: every budget prefix is near-optimal (deterministic graph)") {
    val g = detGraph
    val reach = reachSets(g)
    val budgets = Seq(5, 3, 1)
    val res = PRIMM.run(spark, g, budgets, eps = 0.3, seed = 4)
    assert(res.seeds.length == 5)
    for (k <- budgets) {
      val opt = bruteOpt(reach, g.n, k)
      val got = sigma(reach, res.seeds.take(k))
      assert(got >= (1 - 1.0 / math.E - 0.3) * opt,
        s"k=$k: got $got, opt $opt")
    }
  }

  test("PRIMM ordering is greedy-consistent: earlier prefixes are subsets of later ones") {
    val g = detGraph
    val res = PRIMM.run(spark, g, Seq(4, 2), eps = 0.3, seed = 5)
    // trivially true for an ordered list; check seeds are distinct
    assert(res.seeds.distinct.length == res.seeds.length)
  }

  test("sigmaHat estimates are non-decreasing and bounded by n") {
    val g = detGraph
    val res = PRIMM.imm(spark, g, 5, eps = 0.3, seed = 6)
    assert(res.sigmaHat.zip(res.sigmaHat.tail).forall { case (a, b) => b >= a - 1e-9 })
    assert(res.sigmaHat.forall(s => s >= 0 && s <= g.n))
  }

  test("sigmaHat approximates true sigma on the deterministic graph") {
    val g = detGraph
    val reach = reachSets(g)
    val res = PRIMM.imm(spark, g, 3, eps = 0.25, seed = 7)
    val est = res.sigmaHat(2)
    val act = sigma(reach, res.seeds.take(3))
    assert(math.abs(est - act) < 0.25 * act, s"est=$est act=$act")
  }

  test("IMM on a probabilistic graph beats random seeds") {
    val g = GraphGen.powerLawDirected("p", 400, 3000, seed = 11)
    val res = PRIMM.imm(spark, g, 5, eps = 0.5, seed = 12)
    // MC spread of chosen seeds vs 5 random nodes
    def mcSpread(seeds: Array[Int], runs: Int): Double = {
      val rng = new java.util.SplittableRandom(77)
      var total = 0L
      (0 until runs).foreach { _ =>
        val seen = scala.collection.mutable.Set(seeds.toSeq: _*)
        val stack = scala.collection.mutable.Stack(seeds.toSeq: _*)
        while (stack.nonEmpty) {
          val u = stack.pop()
          var e = g.fwdOff(u)
          while (e < g.fwdOff(u + 1)) {
            val v = g.fwdDst(e)
            if (!seen.contains(v) && rng.nextDouble() < g.fwdProb(e)) {
              seen += v; stack.push(v)
            }
            e += 1
          }
        }
        total += seen.size
      }
      total.toDouble / runs
    }
    val immSpread = mcSpread(res.seeds, 300)
    val rndSpread = mcSpread(Array(7, 77, 177, 277, 377), 300)
    assert(immSpread > rndSpread, s"imm=$immSpread rnd=$rndSpread")
  }

  test("PRIMM prefixes match dedicated IMM runs on a probabilistic graph") {
    val g = GraphGen.powerLawDirected("p", 400, 3000, seed = 13)
    val budgets = Seq(8, 4, 2)
    val primm = PRIMM.run(spark, g, budgets, eps = 0.5, seed = 14)
    def mcSpread(seeds: Array[Int], runs: Int): Double = {
      val rng = new java.util.SplittableRandom(88)
      var total = 0L
      (0 until runs).foreach { _ =>
        val seen = scala.collection.mutable.Set(seeds.toSeq: _*)
        val stack = scala.collection.mutable.Stack(seeds.toSeq: _*)
        while (stack.nonEmpty) {
          val u = stack.pop()
          var e = g.fwdOff(u)
          while (e < g.fwdOff(u + 1)) {
            val v = g.fwdDst(e)
            if (!seen.contains(v) && rng.nextDouble() < g.fwdProb(e)) { seen += v; stack.push(v) }
            e += 1
          }
        }
        total += seen.size
      }
      total.toDouble / runs
    }
    for (k <- budgets) {
      val prefixSpread = mcSpread(primm.seeds.take(k), 400)
      val directSpread = mcSpread(PRIMM.imm(spark, g, k, eps = 0.5, seed = 15).seeds, 400)
      assert(prefixSpread >= 0.8 * directSpread,
        s"k=$k: prefix spread $prefixSpread vs direct IMM $directSpread")
    }
  }

  test("forbidden nodes never appear in IMM output") {
    val g = detGraph
    val res = PRIMM.imm(spark, g, 3, eps = 0.3, seed = 8, forbidden = Set(0, 13))
    assert(!res.seeds.contains(0) && !res.seeds.contains(13))
    assert(res.seeds.contains(23))
  }

  test("maxRR caps the RR collection size") {
    val g = detGraph
    val res = PRIMM.imm(spark, g, 2, eps = 0.3, seed = 9, maxRR = 100)
    assert(res.rrCount <= 100)
  }

  test("duplicate budgets are accepted and still return the max-budget prefix") {
    val g = detGraph
    val reach = reachSets(g)
    val r1 = PRIMM.run(spark, g, Seq(3, 3, 1), eps = 0.3, seed = 10)
    assert(r1.seeds.length == 3)
    val opt = bruteOpt(reach, g.n, 3)
    assert(sigma(reach, r1.seeds.take(3)) >= (1 - 1.0 / math.E - 0.3) * opt)
  }
}
