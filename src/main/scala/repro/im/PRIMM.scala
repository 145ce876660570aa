package repro.im

import org.apache.spark.sql.SparkSession

import repro.graph.SocialGraph

/** PRIMM — PRefix-preserving IMM (Algorithm 3) — and its single-budget
  * special case IMM [Tang et al. 2015].
  *
  * Given a budget vector sorted non-increasingly, PRIMM grows one shared
  * RR-set collection so that for EVERY budget `k` in the vector,
  * `|R| >= lambda*_k / OPT_k` w.h.p.; the final greedy `NodeSelection`
  * ordering is then simultaneously near-optimal on every prefix
  * (Definition 1). Sampling is generic over [[RRSampler]] so the Com-IC
  * baselines reuse the same engine.
  */
object PRIMM {

  /** `ln C(n,k)` computed stably as a sum of logs. */
  def logBinom(n: Int, k: Int): Double = {
    require(k >= 0 && k <= n, s"logBinom($n,$k)")
    var s = 0.0
    var j = 1
    while (j <= k) { s += math.log((n - k + j).toDouble / j); j += 1 }
    s
  }

  final case class Result(
      seeds: Array[Int],
      rrCount: Int,
      /** estimated spread of each prefix: `sigmaHat(j)` for `j+1` seeds */
      sigmaHat: Array[Double],
  )

  /** Run PRIMM.
    *
    * @param budgets  item budgets, MUST be sorted non-increasingly
    * @param eps      approximation slack (paper default 0.5)
    * @param ell      confidence exponent (paper default 1)
    * @param forbidden nodes excluded from selection (baseline support)
    */
  def run(spark: SparkSession, g: SocialGraph, budgets: Seq[Int],
          eps: Double = 0.5, ell: Double = 1.0, seed: Long = 7,
          sampler: Option[RRSampler] = None,
          forbidden: Set[Int] = Set.empty,
          maxRR: Int = Int.MaxValue): Result = {
    require(budgets.nonEmpty && budgets.forall(_ >= 1))
    require(budgets.zip(budgets.tail).forall { case (a, b) => a >= b },
      "budgets must be sorted non-increasingly")
    val n = g.n
    val bMax = budgets.head
    require(bMax <= n, s"budget $bMax exceeds node count $n")
    val rrSampler = sampler.getOrElse(new ICRRSampler(g))

    val lnN = math.log(n.toDouble)
    // line 2: ell <- ell + log 2 / log n ; line 3: ell' = log_n(n^ell * |b|)
    val ell2 = ell + math.log(2) / lnN
    val ellP = ell2 + math.log(budgets.length.toDouble) / lnN
    val epsP = math.sqrt(2) * eps

    val alpha = math.sqrt(ellP * lnN + math.log(2))
    def beta(k: Int): Double =
      math.sqrt((1 - 1 / math.E) * (logBinom(n, k) + ellP * lnN + math.log(2)))
    def lambdaStar(k: Int): Double =
      2 * n * math.pow((1 - 1 / math.E) * alpha + beta(k), 2) / (eps * eps)
    def lambdaPrime(k: Int): Double =
      (2 + 2 * epsP / 3) * (logBinom(n, k) + ellP * lnN + math.log(math.log(n.toDouble) / math.log(2))) * n / (epsP * epsP)

    val rr = new scala.collection.mutable.ArrayBuffer[Array[Int]]()
    def generateUntil(target: Double): Unit = {
      val capped = math.min(target, maxRR.toDouble)
      val need = math.ceil(capped).toLong - rr.length
      if (need > 0) rr ++= RRSets.generate(spark, rrSampler, need, seed, offset = rr.length.toLong)
    }

    var s = 0 // 0-based index into budgets
    var i = 1
    var lastLB = 1.0
    var lastSelection: MaxCover.CoverResult = null
    var budgetSwitch = false
    val maxI = (math.log(n.toDouble) / math.log(2)).toInt - 1

    while (i <= maxI && s < budgets.length) {
      val k = budgets(s)
      var LB = 1.0
      val x = n.toDouble / math.pow(2, i)
      generateUntil(lambdaPrime(k) / x)

      val (seedsK, covK) =
        if (budgetSwitch && lastSelection != null && lastSelection.seeds.length >= k) {
          val prefix = lastSelection.seeds.take(k)
          (prefix, MaxCover.coverage(rr, prefix))
        } else {
          lastSelection = MaxCover.nodeSelection(rr, k, n, forbidden)
          (lastSelection.seeds, lastSelection.covered(k))
        }
      val frac = covK.toDouble / rr.length
      if (n * frac >= (1 + epsP) * x) {
        LB = n * frac / (1 + epsP)
        generateUntil(lambdaStar(k) / LB)
        lastLB = LB
        s += 1
        budgetSwitch = true
      } else {
        i += 1
        budgetSwitch = false
      }
      // silence "unused" warnings while staying close to the pseudocode
      locally(seedsK); locally(LB)
    }

    if (s < budgets.length) {
      // line 22-25: fall back to LB = 1 for the current (largest remaining)
      // budget; lambda* is monotone in k so later budgets are subsumed.
      generateUntil(lambdaStar(budgets(s)) / 1.0)
    }
    locally(lastLB)

    val fin = MaxCover.nodeSelection(rr, bMax, n, forbidden)
    val sigmaHat = fin.coveredAfter.map(c => n.toDouble * c / rr.length)
    Result(fin.seeds, rr.length, sigmaHat)
  }

  /** Plain IMM: PRIMM with a single budget. */
  def imm(spark: SparkSession, g: SocialGraph, k: Int,
          eps: Double = 0.5, ell: Double = 1.0, seed: Long = 7,
          sampler: Option[RRSampler] = None,
          forbidden: Set[Int] = Set.empty,
          maxRR: Int = Int.MaxValue): Result =
    run(spark, g, Seq(k), eps, ell, seed, sampler, forbidden, maxRR)
}
