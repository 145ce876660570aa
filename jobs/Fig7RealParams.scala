package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.exp.Experiments._

/** Fig. 7(a,b): real-parameter (PS4 bundle) welfare and running time of
  * greedyWM vs bundle-disj, total budget 100..500 split 30/30/20/10/10.
  * item-disj is omitted (its welfare is 0 by construction, as in §6.4.1).
  *
  * Usage: `Fig7RealParams [network]` (default Douban-Movie).
  */
object Fig7RealParams {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Fig7RealParams")
    val network = args.headOption.getOrElse("Douban-Movie")
    val g = Experiments.network(network)
    val cfg = Configs.realPs4
    val totals = sys.env.get("REPRO_BUDGET_POINTS").map(_.toInt) match {
      case Some(p) if p < 5 => Seq(100, 500).take(p.max(1))
      case _ => Seq(100, 200, 300, 400, 500)
    }
    val rows = for {
      total <- totals
      budgets = Configs.realSplit(total)
      algo <- Seq(AlgoGreedyWM, AlgoBundleDisj)
    } yield {
      val r = Experiments.run(algo, spark, g, cfg, budgets)
      Seq[Any](total, algo, r.welfare, r.adoptions, s"${r.millis} ms")
    }
    Experiments.printTable(s"Fig 7(a,b): real parameters on $network",
      Seq("total budget", "algorithm", "E[welfare]", "E[adoptions]", "time"), rows)
    spark.stop()
  }
}
