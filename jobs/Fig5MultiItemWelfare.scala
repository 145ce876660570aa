package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.exp.Experiments._

/** Fig. 5: expected welfare with more than two items (configurations
  * 7-10), total budget 500..1000.
  *
  * Usage: `Fig5MultiItemWelfare [network] [numItems]` (defaults:
  * Douban-Movie, 10 items).
  */
object Fig5MultiItemWelfare {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Fig5MultiItemWelfare")
    val network = args.headOption.getOrElse("Douban-Movie")
    val k = if (args.length > 1) args(1).toInt else 10
    val g = Experiments.network(network)

    for (no <- Seq(7, 8, 9, 10)) {
      val rows = for {
        total <- multiItemTotalGrid
        budgets = budgetsFor(no, k, total)
        cfg = configFor(no, k, budgets)
        algo <- multiItemAlgos
      } yield {
        val r = Experiments.run(algo, spark, g, cfg, budgets)
        Seq[Any](total, algo, r.welfare, r.adoptions)
      }
      Experiments.printTable(s"Fig 5: welfare on $network, ${configFor(no, k, budgetsFor(no, k, 500)).name}",
        Seq("total budget", "algorithm", "E[welfare]", "E[adoptions]"), rows)
    }
    spark.stop()
  }

  /** Configs 7/10: uniform split; configs 8/9: 20% max / 2% min split. */
  def budgetsFor(no: Int, k: Int, total: Int): Array[Int] =
    if (no == 7 || no == 10) Configs.uniformSplit(k, total)
    else Configs.skewedSplit(k, total)

  /** Config 8 cores the max-budget item (index 0 of the skewed split),
    * config 9 the min-budget item (index k-1).
    */
  def configFor(no: Int, k: Int, budgets: Array[Int]): Configs.Config = no match {
    case 7 => Configs.config7(k)
    case 8 => Configs.configCone(8, k, core = budgets.indexOf(budgets.max))
    case 9 => Configs.configCone(9, k, core = budgets.lastIndexOf(budgets.min))
    case 10 => Configs.config10(k)
    case other => sys.error(s"not a multi-item config: $other")
  }
}
