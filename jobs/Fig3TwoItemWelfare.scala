package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.exp.Experiments._

/** Fig. 3 (and Fig. 8a/8b): expected social welfare of all five algorithms
  * on the two-item configurations.
  *
  * Usage: `Fig3TwoItemWelfare [network] [configNo ...]`
  * Defaults: Douban-Movie, configs 2 3 5 6 (the ones shown in Fig. 3).
  */
object Fig3TwoItemWelfare {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Fig3TwoItemWelfare")
    val network = args.headOption.getOrElse("Douban-Movie")
    val configNos = if (args.length > 1) args.tail.map(_.toInt).toSeq else Seq(2, 3, 5, 6)
    val g = Experiments.network(network)
    for (no <- configNos) {
      val cfg = Configs.table3(no - 1)
      val rows = for {
        budgets <- twoItemBudgetGrid(cfg.uniformBudgets)
        algo <- twoItemAlgos
      } yield {
        val r = Experiments.run(algo, spark, g, cfg, budgets)
        Seq[Any](budgets.mkString("/"), algo, r.welfare, r.adoptions)
      }
      Experiments.printTable(s"Fig 3: welfare on $network, ${cfg.name}",
        Seq("budgets b1/b2", "algorithm", "E[welfare]", "E[adoptions]"), rows)
    }
    spark.stop()
  }
}
