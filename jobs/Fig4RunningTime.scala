package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.exp.Experiments._

/** Fig. 4: running time of all five algorithms under Configuration 1, on
  * every network. Mirroring the paper, the Com-IC baselines are skipped on
  * the (stand-in) Twitter network where the originals timed out after 6h.
  *
  * Usage: `Fig4RunningTime [budget]` (default 50/50).
  */
object Fig4RunningTime {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Fig4RunningTime")
    val budget = args.headOption.map(_.toInt).getOrElse(50)
    val budgets = Configs.uniformTwoItem(budget)
    val cfg = Configs.config1
    val rows = for {
      name <- Experiments.networkNames
      algo <- twoItemAlgos
    } yield {
      val g = Experiments.network(name)
      if (name == "Twitter" && (algo == AlgoRRSimPlus || algo == AlgoRRCim))
        Seq[Any](name, algo, "timeout (paper: >6h)")
      else {
        val r = Experiments.run(algo, spark, g, cfg, budgets, runs = 1)
        Seq[Any](name, algo, s"${r.millis} ms")
      }
    }
    Experiments.printTable(s"Fig 4: running time, Configuration 1, budgets ${budgets.mkString("/")}",
      Seq("network", "algorithm", "allocation time"), rows)
    spark.stop()
  }
}
