package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.exp.Experiments._

/** Fig. 7(c) / Fig. 8(c): effect of budget skew. Total budget 500 over 10
  * items, split uniform / moderate skew / large skew; greedyWM's welfare
  * and running time under Configuration 7.
  *
  * Usage: `Fig8Skew [network]` (default Douban-Movie for 7(c) parity;
  * the appendix variant uses Twitter).
  */
object Fig8Skew {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Fig8Skew")
    val network = args.headOption.getOrElse("Douban-Movie")
    val g = Experiments.network(network)
    val cfg = Configs.config7(10)
    val rows = Configs.skewDistributions.map { case (name, budgets) =>
      val r = Experiments.run(AlgoGreedyWM, spark, g, cfg, budgets)
      Seq[Any](name, budgets.mkString(","), r.welfare, s"${r.millis} ms")
    }
    Experiments.printTable(s"Fig 8(c): budget skew on $network (Config 7, total 500)",
      Seq("distribution", "budgets", "E[welfare]", "greedyWM time"), rows)
    spark.stop()
  }
}
