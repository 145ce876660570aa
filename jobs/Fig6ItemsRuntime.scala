package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.exp.Experiments._

/** Fig. 6: running time vs number of items (Configuration 7, per-item
  * budget 50, s = 1..10) on the Twitter stand-in. greedyWM's time should
  * be flat in s; item-disj grows via one IMM at budget 50*s; bundle-disj
  * via s IMM calls at budget 50.
  *
  * Usage: `Fig6ItemsRuntime [network] [k]`.
  */
object Fig6ItemsRuntime {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Fig6ItemsRuntime")
    val network = args.headOption.getOrElse("Twitter")
    val k = if (args.length > 1) args(1).toInt else 50
    val g = Experiments.network(network)
    val sGrid = sys.env.get("REPRO_ITEM_COUNTS")
      .map(_.split(",").map(_.toInt).toSeq)
      .getOrElse(1 to 10)
    val rows = for {
      s <- sGrid
      budgets = Array.fill(s)(k)
      cfg = Configs.config7(s)
      algo <- multiItemAlgos
    } yield {
      val r = Experiments.run(algo, spark, g, cfg, budgets, runs = 1)
      Seq[Any](s, algo, s"${r.millis} ms")
    }
    Experiments.printTable(s"Fig 6: running time vs #items on $network (Config 7, k=$k)",
      Seq("#items", "algorithm", "allocation time"), rows)
    spark.stop()
  }
}
