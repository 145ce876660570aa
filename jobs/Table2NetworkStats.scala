package repro.jobs

import repro.exp.Experiments

/** Table 2: network statistics of the four stand-in networks. */
object Table2NetworkStats {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("Table2NetworkStats")
    val rows = Experiments.networkNames.map { name =>
      val g = Experiments.network(name)
      val edges = if (g.undirected) g.m / 2 else g.m
      Seq[Any](g.name, g.n, edges, f"${g.avgDegree}%.1f",
        if (g.undirected) "undirected" else "directed")
    }
    Experiments.printTable("Table 2: Network Statistics",
      Seq("network", "nodes", "edges", "avg_degree", "type"), rows)
    spark.stop()
  }
}
