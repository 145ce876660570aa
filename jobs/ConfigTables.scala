package repro.jobs

import repro.core.Configs
import repro.exp.Experiments
import repro.items.Itemsets

/** Table 3: the six two-item configurations with their derived GAP
  * parameters (Eq. 5) — the derivation the paper uses to compare against
  * the Com-IC baselines.
  */
object Table3Configs {
  def main(args: Array[String]): Unit = {
    val rows = Configs.table3.map { c =>
      val m = c.model
      val gap = c.gap
      Seq[Any](
        c.no,
        s"P(i1)=${m.prices(0)} P(i2)=${m.prices(1)}",
        s"V(i1)=${m.valuation(1)} V(i2)=${m.valuation(2)} V(i1,i2)=${m.valuation(3)}",
        f"q(i1|0)=${gap.qA0}%.2f q(i2|0)=${gap.qB0}%.2f q(i1|i2)=${gap.qAB}%.2f q(i2|i1)=${gap.qBA}%.2f",
        if (c.uniformBudgets) "Uniform" else "Nonuniform",
      )
    }
    Experiments.printTable("Table 3: Two item configurations",
      Seq("No", "Price", "Value", "GAP (derived, Eq.5)", "Budget"), rows)
  }
}

/** Table 4: the multi-item configurations. */
object Table4Configs {
  def main(args: Array[String]): Unit = {
    val rows = Seq(
      Seq[Any](7, "Additive", "Uniform"),
      Seq[Any](8, "Cone-max", "Non-uniform"),
      Seq[Any](9, "Cone-min", "Non-uniform"),
      Seq[Any](10, "Level-wise", "Uniform"),
    )
    Experiments.printTable("Table 4: Multiple item configurations",
      Seq("No", "Value", "Budget"), rows)
  }
}

/** Table 5: learned real parameters of the PS4 bundle (values per itemset
  * with positive relevance, plus per-item noise mapping).
  */
object Table5RealParams {
  def main(args: Array[String]): Unit = {
    val cfg = Configs.realPs4
    val m = cfg.model
    val interesting = Seq(
      1, // {ps}
      3, // {ps, c}
      1 | (7 << 2), // {ps, g1, g2, g3}
      3 | (3 << 2), // {ps, g1, g2, c}
      3 | (7 << 2), // {ps, g1, g2, g3, c}
    )
    def names(mask: Int): String =
      Itemsets.items(mask).map(Configs.realItemNames).mkString("{", ",", "}")
    val rows = interesting.map { mask =>
      val price = Itemsets.items(mask).map(m.prices).sum
      val varSum = Itemsets.items(mask).map(i => m.noise.stds(i) * m.noise.stds(i)).sum
      Seq[Any](names(mask), price, m.valuation(mask), f"N(0, $varSum%.1f)",
        f"detU=${m.valuation(mask) - price}%.1f")
    }
    Experiments.printTable("Table 5: Learned parameters (PS4 bundle)",
      Seq("Itemset", "Price", "Value", "Noise", "Deterministic utility"), rows)
  }
}
