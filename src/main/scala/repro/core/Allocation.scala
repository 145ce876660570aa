package repro.core

import repro.items.Itemsets

/** A seed allocation `S ⊆ V × I` (§3.2), stored as node -> itemset mask. */
object Allocation {

  type Alloc = Map[Int, Int]

  val empty: Alloc = Map.empty

  /** Build an allocation from per-item seed lists.
    *
    * @param seedsPerItem `seedsPerItem(i)` = seed nodes of item `i`
    */
  def fromItemSeeds(seedsPerItem: Seq[Array[Int]]): Alloc = {
    val m = scala.collection.mutable.Map.empty[Int, Int]
    for ((seeds, i) <- seedsPerItem.zipWithIndex; v <- seeds)
      m(v) = m.getOrElse(v, 0) | (1 << i)
    m.toMap
  }

  /** Seed nodes of item `i` in the allocation. */
  def seedsOfItem(alloc: Alloc, i: Int): Set[Int] =
    alloc.collect { case (v, mask) if (mask & (1 << i)) != 0 => v }.toSet

  /** Check the budget constraint `|S_i| <= b_i` for every item. */
  def respectsBudgets(alloc: Alloc, budgets: Array[Int]): Boolean =
    budgets.indices.forall(i => seedsOfItem(alloc, i).size <= budgets(i))

  def describe(alloc: Alloc): String =
    alloc.toSeq.sortBy(_._1).map { case (v, m) => s"$v->${Itemsets.show(m)}" }.mkString(", ")
}
