package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Compact immutable social network used by the diffusion and IM engines.
  *
  * The graph is stored twice in CSR form: forward (out-edges, used by the
  * diffusion simulators) and reverse (in-edges, used by RR-set sampling).
  * Influence probabilities follow the weighted-cascade convention of the
  * paper (§6.1.3): `p(u,v) = 1 / d_in(v)`, unless explicit probabilities
  * are supplied.
  *
  * The whole structure is a value object of primitive arrays so it can be
  * broadcast to Spark executors cheaply (a few MB up to tens of MB for the
  * largest stand-in network).
  *
  * @param name       human-readable dataset name
  * @param n          number of nodes; node ids are `0 until n`
  * @param fwdOff     forward CSR offsets, length `n+1`
  * @param fwdDst     forward CSR targets, length `m`
  * @param fwdProb    probability of edge `u -> fwdDst(e)` (indexed like `fwdDst`)
  * @param revOff     reverse CSR offsets, length `n+1`
  * @param revSrc     reverse CSR sources, length `m`
  * @param revProb    probability of edge `revSrc(e) -> v` (indexed like `revSrc`)
  * @param undirected true when the dataset is undirected (edges stored both ways)
  */
final case class SocialGraph(
    name: String,
    n: Int,
    fwdOff: Array[Int],
    fwdDst: Array[Int],
    fwdProb: Array[Double],
    revOff: Array[Int],
    revSrc: Array[Int],
    revProb: Array[Double],
    undirected: Boolean,
) extends Serializable {

  /** Number of directed edges stored. */
  def m: Long = fwdDst.length.toLong

  /** Out-degree of node `u`. */
  def outDeg(u: Int): Int = fwdOff(u + 1) - fwdOff(u)

  /** In-degree of node `v`. */
  def inDeg(v: Int): Int = revOff(v + 1) - revOff(v)

  /** Average degree as reported in Table 2 (edges per node; an undirected
    * edge counts once, mirroring the paper's statistics).
    */
  def avgDegree: Double = {
    val e = if (undirected) m / 2.0 else m.toDouble
    e / n * (if (undirected) 2.0 else 1.0)
  }

  /** Edges as a DataFrame `(src, dst, p)` — the dataflow-facing view. */
  def edgesDF(spark: SparkSession): DataFrame = {
    import spark.implicits._
    val rows = for {
      u <- (0 until n).iterator
      e <- (fwdOff(u) until fwdOff(u + 1)).iterator
    } yield (u, fwdDst(e), fwdProb(e))
    spark.createDataset(rows.toSeq).toDF("src", "dst", "p")
  }

  /** Table-2 style statistics row computed with the DataFrame API. */
  def statsDF(spark: SparkSession): DataFrame = {
    val e = edgesDF(spark)
    val edgeCount = if (undirected) count(lit(1)) / 2 else count(lit(1))
    e.agg(
      lit(name) as "network",
      lit(n) as "nodes",
      edgeCount as "edges",
      round(count(lit(1)) / lit(if (undirected) n.toDouble else n.toDouble), 2) as "avg_degree",
      lit(if (undirected) "undirected" else "directed") as "type",
    )
  }
}

object SocialGraph {

  /** Build a graph from a list of directed edges with weighted-cascade
    * probabilities `p(u,v) = 1/d_in(v)`.
    *
    * @param undirected label only — callers generating undirected networks
    *                   must pass both edge directions themselves.
    */
  def fromEdges(name: String, n: Int, edges: Array[(Int, Int)], undirected: Boolean = false): SocialGraph = {
    edges.foreach { case (u, v) =>
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) outside [0,$n)")
    }
    val inDeg = new Array[Int](n)
    edges.foreach { case (_, v) => inDeg(v) += 1 }
    fromEdgesWithProb(name, n, edges.map { case (u, v) => (u, v, 1.0 / inDeg(v)) }, undirected)
  }

  /** Build a graph from explicit per-edge probabilities. */
  def fromEdgesWithProb(name: String, n: Int, edges: Array[(Int, Int, Double)], undirected: Boolean = false): SocialGraph = {
    val m = edges.length
    val outDeg = new Array[Int](n)
    val inDeg = new Array[Int](n)
    edges.foreach { case (u, v, _) =>
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) outside [0,$n)")
      outDeg(u) += 1; inDeg(v) += 1
    }
    val fwdOff = new Array[Int](n + 1)
    val revOff = new Array[Int](n + 1)
    var i = 0
    while (i < n) {
      fwdOff(i + 1) = fwdOff(i) + outDeg(i)
      revOff(i + 1) = revOff(i) + inDeg(i)
      i += 1
    }
    val fwdDst = new Array[Int](m); val fwdProb = new Array[Double](m)
    val revSrc = new Array[Int](m); val revProb = new Array[Double](m)
    val fCur = java.util.Arrays.copyOf(fwdOff, n)
    val rCur = java.util.Arrays.copyOf(revOff, n)
    edges.foreach { case (u, v, p) =>
      fwdDst(fCur(u)) = v; fwdProb(fCur(u)) = p; fCur(u) += 1
      revSrc(rCur(v)) = u; revProb(rCur(v)) = p; rCur(v) += 1
    }
    SocialGraph(name, n, fwdOff, fwdDst, fwdProb, revOff, revSrc, revProb, undirected)
  }

  /** Build from a DataFrame of `(src, dst)` edges (weighted cascade). */
  def fromDF(name: String, n: Int, edges: DataFrame, undirected: Boolean = false): SocialGraph = {
    val arr = edges
      .select(col("src").cast("int"), col("dst").cast("int"))
      .collect()
      .map(r => (r.getInt(0), r.getInt(1)))
    fromEdges(name, n, arr, undirected)
  }
}
