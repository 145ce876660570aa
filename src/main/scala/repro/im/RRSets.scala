package repro.im

import java.util.SplittableRandom

import org.apache.spark.sql.SparkSession

import repro.graph.SocialGraph

/** A reverse-reachable set sampler. Implementations: plain IC (weighted
  * cascade) for IMM/PRIMM, and the Com-IC flavoured samplers used by the
  * RR-SIM+/RR-CIM baselines.
  */
trait RRSampler extends Serializable {
  /** Sample one RR set. `rng` is pre-seeded per sample id, so sampling is
    * deterministic and order-independent across Spark partitions.
    */
  def sample(rng: SplittableRandom): Array[Int]
}

/** Borgs et al. RR sets under the IC model: pick a uniform root `v`, then
  * reverse-BFS where each in-edge `(u,w)` is live independently with
  * probability `p(u,w)`.
  */
final class ICRRSampler(g: SocialGraph) extends RRSampler {
  def sample(rng: SplittableRandom): Array[Int] = {
    val root = rng.nextInt(g.n)
    val visited = new java.util.HashSet[Int]()
    val queue = new java.util.ArrayDeque[Int]()
    visited.add(root); queue.add(root)
    val out = new scala.collection.mutable.ArrayBuffer[Int]()
    out += root
    while (!queue.isEmpty) {
      val w = queue.poll()
      var e = g.revOff(w)
      val end = g.revOff(w + 1)
      while (e < end) {
        val u = g.revSrc(e)
        if (!visited.contains(u) && rng.nextDouble() < g.revProb(e)) {
          visited.add(u); queue.add(u); out += u
        }
        e += 1
      }
    }
    out.toArray
  }
}

/** Spark-parallel batch generation of RR sets with per-sample seeds. */
object RRSets {

  def mix(seed: Long, i: Long): Long = {
    var z = seed + i * 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z ^ (z >>> 31)
  }

  /** Generate RR sets with global sample ids `[offset, offset+count)`. */
  def generate(spark: SparkSession, sampler: RRSampler, count: Long,
               seed: Long, offset: Long): Array[Array[Int]] = {
    if (count <= 0) return Array.empty
    val sc = spark.sparkContext
    val bSampler = sc.broadcast(sampler)
    val parts = math.max(1, math.min(count, sc.defaultParallelism * 4L)).toInt
    val out = sc
      .range(offset, offset + count, numSlices = parts)
      .map(i => bSampler.value.sample(new SplittableRandom(mix(seed, i))))
      .collect()
    bSampler.destroy()
    out
  }
}
