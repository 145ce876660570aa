package repro.epic

import java.util.SplittableRandom

import repro.graph.SocialGraph
import repro.items.Adoption

/** Deterministic EPIC diffusion in one possible world (Fig. 2 / §4.1).
  *
  * A possible world `W = (W^E, W^N)` fixes the edge coin flips and the
  * noise terms; `util` is the utility table of the noise world. Edge coins
  * are flipped lazily, at most once per edge (the model's "tested once,
  * status remembered"), either from a live RNG or from a deterministic
  * hash of `(worldSeed, src, dst)` so the same edge world can be replayed
  * by the GraphX Pregel implementation.
  *
  * The propagation loop is push-on-change: a node whose adoption set grew
  * at step `t-1` pushes its adoption mask along its (live) out-edges at
  * step `t`; receivers union desires and re-run the adoption rule.
  */
object EpicSimulator {

  /** splitmix64 finaliser — stateless uniform hash to [0,1). */
  def hash01(seed: Long, a: Long, b: Long): Double = {
    var z = seed ^ (a * 0x9E3779B97F4A7C15L) ^ (b * 0xC2B2AE3D27D4EB4FL)
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^= (z >>> 31)
    (z >>> 11).toDouble / (1L << 53).toDouble
  }

  /** Is the edge `src -> dst` live in the edge world `worldSeed`?
    * Shared coupling between the local simulator and the Pregel one.
    */
  def edgeLive(g: SocialGraph, worldSeed: Long)(edgeIdx: Int, src: Int): Boolean =
    hash01(worldSeed, src.toLong, g.fwdDst(edgeIdx).toLong) < g.fwdProb(edgeIdx)

  /** Diffuse with a live RNG deciding edge coins (fresh edge world). */
  def diffuse(g: SocialGraph, alloc: Map[Int, Int], util: Array[Double],
              rng: SplittableRandom): Array[Int] =
    run(g, alloc, util, (e, _) => rng.nextDouble() < g.fwdProb(e))

  /** Diffuse in the hash-determined edge world `worldSeed` (replayable). */
  def diffuseFixedWorld(g: SocialGraph, alloc: Map[Int, Int], util: Array[Double],
                        worldSeed: Long): Array[Int] =
    run(g, alloc, util, edgeLive(g, worldSeed))

  private def run(g: SocialGraph, alloc: Map[Int, Int], util: Array[Double],
                  testEdge: (Int, Int) => Boolean): Array[Int] = {
    val n = g.n
    val desire = new Array[Int](n)
    val adoption = new Array[Int](n)
    val edgeState = new Array[Byte](g.fwdDst.length) // 0 untested, 1 live, 2 blocked

    var frontier = new scala.collection.mutable.ArrayBuffer[Int]()
    // t = 1: seeds desire their allocation and adopt the best subset.
    for ((v, mask) <- alloc if mask != 0) {
      desire(v) |= mask
      val a = Adoption.adoptSeed(util, desire(v))
      if (a != adoption(v)) { adoption(v) = a; frontier += v }
    }

    val touched = new scala.collection.mutable.ArrayBuffer[Int]()
    val inTouched = new Array[Boolean](n)

    while (frontier.nonEmpty) {
      touched.clear()
      var fi = 0
      while (fi < frontier.length) {
        val u = frontier(fi)
        val aU = adoption(u)
        var e = g.fwdOff(u)
        val end = g.fwdOff(u + 1)
        while (e < end) {
          var live = false
          edgeState(e) match {
            case 0 =>
              live = testEdge(e, u)
              edgeState(e) = if (live) 1 else 2
            case 1 => live = true
            case _ => ()
          }
          if (live) {
            val v = g.fwdDst(e)
            if ((aU & ~desire(v)) != 0) {
              desire(v) |= aU
              if (!inTouched(v)) { inTouched(v) = true; touched += v }
            }
          }
          e += 1
        }
        fi += 1
      }
      val next = new scala.collection.mutable.ArrayBuffer[Int]()
      var ti = 0
      while (ti < touched.length) {
        val v = touched(ti)
        inTouched(v) = false
        val a = Adoption.adopt(util, desire(v), adoption(v))
        if (a != adoption(v)) { adoption(v) = a; next += v }
        ti += 1
      }
      frontier = next
    }
    adoption
  }

  /** Social welfare of a finished world: sum of adopters' utilities. */
  def welfare(util: Array[Double], adoption: Array[Int]): Double = {
    var s = 0.0; var v = 0
    while (v < adoption.length) { s += util(adoption(v)); v += 1 }
    s
  }

  /** Adoption count `alpha_W` — total items adopted across nodes. */
  def adoptionCount(adoption: Array[Int]): Long = {
    var s = 0L; var v = 0
    while (v < adoption.length) { s += Integer.bitCount(adoption(v)); v += 1 }
    s
  }
}
