package repro.epic

import java.util.SplittableRandom

import org.scalatest.funsuite.AnyFunSuite

import repro.PropHelpers
import repro.graph.{GraphGen, SocialGraph}
import repro.items._

/** The paper's Example 1: network v1..v7, all edge probabilities 1.
  * Edges: v1->v2->v3->v4, v5->v3, v5->v6, v5->v7 — so sigma(v5)=5 beats
  * sigma(v1)=4, and v3/v4 are reachable from both v1 and v5.
  */
object Example1 {
  val g: SocialGraph = SocialGraph.fromEdgesWithProb("ex1", 7, Array(
    (0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0), (4, 2, 1.0), (4, 5, 1.0), (4, 6, 1.0),
  ))
  // items i1,i2,i3; values so that U(i)=-1 per item, U({i1,i2})=U({i1,i3})=1,
  // U({i2,i3})=-1, U(all)=3 (Table 1).
  val model: UtilityModel = UtilityModel(
    TableValuation(Array(0.0, 1.0, 1.0, 5.0, 1.0, 5.0, 3.0, 9.0)),
    Array(2.0, 2.0, 2.0),
    NoiseSpec.none(3),
  )
  val util: Array[Double] = model.deterministicUtility

  /** Greedy allocation from Example 1: all items to v5 (node 4), i1 to v1. */
  val greedyAlloc: Map[Int, Int] = Map(4 -> 7, 0 -> 1)

  /** Alternative allocation: {i1,i2} to v1, {i1,i3} to v5. */
  val altAlloc: Map[Int, Int] = Map(0 -> 3, 4 -> 5)
}

class EpicSimulatorSpec extends AnyFunSuite with PropHelpers {
  import Example1._

  test("Example 1, greedy allocation: v3..v7 adopt all items, welfare 15") {
    val adoption = EpicSimulator.diffuse(g, greedyAlloc, util, new SplittableRandom(1))
    assert(adoption.toSeq == Seq(0, 0, 7, 7, 7, 7, 7))
    assert(EpicSimulator.welfare(util, adoption) == 15.0)
    assert(EpicSimulator.adoptionCount(adoption) == 15L)
  }

  test("Example 1, alternative allocation: welfare 11 but 16 adoptions") {
    val adoption = EpicSimulator.diffuse(g, altAlloc, util, new SplittableRandom(1))
    // v1,v2 adopt {i1,i2}; v3,v4 all; v5,v6,v7 {i1,i3}
    assert(adoption.toSeq == Seq(3, 3, 7, 7, 5, 5, 5))
    assert(EpicSimulator.welfare(util, adoption) == 11.0)
    assert(EpicSimulator.adoptionCount(adoption) == 16L)
  }

  test("Example 1: seeding a single negative-utility item adopts nothing") {
    val adoption = EpicSimulator.diffuse(g, Map(0 -> 1), util, new SplittableRandom(1))
    assert(adoption.forall(_ == 0))
    assert(EpicSimulator.welfare(util, adoption) == 0.0)
  }

  test("fixed-world diffusion is deterministic and replayable") {
    val a1 = EpicSimulator.diffuseFixedWorld(g, greedyAlloc, util, worldSeed = 99)
    val a2 = EpicSimulator.diffuseFixedWorld(g, greedyAlloc, util, worldSeed = 99)
    assert(a1.toSeq == a2.toSeq)
  }

  test("Lemma 4: adoption propagates through reachability in every world") {
    forSeeds(20) { s =>
      val rng = new SplittableRandom(s)
      val graph = GraphGen.uniformDirected("t", 60, 240, seed = s)
      val alloc = Map(rng.nextInt(60) -> 7, rng.nextInt(60) -> 3)
      val adoption = EpicSimulator.diffuseFixedWorld(graph, alloc, util, worldSeed = s)
      // recompute live reachability with the same hash coupling
      val live = Array.tabulate(graph.n) { u =>
        (graph.fwdOff(u) until graph.fwdOff(u + 1))
          .filter(e => EpicSimulator.edgeLive(graph, s)(e, u))
          .map(graph.fwdDst)
      }
      // BFS over live edges from every adopter of item i: all reached nodes must adopt i
      for (i <- 0 until 3; v <- 0 until graph.n if (adoption(v) & (1 << i)) != 0) {
        val seen = scala.collection.mutable.Set(v)
        val stack = scala.collection.mutable.Stack(v)
        while (stack.nonEmpty) {
          val u = stack.pop()
          live(u).foreach { w => if (!seen.contains(w)) { seen += w; stack.push(w) } }
        }
        seen.foreach { w =>
          assert((adoption(w) & (1 << i)) != 0,
            s"seed=$s: node $w reachable from adopter $v of item $i but did not adopt")
        }
      }
    }
  }

  test("Theorem 1 (per-world): welfare is monotone in the allocation") {
    forSeeds(30) { s =>
      val rng = new SplittableRandom(s)
      val graph = GraphGen.uniformDirected("t", 50, 200, seed = s)
      val a1 = Map(rng.nextInt(50) -> (1 + rng.nextInt(7)))
      val extra = Map(rng.nextInt(50) -> (1 + rng.nextInt(7)))
      val a2 = (a1.keySet ++ extra.keySet).map { v =>
        v -> (a1.getOrElse(v, 0) | extra.getOrElse(v, 0))
      }.toMap
      val w1 = EpicSimulator.welfare(util, EpicSimulator.diffuseFixedWorld(graph, a1, util, s))
      val w2 = EpicSimulator.welfare(util, EpicSimulator.diffuseFixedWorld(graph, a2, util, s))
      assert(w2 >= w1 - 1e-9, s"seed=$s: $w2 < $w1")
    }
  }

  test("all adoption sets are local maxima at the end of diffusion (Lemma 3)") {
    forSeeds(20) { s =>
      val graph = GraphGen.uniformDirected("t", 60, 240, seed = s)
      val rng = new SplittableRandom(s)
      val alloc = Map(rng.nextInt(60) -> 7, rng.nextInt(60) -> 6, rng.nextInt(60) -> 5)
      val adoption = EpicSimulator.diffuse(graph, alloc, util, rng)
      adoption.foreach(a => assert(Adoption.isLocalMaximum(util, a)))
    }
  }

  test("welfare of the empty allocation is 0") {
    val adoption = EpicSimulator.diffuse(g, Map.empty, util, new SplittableRandom(1))
    assert(adoption.forall(_ == 0))
  }

  test("adoption counts and welfare agree with direct recomputation") {
    forSeeds(15) { s =>
      val graph = GraphGen.uniformDirected("t", 40, 160, seed = s)
      val alloc = Map(0 -> 7, 1 -> 3)
      val adoption = EpicSimulator.diffuseFixedWorld(graph, alloc, util, s)
      val w = adoption.map(util).sum
      val c = adoption.map(Integer.bitCount).sum
      assert(math.abs(EpicSimulator.welfare(util, adoption) - w) < 1e-9)
      assert(EpicSimulator.adoptionCount(adoption) == c)
    }
  }

  test("hash01 is uniform-ish and deterministic") {
    val xs = (0 until 10000).map(i => EpicSimulator.hash01(42, i, 7))
    assert(xs == (0 until 10000).map(i => EpicSimulator.hash01(42, i, 7)))
    val mean = xs.sum / xs.size
    assert(math.abs(mean - 0.5) < 0.02)
    assert(xs.forall(x => x >= 0.0 && x < 1.0))
  }
}
