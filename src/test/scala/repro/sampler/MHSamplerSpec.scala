package repro.sampler

import java.util.SplittableRandom

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite

import repro.{PropHelpers, TestGraphs}
import repro.core.WalkState
import repro.model.{DeepWalk, MetaPath2Vec, Node2Vec}

/** M-H edge sampler (Alg. 1): chain convergence to arbitrary unnormalized
  * targets, O(1) bookkeeping, and the paper's theoretical properties.
  */
class MHSamplerSpec extends AnyFunSuite with PropHelpers {

  private def make(g: repro.graph.CSRGraph, m: repro.core.RandomWalkModel,
                   init: InitStrategy = RandomInit): MHSampler =
    new MHSamplerFactory(init).create(g, m).asInstanceOf[MHSampler]

  test("chain converges to a skewed deepwalk target (uniform proposal)") {
    val g = TestGraphs.starWithWeights(Seq(1, 2, 3, 4, 10))
    val m = new DeepWalk
    val s = m.initialState(g, 0)
    val smp = make(g, m)
    val emp = TestGraphs.empiricalDistribution(g, smp, s, 500_000)
    assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(g, m, s)) < 0.02)
  }

  test("chain converges to node2vec's Eq. 2 target from a second-order state") {
    val g = TestGraphs.trianglePendant
    val m = new Node2Vec(0.25, 4.0)
    val s = WalkState(1, 0, 0)
    val smp = make(g, m)
    val emp = TestGraphs.empiricalDistribution(g, smp, s, 500_000)
    assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(g, m, s)) < 0.02)
  }

  test("chain converges under every initialization strategy") {
    val g = TestGraphs.starWithWeights(Seq(5, 1, 1, 1, 8, 2))
    val m = new DeepWalk
    val s = m.initialState(g, 0)
    for (init <- Seq(RandomInit, HighWeightInit(), BurnInInit(50))) {
      val smp = make(g, m, init)
      val emp = TestGraphs.empiricalDistribution(g, smp, s, 400_000)
      assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(g, m, s)) < 0.02,
             s"init=$init")
    }
  }

  test("masked edges (metapath) are never emitted") {
    val g = TestGraphs.typedGraph
    val m = new MetaPath2Vec(Array(0, 1, 2))
    val s = WalkState(-1, 0, 0) // target type 1: only nodes 1 and 4 allowed
    val smp = make(g, m)
    val emp = TestGraphs.empiricalDistribution(g, smp, s, 100_000)
    for (j <- 0 until g.degree(0)) {
      val u = g.dst(g.offset(0) + j)
      if (g.nodeType(u) == 1) assert(emp(j) > 0.3) else assert(emp(j) == 0.0)
    }
  }

  test("stuck states return -1") {
    val g = TestGraphs.typedGraph
    val m = new MetaPath2Vec(Array(0, 1))
    val s = m.initialState(g, 2) // type 2 not on the path
    assert(make(g, m).sample(s, new SplittableRandom(1)) == -1)
  }

  test("isolated nodes return -1") {
    val iso = repro.graph.CSRGraph.fromUndirectedEdges(3, Array(0), Array(1), Array(1f))
    assert(make(iso, new DeepWalk).sample(WalkState(-1, 2, 0), new SplittableRandom(1)) == -1)
  }

  test("one lazy initialization per state; LAST_x memory grows accordingly") {
    val g = TestGraphs.trianglePendant
    val m = new Node2Vec(1, 1)
    val smp = make(g, m)
    val rng = new SplittableRandom(5)
    smp.sample(WalkState(1, 0, 0), rng)
    smp.sample(WalkState(1, 0, 0), rng)
    smp.sample(WalkState(2, 0, 0), rng)
    assert(smp.stats.initCount == 2) // two distinct states touched
    assert(smp.managerBytes == 4L * (g.degree(0) + 1)) // one bucket allocated
    smp.sample(WalkState(0, 1, 0), rng)
    assert(smp.managerBytes == 4L * (g.degree(0) + 1) + 4L * (g.degree(1) + 1))
  }

  test("acceptance is perfect for uniform targets, partial for skewed ones") {
    val uni = TestGraphs.starWithWeights(Seq(2, 2, 2, 2))
    val smpU = make(uni, new DeepWalk)
    TestGraphs.empiricalDistribution(uni, smpU, WalkState(-1, 0, 0), 50_000)
    assert(smpU.stats.accepts == smpU.stats.trials)

    val skew = TestGraphs.starWithWeights(Seq(10, 1, 1, 1))
    val smpS = make(skew, new DeepWalk)
    TestGraphs.empiricalDistribution(skew, smpS, WalkState(-1, 0, 0), 50_000)
    assert(smpS.stats.accepts < smpS.stats.trials)
  }

  test("rejected candidates repeat LAST_x (heavy self-transition under skew)") {
    val g = TestGraphs.starWithWeights(Seq(1000, 1, 1, 1))
    val smp = make(g, new DeepWalk)
    val rng = new SplittableRandom(11)
    val s = WalkState(-1, 0, 0)
    val draws = (0 until 10_000).map(_ => smp.sample(s, rng))
    val heavy = g.offset(0) + 0 // slot of weight-1000 leaf (sorted dst: node 1)
    assert(draws.count(_ == heavy) > 9_000)
  }

  test("same seed, same draws (determinism)") {
    val g = TestGraphs.mediumGraph()
    val m = new Node2Vec(0.5, 2.0)
    def run(): Seq[Int] = {
      val smp = make(g, m)
      val rng = new SplittableRandom(77)
      val s = WalkState(g.dst(g.offset(3)), 3, 0)
      (0 until 1000).map(_ => smp.sample(s, rng))
    }
    assert(run() == run())
  }

  test("factory memory formula is 4 bytes per state") {
    val g = TestGraphs.trianglePendant
    val f = new MHSamplerFactory(RandomInit)
    assert(f.memoryBytes(g, new DeepWalk) == 4L * g.numNodes)
    assert(f.memoryBytes(g, new Node2Vec(1, 1)) == 4L * g.numDirectedEdges)
  }

  test("Lemma 1: pi_max >= 1/n for random distributions") {
    val gen = Gen.nonEmptyListOf(Gen.choose(0.01, 10.0))
    forAllSamples(gen, n = 60) { ws =>
      val z = ws.sum
      assert(Theory.lemma1Holds(ws.map(_ / z)))
    }
  }

  test("Theorem 2: a = 1/(n * pi_max) lies in (0, 1] and satisfies the premise") {
    val gen = Gen.nonEmptyListOf(Gen.choose(0.01, 10.0)).suchThat(_.size >= 2)
    forAllSamples(gen, n = 60) { ws =>
      val z = ws.sum
      val pi = ws.map(_ / z)
      val a = Theory.theorem2Coefficient(pi)
      assert(a > 0 && a <= 1.0 + 1e-12)
      assert(Theory.theorem2PremiseHolds(pi))
    }
  }
}
