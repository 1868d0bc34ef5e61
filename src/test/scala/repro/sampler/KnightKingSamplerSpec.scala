package repro.sampler

import org.scalatest.funsuite.AnyFunSuite

import repro.TestGraphs
import repro.core.WalkState
import repro.model.{DeepWalk, Edge2Vec, Node2Vec}

/** KnightKing-style sampler: distribution exactness with outlier folding
  * and pre-acceptance, plus the efficiency claims of paper §V-D/E.
  */
class KnightKingSamplerSpec extends AnyFunSuite {
  private val g = TestGraphs.trianglePendant

  private def make(m: repro.core.RandomWalkModel,
                   graph: repro.graph.CSRGraph = g): KnightKingSampler = {
    val f = new KnightKingSamplerFactory
    f.prepare(graph, m, parallel = false)
    f.create(graph, m).asInstanceOf[KnightKingSampler]
  }

  test("matches node2vec's distribution when folding is active (p < 1)") {
    val m = new Node2Vec(0.25, 1.0) // 1/p = 4 dominates: return edge is an outlier
    val smp = make(m)
    val s = WalkState(1, 0, 0)
    assert(m.outlierEdge(g, s) >= 0)
    val emp = TestGraphs.empiricalDistribution(g, smp, s, 300_000)
    assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(g, m, s)) < 0.02)
  }

  test("matches node2vec's distribution without folding (p >= 1)") {
    val m = new Node2Vec(4.0, 0.5)
    val smp = make(m)
    val s = WalkState(1, 0, 0)
    val emp = TestGraphs.empiricalDistribution(g, smp, s, 300_000)
    assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(g, m, s)) < 0.02)
  }

  test("matches edge2vec's distribution (no deterministic outlier)") {
    val t = TestGraphs.typedGraph
    val m = Edge2Vec(0.25, 0.25)
    val smp = make(m, t)
    val s = WalkState(1, 0, 0)
    val emp = TestGraphs.empiricalDistribution(t, smp, s, 300_000)
    assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(t, m, s)) < 0.02)
  }

  test("folding beats plain rejection on acceptance when 1/p is the outlier") {
    val star = TestGraphs.starWithWeights(Seq(1, 1, 1, 1, 1, 1, 1, 1))
    val m = new Node2Vec(0.05, 1.0) // 1/p = 20: heavy single outlier
    val s = WalkState(1, 0, 0)
    val kk = make(m, star)
    TestGraphs.empiricalDistribution(star, kk, s, 100_000)
    val rej = {
      val f = new RejectionSamplerFactory
      f.prepare(star, m, parallel = false)
      val smp = f.create(star, m)
      TestGraphs.empiricalDistribution(star, smp, s, 100_000)
      smp
    }
    val kkAcc = kk.stats.accepts.toDouble / kk.stats.trials
    val rejAcc = rej.stats.accepts.toDouble / rej.stats.trials
    // Folded envelope is max(1, 1/q) = 1 -> near-perfect acceptance; plain
    // rejection's envelope is 20 -> acceptance ~ E[alpha]/20.
    assert(kkAcc > 0.9, s"kk acceptance $kkAcc")
    assert(rejAcc < 0.3, s"rejection acceptance $rejAcc")
  }

  test("pre-acceptance fires when the model has a positive bias floor") {
    val m = new Node2Vec(1.0, 2.0) // biases in [0.5, 1]: floor 0.5
    val smp = make(m)
    TestGraphs.empiricalDistribution(g, smp, WalkState(1, 0, 0), 50_000)
    assert(smp.stats.preAccepts > 0)
    // Pre-accepted draws are still correct: distribution already checked
    // above; here check the floor share is plausible (>= 40% of accepts).
    assert(smp.stats.preAccepts.toDouble / smp.stats.accepts > 0.4)
  }

  test("deepwalk degenerates to always-accept") {
    val m = new DeepWalk
    val smp = make(m)
    val s = m.initialState(g, 0)
    TestGraphs.empiricalDistribution(g, smp, s, 20_000)
    assert(smp.stats.accepts == smp.stats.trials)
  }

  test("first step has no outlier and still samples correctly") {
    val m = new Node2Vec(0.25, 1.0)
    val smp = make(m)
    val s = m.initialState(g, 0)
    val emp = TestGraphs.empiricalDistribution(g, smp, s, 100_000)
    assert(TestGraphs.l1(emp, TestGraphs.targetDistribution(g, m, s)) < 0.02)
  }

  test("shares the static proposal's memory footprint") {
    val f = new KnightKingSamplerFactory
    val m = new DeepWalk
    f.prepare(g, m, parallel = true)
    assert(f.memoryBytes(g, m) == AliasMethod.tableBytes(g.numDirectedEdges) + 8L * g.numNodes)
  }
}
