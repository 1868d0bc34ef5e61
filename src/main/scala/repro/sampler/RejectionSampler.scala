package repro.sampler

import java.util.SplittableRandom

import repro.core.{RandomWalkModel, WalkState}
import repro.graph.CSRGraph

/** The static-weight proposal distribution shared by all rejection-style
  * samplers: one alias table per node over the *static* edge weights, plus
  * per-node weight sums. This is exactly the structure whose O(|E|)
  * footprint makes rejection/KnightKing OOM on Web-UK in the paper (§V-D)
  * while M-H (uniform proposal, no table) survives.
  */
final class StaticProposal(
    val tables: Array[AliasTable],
    val weightSums: Array[Double],
) extends Serializable {
  def bytes(g: CSRGraph): Long = AliasMethod.tableBytes(g.numDirectedEdges) + 8L * g.numNodes
}

object StaticProposal {
  def build(g: CSRGraph, parallel: Boolean): StaticProposal = {
    val tables = new Array[AliasTable](g.numNodes)
    val sums = new Array[Double](g.numNodes)
    SamplerUtil.forEachNode(g.numNodes, parallel) { v =>
      val d = g.degree(v); val lo = g.offset(v)
      val w = new Array[Double](d)
      var j = 0; var s = 0.0
      while (j < d) { w(j) = g.weight(lo + j).toDouble; s += w(j); j += 1 }
      tables(v) = AliasMethod.build(w)
      sums(v) = s
    }
    new StaticProposal(tables, sums)
  }
}

/** Rejection edge sampler [34], [35]: draw a candidate from the static
  * proposal, accept with probability bias/maxBias. Expected O(maxBias /
  * E[bias]) draws per sample — the parameter sensitivity Table II
  * measures. A trial cap falls back to the direct sampler so states whose
  * acceptance region is tiny (or empty, e.g. metapath mismatches) cannot
  * spin forever.
  */
final class RejectionSamplerFactory extends SamplerFactory {
  override val name = "rejection"
  private var proposal: StaticProposal = _

  override def prepare(g: CSRGraph, model: RandomWalkModel, parallel: Boolean): Unit =
    proposal = StaticProposal.build(g, parallel)

  override def create(g: CSRGraph, model: RandomWalkModel): EdgeSampler = {
    require(proposal != null, "rejection: prepare() must run before create()")
    new RejectionSampler(g, model, proposal)
  }

  override def memoryBytes(g: CSRGraph, model: RandomWalkModel): Long =
    if (proposal == null) 0L else proposal.bytes(g)
}

final class RejectionSampler(
    g: CSRGraph,
    model: RandomWalkModel,
    proposal: StaticProposal,
    maxTrialsPerDeg: Int = 8,
) extends EdgeSampler {
  override val stats = new LocalStats
  private val envelope = model.maxBias

  override def sample(s: WalkState, rng: SplittableRandom): Int = {
    val v = s.cur
    val d = g.degree(v)
    if (d == 0) return -1
    stats.steps += 1
    val t = proposal.tables(v)
    if (t == null) return -1
    val lo = g.offset(v)
    val cap = maxTrialsPerDeg * d + 16
    var trial = 0
    while (trial < cap) {
      trial += 1
      stats.trials += 1
      val e = lo + t.draw(rng)
      val bias = model.bias(g, s, e)
      if (bias > 0 && rng.nextDouble() * envelope < bias) {
        stats.accepts += 1
        return e
      }
    }
    stats.fallbacks += 1
    SamplerUtil.directDraw(g, model, s, rng)
  }
}
