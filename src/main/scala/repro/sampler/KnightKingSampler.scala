package repro.sampler

import java.util.SplittableRandom

import repro.core.{RandomWalkModel, WalkState}
import repro.graph.CSRGraph

/** KnightKing-style sampler [35]: rejection sampling over the static
  * proposal with two of KnightKing's algorithmic optimizations —
  *
  *  - **outlier folding**: a state's single deterministic outlier edge
  *    (node2vec's 1/p return edge when 1/p dominates) is pulled out of the
  *    rejection area and sampled exactly from a two-part mixture, so the
  *    envelope shrinks from max(1/p, 1, 1/q) to max(1, 1/q);
  *  - **pre-acceptance**: when every edge's bias is known to be at least
  *    `minBias`, a uniform draw below minBias/envelope accepts without
  *    computing the dynamic weight at all.
  *
  * Models without a deterministic outlier (edge2vec, fairwalk — their
  * outliers depend on the heterogeneous layout) get no folding benefit,
  * reproducing the paper's §V-D/§V-E observations. The distributed-engine
  * side of KnightKing is out of scope: the paper itself benchmarks it in
  * standalone mode.
  */
final class KnightKingSamplerFactory extends SamplerFactory {
  override val name = "knightking"
  private var proposal: StaticProposal = _

  override def prepare(g: CSRGraph, model: RandomWalkModel, parallel: Boolean): Unit =
    proposal = StaticProposal.build(g, parallel)

  override def create(g: CSRGraph, model: RandomWalkModel): EdgeSampler = {
    require(proposal != null, "knightking: prepare() must run before create()")
    new KnightKingSampler(g, model, proposal)
  }

  override def memoryBytes(g: CSRGraph, model: RandomWalkModel): Long =
    if (proposal == null) 0L else proposal.bytes(g)
}

final class KnightKingSampler(
    g: CSRGraph,
    model: RandomWalkModel,
    proposal: StaticProposal,
    maxTrialsPerDeg: Int = 8,
) extends EdgeSampler {
  override val stats = new LocalStats
  private val foldedEnvelope = model.foldedMaxBias
  private val plainEnvelope = model.maxBias

  override def sample(s: WalkState, rng: SplittableRandom): Int = {
    val v = s.cur
    val d = g.degree(v)
    if (d == 0) return -1
    stats.steps += 1
    val t = proposal.tables(v)
    if (t == null) return -1
    val lo = g.offset(v)

    val outlier = model.outlierEdge(g, s)
    val envelope = if (outlier >= 0) foldedEnvelope else plainEnvelope
    // Mixture split: the outlier's weight above the folded envelope cap
    // forms its own always-accepted area. The split must be re-drawn on
    // every trial so rejections renormalize the whole mixture, keeping the
    // sampled distribution exact.
    var outlierProb = 0.0
    if (outlier >= 0) {
      val extra = model.calculateWeight(g, s, outlier) - envelope * g.weight(outlier)
      if (extra > 0) outlierProb = extra / (extra + envelope * proposal.weightSums(v))
    }

    val preThreshold = model.minBias / envelope
    val cap = maxTrialsPerDeg * d + 16
    var trial = 0
    while (trial < cap) {
      trial += 1
      stats.trials += 1
      if (outlierProb > 0 && rng.nextDouble() < outlierProb) {
        stats.accepts += 1
        return outlier
      }
      val e = lo + t.draw(rng)
      val r = rng.nextDouble()
      if (r < preThreshold) {
        // pre-acceptance: bias >= minBias for every edge, skip the weight.
        stats.preAccepts += 1
        stats.accepts += 1
        return e
      }
      // In the folded area the outlier's contribution is capped at the
      // envelope (the surplus lives in the mixture's outlier area).
      val bias = math.min(model.bias(g, s, e), envelope)
      if (bias > 0 && r * envelope < bias) {
        stats.accepts += 1
        return e
      }
    }
    stats.fallbacks += 1
    SamplerUtil.directDraw(g, model, s, rng)
  }
}
