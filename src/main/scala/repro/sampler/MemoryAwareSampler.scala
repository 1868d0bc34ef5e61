package repro.sampler

import java.util.SplittableRandom

import repro.core.{RandomWalkModel, WalkState}
import repro.graph.CSRGraph

/** Memory-aware edge sampler (Shao et al., SIGMOD'20 [32]): assign the
  * O(1)-per-draw alias method to as many states as a byte budget allows,
  * and fall back to the O(deg) direct sampler everywhere else.
  *
  * The assignment is the greedy cost/benefit heuristic of the original
  * framework: states of high-degree nodes are aliased first — they are
  * both the most expensive to direct-sample (cost ∝ deg) and, under a
  * stationary random walk, the most frequently visited. Alias tables for
  * assigned states are built lazily on first visit (and their bytes
  * counted), so the sampler works within the budget by construction —
  * which is exactly why it survives Web-UK in Tables VI/VII while being
  * slower than the O(1) samplers when the budget falls short.
  */
final class MemoryAwareSamplerFactory(val budgetBytes: Long) extends SamplerFactory {
  override def name = s"memory-aware(${budgetBytes / (1L << 20)}MB)"

  // aliasUpTo(v): true when node v's states are assigned the alias method.
  private var aliasEnabled: Array[Boolean] = _
  private var assignedBytes: Long = 0L

  override def prepare(g: CSRGraph, model: RandomWalkModel, parallel: Boolean): Unit = {
    aliasEnabled = new Array[Boolean](g.numNodes)
    assignedBytes = 0L
    val order = Array.tabulate(g.numNodes)(identity).sortBy(v => -g.degree(v))
    var i = 0
    var used = 0L
    while (i < order.length) {
      val v = order(i)
      val cost = AliasMethod.tableBytes(g.degree(v)) * model.bucketSize(g, v)
      if (used + cost <= budgetBytes) { aliasEnabled(v) = true; used += cost }
      i += 1
    }
    assignedBytes = used
  }

  override def create(g: CSRGraph, model: RandomWalkModel): EdgeSampler = {
    require(aliasEnabled != null, "memory-aware: prepare() must run before create()")
    new MemoryAwareSampler(g, model, aliasEnabled)
  }

  /** Budgeted upper bound of alias storage (lazy build may use less). */
  override def memoryBytes(g: CSRGraph, model: RandomWalkModel): Long = assignedBytes
}

final class MemoryAwareSampler(
    g: CSRGraph,
    model: RandomWalkModel,
    aliasEnabled: Array[Boolean],
) extends EdgeSampler {
  override val stats = new LocalStats
  // Per-partition lazy cache of dynamic alias tables for assigned states.
  private val cache = new Array[Array[AliasTable]](g.numNodes)

  override def sample(s: WalkState, rng: SplittableRandom): Int = {
    val v = s.cur
    val d = g.degree(v)
    if (d == 0) return -1
    stats.steps += 1
    if (!aliasEnabled(v)) {
      stats.trials += d
      return SamplerUtil.directDraw(g, model, s, rng)
    }
    stats.trials += 1
    var row = cache(v)
    if (row == null) { row = new Array[AliasTable](model.bucketSize(g, v)); cache(v) = row }
    val a = model.affixture(g, s)
    var t = row(a)
    if (t == null) {
      val t0 = System.nanoTime()
      t = AliasMethod.build(SamplerUtil.dynamicWeights(g, model, s))
      row(a) = t
      stats.initNanos += System.nanoTime() - t0
      stats.initCount += 1
      stats.lazyBytes += AliasMethod.tableBytes(d)
    }
    if (t == null) -1 else g.offset(v) + t.draw(rng)
  }
}
