package repro.sampler

import java.util.SplittableRandom

import repro.core.{RandomWalkModel, WalkState}
import repro.graph.CSRGraph

/** Per-partition mutable sampling counters, flushed into Spark
  * accumulators when a partition finishes (see UniNet.generateWalks).
  * `trials`/`accepts` give the measured acceptance ratio of
  * rejection-style samplers (Table II); `initNanos` separates lazy
  * initialization work out of the walking phase (Ti vs Tw in Table VI).
  */
final class LocalStats {
  var steps: Long = 0
  var trials: Long = 0
  var accepts: Long = 0
  var preAccepts: Long = 0
  var fallbacks: Long = 0
  var initNanos: Long = 0
  var initCount: Long = 0
  var lazyBytes: Long = 0
}

/** A stateful edge sampler bound to one (graph, model) pair, owned by one
  * walker-executing partition. `sample` returns the chosen *global edge
  * index* (the next step is its destination), or -1 when the state admits
  * no edge and the walk must terminate.
  */
trait EdgeSampler {
  def sample(s: WalkState, rng: SplittableRandom): Int
  def stats: LocalStats
}

/** Factory for [[EdgeSampler]]s. `prepare` runs once on the driver and
  * builds the shared immutable structures (alias tables over static
  * weights, precomputed per-state tables, budget assignments); its wall
  * time is the initialization cost Ti of Tables VI/VII. The prepared
  * factory is broadcast; `create` then instantiates the cheap per-partition
  * mutable part.
  */
trait SamplerFactory extends Serializable {
  def name: String

  /** Driver-side preparation; `parallel = false` emulates the
    * single-threaded reference implementations in the baseline runs.
    */
  def prepare(g: CSRGraph, model: RandomWalkModel, parallel: Boolean): Unit = ()

  def create(g: CSRGraph, model: RandomWalkModel): EdgeSampler

  /** Bytes of sampler-owned state at *this* graph's scale (excludes the
    * CSR itself); the paper-scale OOM accounting lives in [[MemoryModel]].
    */
  def memoryBytes(g: CSRGraph, model: RandomWalkModel): Long
}

private[sampler] object SamplerUtil {

  /** O(deg) direct draw from the dynamic weights of N(s.cur): the direct
    * edge sampler's core, also every other sampler's fallback when its
    * fast path cannot make progress. Returns a global edge index or -1.
    */
  def directDraw(g: CSRGraph, model: RandomWalkModel, s: WalkState,
                 rng: SplittableRandom): Int = {
    val v = s.cur
    val lo = g.offset(v); val hi = lo + g.degree(v)
    var total = 0.0
    var e = lo
    while (e < hi) { total += model.calculateWeight(g, s, e); e += 1 }
    if (total <= 0) return -1
    var r = rng.nextDouble() * total
    e = lo
    while (e < hi) {
      r -= model.calculateWeight(g, s, e)
      if (r <= 0) return e
      e += 1
    }
    hi - 1
  }

  /** Dynamic weights of N(v) under state `s` as an array (alias builds). */
  def dynamicWeights(g: CSRGraph, model: RandomWalkModel, s: WalkState): Array[Double] = {
    val lo = g.offset(s.cur); val d = g.degree(s.cur)
    val w = new Array[Double](d)
    var j = 0
    while (j < d) { w(j) = model.calculateWeight(g, s, lo + j); j += 1 }
    w
  }

  /** Run `body(v)` for every node, optionally on the common ForkJoin pool —
    * scala-parallel-collections is not on the offline classpath, so driver
    * parallelism uses Java streams.
    */
  def forEachNode(numNodes: Int, parallel: Boolean)(body: Int => Unit): Unit = {
    val s = java.util.stream.IntStream.range(0, numNodes)
    (if (parallel) s.parallel() else s).forEach(v => body(v))
  }
}
