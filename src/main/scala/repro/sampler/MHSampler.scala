package repro.sampler

import java.util.SplittableRandom

import repro.core.{RandomWalkModel, SamplerManager, WalkState}
import repro.graph.CSRGraph

/** Initialization strategy for an M-H edge sampler's Markov chain
  * (paper §III-C): how to pick LAST_x the first time a state is touched.
  */
sealed trait InitStrategy extends Serializable { def name: String }

/** Draw the initial edge uniformly from the permitted neighbors — O(1),
  * but the chain may start in a low-probability region.
  */
case object RandomInit extends InitStrategy { val name = "Rand" }

/** Seed the chain at the (approximately) maximum-dynamic-weight edge: an
  * exact O(deg) scan for small degrees, otherwise the max over
  * `sampleSize` uniform probes (the paper's law-of-large-numbers
  * approximation). Better than random exactly when Thm. 3's condition
  * holds — true for skewed real-network distributions.
  */
final case class HighWeightInit(sampleSize: Int = 16) extends InitStrategy { val name = "Weight" }

/** Classic burn-in: random init followed by `iterations` discarded M-H
  * steps (the paper tunes 100). Accurate but expensive over #state chains.
  */
final case class BurnInInit(iterations: Int = 100) extends InitStrategy { val name = "Burn" }

/** The M-H based edge sampler (paper Alg. 1) — the core contribution.
  *
  * The conditional probability mass function is the uniform distribution
  * over N(v), so a step is: draw a uniform candidate edge, accept with
  * θ = min{1, w'(cand) / w'(LAST_x)}, emit LAST_x. O(1) time and one int
  * of memory per state, and the target distribution never needs
  * normalizing — which is what lets UniNet support arbitrary user models
  * (Challenge 2) at billion-edge scale (Challenge 1).
  */
final class MHSamplerFactory(val init: InitStrategy) extends SamplerFactory {
  override def name = s"mh(${init.name})"

  override def create(g: CSRGraph, model: RandomWalkModel): EdgeSampler =
    new MHSampler(g, model, init)

  // LAST_x is allocated lazily inside each partition's SamplerManager;
  // the worst case (every state visited) is 4 bytes * #state.
  override def memoryBytes(g: CSRGraph, model: RandomWalkModel): Long =
    4L * model.numStates(g)
}

final class MHSampler(
    g: CSRGraph,
    model: RandomWalkModel,
    init: InitStrategy,
) extends EdgeSampler {
  override val stats = new LocalStats
  private val mgr = new SamplerManager(g, v => model.bucketSize(g, v))

  def managerBytes: Long = mgr.memoryBytes

  /** Uniform draw of a permitted (w' > 0) edge of N(v): up to 32 random
    * probes, then a linear scan fallback; -1 when no edge is permitted.
    */
  private def randomPermitted(s: WalkState, rng: SplittableRandom): Int = {
    val lo = g.offset(s.cur); val d = g.degree(s.cur)
    var probe = 0
    while (probe < 32) {
      val e = lo + rng.nextInt(d)
      if (model.calculateWeight(g, s, e) > 0) return e
      probe += 1
    }
    // Scan from a random rotation so the fallback stays unbiased-ish.
    val rot = rng.nextInt(d)
    var j = 0
    while (j < d) {
      val e = lo + (j + rot) % d
      if (model.calculateWeight(g, s, e) > 0) return e
      j += 1
    }
    -1
  }

  private def initialEdge(s: WalkState, rng: SplittableRandom): Int = init match {
    case RandomInit => randomPermitted(s, rng)
    case HighWeightInit(k) =>
      val lo = g.offset(s.cur); val d = g.degree(s.cur)
      var best = -1; var bestW = 0.0
      if (d <= k) { // exact max
        var j = 0
        while (j < d) {
          val w = model.calculateWeight(g, s, lo + j)
          if (w > bestW) { bestW = w; best = lo + j }
          j += 1
        }
      } else { // approximate max over k uniform probes
        var j = 0
        while (j < k) {
          val e = lo + rng.nextInt(d)
          val w = model.calculateWeight(g, s, e)
          if (w > bestW) { bestW = w; best = e }
          j += 1
        }
        if (best < 0) best = randomPermitted(s, rng)
      }
      best
    case BurnInInit(iters) =>
      var last = randomPermitted(s, rng)
      if (last >= 0) {
        val lo = g.offset(s.cur); val d = g.degree(s.cur)
        var i = 0
        while (i < iters) {
          val cand = lo + rng.nextInt(d)
          val wc = model.calculateWeight(g, s, cand)
          if (wc > 0) {
            val wl = model.calculateWeight(g, s, last)
            if (wl <= 0 || rng.nextDouble() * wl < wc) last = cand
          }
          i += 1
        }
      }
      last
  }

  /** Alg. 1: one M-H transition of state x's chain, returning LAST_x. */
  override def sample(s: WalkState, rng: SplittableRandom): Int = {
    val v = s.cur
    val d = g.degree(v)
    if (d == 0) return -1
    stats.steps += 1
    val bucket = mgr.bucket(v)
    val a = model.affixture(g, s)
    var last = bucket(a)
    if (last < 0) {
      val t0 = System.nanoTime()
      last = initialEdge(s, rng)
      stats.initNanos += System.nanoTime() - t0
      stats.initCount += 1
      if (last < 0) return -1 // no permitted edge: the walk is stuck
    }
    // Draw a uniform candidate and accept with min{1, w'(cand)/w'(last)}.
    stats.trials += 1
    val cand = g.offset(v) + rng.nextInt(d)
    val wc = model.calculateWeight(g, s, cand)
    if (wc > 0) {
      val wl = model.calculateWeight(g, s, last)
      if (wl <= 0 || rng.nextDouble() * wl < wc) {
        last = cand
        stats.accepts += 1
      }
    }
    bucket(a) = last
    last
  }
}
