package repro.core

import java.util.SplittableRandom

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.rdd.RDD
import org.apache.spark.sql.SparkSession
import org.apache.spark.util.LongAccumulator

import repro.graph.CSRGraph
import repro.sampler.{EdgeSampler, MHSampler, SamplerFactory}

/** Aggregated sampling counters for one walk-generation job, flushed from
  * each partition's [[repro.sampler.LocalStats]] when it completes.
  */
final class WalkAccumulators(@transient spark: SparkSession) extends Serializable {
  // Note: only the accumulators may become fields — a captured
  // SparkContext would make the walker closure unserializable.
  val steps: LongAccumulator = spark.sparkContext.longAccumulator("steps")
  val trials: LongAccumulator = spark.sparkContext.longAccumulator("trials")
  val accepts: LongAccumulator = spark.sparkContext.longAccumulator("accepts")
  val preAccepts: LongAccumulator = spark.sparkContext.longAccumulator("preAccepts")
  val fallbacks: LongAccumulator = spark.sparkContext.longAccumulator("fallbacks")
  val initNanos: LongAccumulator = spark.sparkContext.longAccumulator("initNanos")
  val initCount: LongAccumulator = spark.sparkContext.longAccumulator("initCount")
  val localBytes: LongAccumulator = spark.sparkContext.longAccumulator("localBytes")

  /** Fraction of proposal trials accepted (rejection-style samplers) or
    * of M-H candidates accepted; NaN when nothing was counted.
    */
  def acceptanceRatio: Double =
    if (trials.value == 0) Double.NaN else accepts.value.toDouble / trials.value
}

/** The UniNet walk engine (paper Alg. 2) on Spark.
  *
  * The CSR network is broadcast once; walkers are a range RDD of
  * (startNode, walkIndex) pairs, split over `numPartitions` partitions.
  * Each partition instantiates one edge sampler from the (broadcast,
  * already-prepared) factory — sampler state such as LAST_x or lazy alias
  * caches is partition-local, mirroring the paper's per-thread walkers:
  * the per-state Markov chains of different partitions are independent,
  * which preserves the M-H convergence argument.
  */
object UniNet {

  /** One walk from `start`: the node sequence, length <= walkLen + 1
    * (walks terminate early when the state admits no edge).
    */
  def runWalk(g: CSRGraph, model: RandomWalkModel, sampler: EdgeSampler,
              start: Int, walkLen: Int, rng: SplittableRandom): Array[Int] = {
    val buf = new Array[Int](walkLen + 1)
    buf(0) = start
    var n = 1
    var s = model.initialState(g, start)
    var step = 0
    var stuck = false
    while (step < walkLen && !stuck) {
      val e = sampler.sample(s, rng)
      if (e < 0) stuck = true
      else {
        buf(n) = g.dst(e); n += 1
        s = model.updateState(g, s, e)
      }
      step += 1
    }
    if (n == buf.length) buf else java.util.Arrays.copyOf(buf, n)
  }

  /** Generate `numWalks` walks of length `walkLen` per node (Alg. 2's
    * K and L). The factory must already be `prepare`d; its shared tables
    * ride inside the broadcast.
    */
  def generateWalks(
      spark: SparkSession,
      bcGraph: Broadcast[CSRGraph],
      model: RandomWalkModel,
      factory: SamplerFactory,
      numWalks: Int,
      walkLen: Int,
      numPartitions: Int,
      seed: Long,
  ): (RDD[Array[Int]], WalkAccumulators) =
    generateWalksPrepared(spark, bcGraph, model,
                          spark.sparkContext.broadcast(factory),
                          numWalks, walkLen, numPartitions, seed)

  /** As [[generateWalks]] but with the factory already broadcast — lets
    * callers (Pipeline) attribute the broadcast's serialization cost
    * (large for samplers with shared tables) to the init phase.
    */
  def generateWalksPrepared(
      spark: SparkSession,
      bcGraph: Broadcast[CSRGraph],
      model: RandomWalkModel,
      bcFactory: Broadcast[SamplerFactory],
      numWalks: Int,
      walkLen: Int,
      numPartitions: Int,
      seed: Long,
  ): (RDD[Array[Int]], WalkAccumulators) = {
    val sc = spark.sparkContext
    val acc = new WalkAccumulators(spark)
    val n = bcGraph.value.numNodes
    val walks = sc
      .range(0L, n.toLong * numWalks, 1L, numPartitions)
      .mapPartitionsWithIndex { (pid, it) =>
        val g = bcGraph.value
        val sampler = bcFactory.value.create(g, model)
        val rng = new SplittableRandom(seed * 1000003L + pid)
        val inner = it.map(i => runWalk(g, model, sampler, (i % n).toInt, walkLen, rng))
        // Flush partition-local counters exactly once, when exhausted.
        new Iterator[Array[Int]] {
          private var flushed = false
          override def hasNext: Boolean = {
            val h = inner.hasNext
            if (!h && !flushed) {
              flushed = true
              val st = sampler.stats
              acc.steps.add(st.steps); acc.trials.add(st.trials)
              acc.accepts.add(st.accepts); acc.preAccepts.add(st.preAccepts)
              acc.fallbacks.add(st.fallbacks)
              acc.initNanos.add(st.initNanos); acc.initCount.add(st.initCount)
              val mgrBytes = sampler match {
                case m: MHSampler => m.managerBytes
                case _            => 0L
              }
              acc.localBytes.add(st.lazyBytes + mgrBytes)
            }
            h
          }
          override def next(): Array[Int] = inner.next()
        }
      }
    (walks, acc)
  }
}
