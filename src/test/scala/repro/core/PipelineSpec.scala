package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.model.{DeepWalk, Node2Vec}
import repro.sampler.{AliasSamplerFactory, HighWeightInit, MHSamplerFactory}

/** End-to-end pipeline with phase timing (Ti / Tw / Tl accounting). */
class PipelineSpec extends SparkSpec {
  private lazy val g = TestGraphs.mediumGraph(n = 120, mult = 3)
  private lazy val bcG = spark.sparkContext.broadcast(g)

  test("full run produces walks, tokens, and non-negative phase times") {
    val r = Pipeline.run(spark, bcG, new DeepWalk, new MHSamplerFactory(HighWeightInit()),
                         RunConfig(numWalks = 2, walkLen = 8, partitions = 4, learn = true,
                                   dim = 8, learnPartitions = 2))
    assert(r.walkCount == 2L * g.numNodes)
    assert(r.tokenCount == r.walkCount * 9) // connected: full length walks
    assert(r.times.tInit >= 0 && r.times.tWalk >= 0 && r.times.tLearn > 0)
    assert(math.abs(r.times.tTotal - (r.times.tInit + r.times.tWalk + r.times.tLearn)) < 1e-9)
  }

  test("learn = false skips the learning phase") {
    val r = Pipeline.run(spark, bcG, new DeepWalk, new MHSamplerFactory(HighWeightInit()),
                         RunConfig(numWalks = 1, walkLen = 5, partitions = 2))
    assert(r.times.tLearn == 0.0)
  }

  test("precompute-all alias attributes its build to Ti, not Tw") {
    val m = new Node2Vec(0.5, 2.0)
    val r = Pipeline.run(spark, bcG, m, new AliasSamplerFactory(precomputeAll = true),
                         RunConfig(numWalks = 1, walkLen = 5, partitions = 2))
    assert(r.times.tInit > 0)
    assert(r.samplerSharedBytes > 0)
  }

  test("M-H lazy initialization is separated out of Tw") {
    val m = new Node2Vec(0.5, 2.0)
    val r = Pipeline.run(spark, bcG, m, new MHSamplerFactory(HighWeightInit()),
                         RunConfig(numWalks = 2, walkLen = 10, partitions = 2))
    assert(r.initCount > 0)    // states were lazily initialized
    assert(r.times.tInit > 0)  // ... and their cost shows up in Ti
    assert(r.samplerLocalBytes > 0) // LAST_x storage was allocated
  }

  test("acceptance ratio is reported and sane for M-H") {
    val r = Pipeline.run(spark, bcG, new DeepWalk, new MHSamplerFactory(HighWeightInit()),
                         RunConfig(numWalks = 2, walkLen = 10, partitions = 2))
    assert(r.acceptanceRatio > 0 && r.acceptanceRatio <= 1.0)
  }

  test("single-partition baseline configuration runs") {
    val r = Pipeline.run(spark, bcG, new DeepWalk, repro.sampler.DirectSamplerFactory,
                         RunConfig(numWalks = 1, walkLen = 5, partitions = 1,
                                   parallelPrepare = false))
    assert(r.walkCount == g.numNodes)
  }
}
