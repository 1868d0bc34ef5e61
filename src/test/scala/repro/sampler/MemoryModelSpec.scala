package repro.sampler

import org.scalatest.funsuite.AnyFunSuite

import repro.graph.GraphGen

/** Paper-scale memory accounting: the formulas must reproduce the paper's
  * out-of-memory (`*`) pattern in Tables VI and VII on a 96 GB server.
  */
class MemoryModelSpec extends AnyFunSuite {
  private val twitter = GraphGen.datasets("Twitter")
  private val webuk = GraphGen.datasets("Web-UK")
  private val youtube = GraphGen.datasets("YouTube")
  private val flickr = GraphGen.datasets("Flickr")

  test("Table VII: second-order alias OOMs on both billion-edge networks") {
    assert(MemoryModel.oomMark(twitter, "alias(precompute)", secondOrder = true) == "*")
    assert(MemoryModel.oomMark(webuk, "alias(precompute)", secondOrder = true) == "*")
  }

  test("Table VII: rejection and KnightKing run on Twitter but OOM on Web-UK") {
    for (s <- Seq("rejection", "knightking")) {
      assert(MemoryModel.oomMark(twitter, s, secondOrder = true) == "", s)
      assert(MemoryModel.oomMark(webuk, s, secondOrder = true) == "*", s)
    }
  }

  test("Table VII: M-H fits both billion-edge networks") {
    assert(MemoryModel.oomMark(twitter, "mh(Weight)", secondOrder = true) == "")
    assert(MemoryModel.oomMark(webuk, "mh(Weight)", secondOrder = true) == "")
  }

  test("Table VII: memory-aware fits both by construction") {
    assert(MemoryModel.oomMark(twitter, "memory-aware(80MB)", secondOrder = true) == "")
    assert(MemoryModel.oomMark(webuk, "memory-aware(80MB)", secondOrder = true) == "")
  }

  test("Table VI: open-sourced deepwalk runs on Twitter, OOMs on Web-UK") {
    assert(MemoryModel.oomMark(twitter, "direct", secondOrder = false, openSourceImpl = true) == "")
    assert(MemoryModel.oomMark(webuk, "direct", secondOrder = false, openSourceImpl = true) == "*")
  }

  test("Table VI: open-sourced node2vec (alias) OOMs on the billion-edge pair only") {
    assert(MemoryModel.oomMark(twitter, "alias(precompute)", secondOrder = true, openSourceImpl = true) == "*")
    assert(MemoryModel.oomMark(flickr, "alias(precompute)", secondOrder = true, openSourceImpl = true) == "")
    assert(MemoryModel.oomMark(youtube, "alias(precompute)", secondOrder = true, openSourceImpl = true) == "")
  }

  test("Table VI: UniNet(Orig) node2vec OOMs on Twitter/Web-UK, runs on YouTube") {
    assert(MemoryModel.oomMark(twitter, "alias(precompute)", secondOrder = true) == "*")
    assert(MemoryModel.oomMark(webuk, "alias(precompute)", secondOrder = true) == "*")
    assert(MemoryModel.oomMark(youtube, "alias(precompute)", secondOrder = true) == "")
  }

  test("Table VI: M-H deepwalk and node2vec fit everywhere") {
    for (cfg <- GraphGen.datasets.values) {
      assert(MemoryModel.oomMark(cfg, "mh(Weight)", secondOrder = false) == "", cfg.name)
      assert(MemoryModel.oomMark(cfg, "mh(Weight)", secondOrder = true) == "", cfg.name)
    }
  }

  test("graph bytes formula") {
    assert(MemoryModel.graphBytes(10, 100) == 8L * 100 + 4L * 10)
  }

  test("footprint totals and the 96 GB threshold") {
    val f = MemoryModel.Footprint(50L << 30, 50L << 30)
    assert(f.total == 100L << 30)
    assert(f.oomAt(MemoryModel.PaperServerBytes))
    assert(!MemoryModel.Footprint(40L << 30, 40L << 30).oomAt(MemoryModel.PaperServerBytes))
  }

  test("unknown sampler names are rejected") {
    assertThrows[IllegalArgumentException] {
      MemoryModel.paperScale(twitter, "bogus", secondOrder = false)
    }
  }

  test("memory-aware accounting never exceeds the budget") {
    val fp = MemoryModel.paperScale(webuk, "memory-aware(80MB)", secondOrder = true)
    assert(fp.total <= MemoryModel.PaperServerBytes)
  }
}
