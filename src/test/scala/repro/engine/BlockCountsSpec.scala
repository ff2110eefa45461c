package repro.engine

import repro.SparkSpec
import repro.data.{CondCol, Gen, RangeCol}

class BlockCountsSpec extends SparkSpec {

  private lazy val (df, numBlocks) = {
    val specs = Seq(
      RangeCol("z", Array(500L, 300L, 100L)),
      CondCol("x", "z", Array(
        Array(0.6, 0.3, 0.1), Array(0.2, 0.5, 0.3), Array(0.1, 0.1, 0.8)), 1),
    )
    Gen.withBlocks(Gen.dataset(spark, specs, seed = 21), 900L, tuplesPerBlock = 32, seed = 22)
  }

  private lazy val prefetched = PrefetchedCounts.build(df, "z", "x", "block", numBlocks)
  private lazy val sparkReader = new SparkRoundReader(df, "z", "x", "block", numBlocks)

  test("prefetched totals equal the full dataset") {
    val total = (0 until numBlocks).map(prefetched.tuplesInBlock).sum
    assert(total == 900L)
  }

  test("prefetched per-block counts match a direct Spark aggregation") {
    val expected = df.groupBy("block", "z", "x").count().collect()
      .map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getLong(3)).toMap
    var seen = 0
    for (b <- 0 until numBlocks) {
      prefetched.foreachInBlock(b) { (z, x, c) =>
        assert(expected((b, z, x)) == c.toLong, s"block=$b z=$z x=$x")
        seen += 1
      }
    }
    assert(seen == expected.size)
  }

  test("SparkRoundReader and PrefetchedCounts agree on arbitrary batches") {
    val batches = Seq(
      Array(0, 1, 2),
      Array(numBlocks - 1),
      Array(5, 3, 17 % numBlocks),
      Array.range(0, numBlocks),
    )
    for (batch <- batches) {
      val a = prefetched.read(batch).map(_.sortBy(t => (t._1, t._2)).toSeq)
      val b = sparkReader.read(batch).map(_.sortBy(t => (t._1, t._2)).toSeq)
      assert(a.toSeq == b.toSeq, s"batch ${batch.mkString(",")}")
    }
  }

  test("read preserves requested block order") {
    val batch = Array(7 % numBlocks, 2, 11 % numBlocks)
    val res = prefetched.read(batch)
    assert(res.length == batch.length)
    // order check: counts per slot must equal per-block counts
    batch.zip(res).foreach { case (b, triples) =>
      assert(triples.map(_._3.toLong).sum == prefetched.tuplesInBlock(b))
    }
  }

  test("empty batch yields empty result") {
    assert(prefetched.read(Array.empty).isEmpty)
    assert(sparkReader.read(Array.empty).isEmpty)
  }

  test("allTriples visits every CSR entry with its owning block") {
    val fromIter = prefetched.allTriples.toSeq.groupBy(_._1)
      .view.mapValues(_.size).toMap
    for (b <- 0 until numBlocks) {
      var cnt = 0
      prefetched.foreachInBlock(b)((_, _, _) => cnt += 1)
      assert(fromIter.getOrElse(b, 0) == cnt, s"block $b")
    }
  }

  test("reading all blocks reconstructs exact histograms") {
    val counts = Array.fill(3)(new Array[Long](3))
    for (b <- 0 until numBlocks)
      prefetched.foreachInBlock(b)((z, x, c) => counts(z)(x) += c)
    val expected = GroundTruth.histograms(df, "z", "x", 3, 3)
    for (z <- 0 until 3)
      assert(counts(z).sameElements(expected(z)), s"z=$z")
  }
}
