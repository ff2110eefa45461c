package repro.index

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.data.{CondCol, Gen, RangeCol}

class BitmapIndexSpec extends SparkSpec {

  private lazy val (df, numBlocks) = {
    val specs = Seq(
      RangeCol("z", Array(400L, 200L, 50L, 10L)),
      CondCol("x", "z", Array.fill(4)(Array(0.5, 0.5)), 1),
    )
    Gen.withBlocks(Gen.dataset(spark, specs, seed = 17), 660L, tuplesPerBlock = 16, seed = 18)
  }

  private lazy val index = BitmapIndex.build(df, "z", 4, "block", numBlocks)

  test("bitmap bit is set iff the block contains the candidate") {
    val present = df.select("z", "block").collect()
      .map(r => (r.getInt(0), r.getInt(1))).toSet
    for (z <- 0 until 4; b <- 0 until numBlocks) {
      assert(index.contains(z, b) == present((z, b)),
        s"mismatch at z=$z b=$b")
    }
  }

  test("blockCount equals the number of distinct blocks per candidate") {
    val expected = df.groupBy("z").agg(countDistinct("block").as("c")).collect()
      .map(r => r.getInt(0) -> r.getLong(1)).toMap
    for (z <- 0 until 4) assert(index.blockCount(z) == expected(z).toInt)
  }

  test("a rare candidate appears in few blocks, a frequent one in many") {
    assert(index.blockCount(0) > index.blockCount(3))
    assert(index.blockCount(3) <= 10)
  }

  test("candidate with no tuples has an empty bitmap") {
    // vz=5 while data has only 0..3
    val idx5 = BitmapIndex.build(df, "z", 5, "block", numBlocks)
    assert(idx5.blockCount(4) == 0)
    assert((0 until numBlocks).forall(b => !idx5.contains(4, b)))
  }

  test("fromBlockTriples agrees with the Spark-built index") {
    val triples = df.select("block", "z").collect()
      .map(r => (r.getInt(0), r.getInt(1), 1)).iterator
    val idx2 = BitmapIndex.fromBlockTriples(triples, 4, numBlocks)
    for (z <- 0 until 4) {
      assert(idx2.bitmaps(z) == index.bitmaps(z), s"bitmap mismatch for z=$z")
    }
  }

  test("build rejects out-of-range candidate values") {
    intercept[Exception] {
      BitmapIndex.build(df, "z", 2, "block", numBlocks) // vz too small
    }
  }
}
