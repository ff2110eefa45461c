package repro.engine

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Supplies the contents of storage blocks as (z, x, count) triples —
  * the I/O-manager abstraction. Two implementations:
  *
  *  - [[SparkRoundReader]] issues one distributed DataFrame aggregation
  *    per requested batch of blocks (the online-sampling path: each
  *    HistSim round is a real sample-then-aggregate Spark job);
  *  - [[PrefetchedCounts]] runs a single Spark groupBy(block, z, x) pass
  *    up front and serves blocks from driver memory, enabling the
  *    fine-grained (per-4KiB-block) simulation the benchmarks need
  *    without paying per-round Spark job latency.
  *
  * Both must agree exactly (tested).
  */
trait BlockReader {
  def numBlocks: Int

  /** For each requested block id (order preserved), its (z, x, count)
    * triples. A block with no tuples yields an empty array.
    */
  def read(blocks: Array[Int]): Array[Array[(Int, Int, Int)]]
}

/** One Spark job per batch: filter to the sampled blocks, aggregate. */
final class SparkRoundReader(df: DataFrame, zCol: String, xCol: String,
                             blockCol: String, val numBlocks: Int) extends BlockReader {

  override def read(blocks: Array[Int]): Array[Array[(Int, Int, Int)]] = {
    if (blocks.isEmpty) return Array.empty
    val rows = df
      .filter(col(blockCol).isin(blocks.map(Integer.valueOf): _*))
      .groupBy(col(blockCol).as("b"), col(zCol).as("z"), col(xCol).as("x"))
      .agg(count(lit(1)).as("c"))
      .collect()
    val byBlock = rows.groupBy(r => asInt(r.get(0)))
    blocks.map { b =>
      byBlock.get(b) match {
        case Some(rs) => rs.map(r => (asInt(r.get(1)), asInt(r.get(2)), r.getLong(3).toInt))
        case None     => Array.empty[(Int, Int, Int)]
      }
    }
  }

  private def asInt(v: Any): Int = v match {
    case i: Int  => i
    case l: Long => l.toInt
    case other   => throw new IllegalStateException(s"expected integral value, got $other")
  }
}

/** Driver-resident per-block counts in CSR layout. */
final class PrefetchedCounts private (
    val numBlocks: Int,
    offsets: Array[Int], // length numBlocks + 1
    zArr: Array[Int],
    xArr: Array[Int],
    cArr: Array[Int],
) extends BlockReader {

  override def read(blocks: Array[Int]): Array[Array[(Int, Int, Int)]] =
    blocks.map { b =>
      val from = offsets(b); val until = offsets(b + 1)
      Array.tabulate(until - from)(i => (zArr(from + i), xArr(from + i), cArr(from + i)))
    }

  /** Iterate one block's triples without allocation (hot path for the
    * driver-side simulation loop).
    */
  def foreachInBlock(b: Int)(f: (Int, Int, Int) => Unit): Unit = {
    var i = offsets(b)
    while (i < offsets(b + 1)) { f(zArr(i), xArr(i), cArr(i)); i += 1 }
  }

  def tuplesInBlock(b: Int): Long = {
    var i = offsets(b); var s = 0L
    while (i < offsets(b + 1)) { s += cArr(i); i += 1 }
    s
  }

  def allTriples: Iterator[(Int, Int, Int)] =
    zArr.indices.iterator.map(i => (blockOf(i), zArr(i), xArr(i)))

  private def blockOf(entry: Int): Int = {
    // binary search for the block owning CSR entry index
    var lo = 0; var hi = numBlocks - 1
    while (lo < hi) {
      val mid = (lo + hi + 1) >>> 1
      if (offsets(mid) <= entry) lo = mid else hi = mid - 1
    }
    lo
  }
}

object PrefetchedCounts {

  /** One full groupBy(block, z, x) Spark pass, collected and packed. */
  def build(df: DataFrame, zCol: String, xCol: String, blockCol: String,
            numBlocks: Int): PrefetchedCounts = {
    val rows = df
      .groupBy(col(blockCol).as("b"), col(zCol).as("z"), col(xCol).as("x"))
      .agg(count(lit(1)).as("c"))
      .collect()
    val n = rows.length
    val blocks = new Array[Int](n)
    val zs = new Array[Int](n)
    val xs = new Array[Int](n)
    val cs = new Array[Int](n)
    var i = 0
    while (i < n) {
      val r = rows(i)
      blocks(i) = asInt(r.get(0)); zs(i) = asInt(r.get(1))
      xs(i) = asInt(r.get(2)); cs(i) = r.getLong(3).toInt
      i += 1
    }
    // counting sort by block into CSR
    val offsets = new Array[Int](numBlocks + 1)
    i = 0
    while (i < n) { offsets(blocks(i) + 1) += 1; i += 1 }
    i = 0
    while (i < numBlocks) { offsets(i + 1) += offsets(i); i += 1 }
    val pos = offsets.clone()
    val zOut = new Array[Int](n); val xOut = new Array[Int](n); val cOut = new Array[Int](n)
    i = 0
    while (i < n) {
      val p = pos(blocks(i)); pos(blocks(i)) += 1
      zOut(p) = zs(i); xOut(p) = xs(i); cOut(p) = cs(i)
      i += 1
    }
    new PrefetchedCounts(numBlocks, offsets, zOut, xOut, cOut)
  }

  private def asInt(v: Any): Int = v match {
    case i: Int  => i
    case l: Long => l.toInt
    case other   => throw new IllegalStateException(s"expected integral value, got $other")
  }
}
