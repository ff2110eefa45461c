package repro.data

import org.apache.spark.sql.{Column, DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Column specifications for synthetic histogram-matching datasets.
  *
  * A dataset is a table of categorical attributes generated row-by-row
  * from a deterministic hash of the row id, so that the same (spec, seed)
  * always yields identical data regardless of partitioning — a property
  * the DuckDB oracle tests rely on.
  */
sealed trait ColSpec { def name: String }

/** Candidate column with exact per-value counts: value v occupies the
  * contiguous id range [cum(v), cum(v+1)). This pins candidate
  * frequencies exactly (the paper's "replications" similarly pin scale).
  */
final case class RangeCol(name: String, freq: Array[Long]) extends ColSpec

/** Categorical column drawn i.i.d. from `weights` (normalized internally). */
final case class IidCol(name: String, weights: Array[Double], seedOffset: Int) extends ColSpec

/** Categorical column drawn conditioned on an earlier column's value:
  * row with parent value z draws from distribution `dists(z)`. This is
  * how per-candidate histogram shapes are planted.
  */
final case class CondCol(name: String, parent: String, dists: Array[Array[Double]], seedOffset: Int)
    extends ColSpec

/** Filler numeric attribute uniform in [lo, hi) — present so dataset
  * widths resemble the paper's Table 2, never used by queries.
  */
final case class NumCol(name: String, lo: Double, hi: Double, seedOffset: Int) extends ColSpec

/** Deterministic synthetic-dataset generator.
  *
  * Uniform variates come from `xxhash64(id, seed)` mapped into [0, 1) —
  * pure Catalyst, no RNG state, stable under repartitioning. Categorical
  * draws invert a CDF via a small UDF over (parentValue, u).
  */
object Gen {
  private val M53 = 1L << 53

  /** Deterministic uniform in [0, 1) from the row id and a seed. */
  def u01(idCol: Column, seed: Long): Column =
    pmod(xxhash64(idCol, lit(seed)), lit(M53)).cast("double") / lit(M53.toDouble)

  private def cdfOf(weights: Array[Double]): Array[Double] = {
    val total = weights.sum
    require(total > 0, "weights must have positive mass")
    val cdf = new Array[Double](weights.length)
    var acc = 0.0
    var i = 0
    while (i < weights.length) { acc += weights(i) / total; cdf(i) = acc; i += 1 }
    cdf(weights.length - 1) = 1.0 // guard against fp undershoot
    cdf
  }

  private def invert(cdf: Array[Double], u: Double): Int = {
    val pos = java.util.Arrays.binarySearch(cdf, u)
    val idx = if (pos >= 0) pos + 1 else -pos - 1
    math.min(idx, cdf.length - 1)
  }

  /** Build the dataset. The first spec must be the [[RangeCol]] candidate
    * column; its frequency vector fixes the total row count. The output
    * has an `id` column (0-based row id) plus one column per spec.
    */
  def dataset(spark: SparkSession, specs: Seq[ColSpec], seed: Long): DataFrame = {
    require(specs.nonEmpty && specs.head.isInstanceOf[RangeCol],
      "first column spec must be a RangeCol fixing the candidate frequencies")
    val range = specs.head.asInstanceOf[RangeCol]
    val rows = range.freq.sum
    require(rows > 0, "dataset must have at least one row")

    val cum = range.freq.scanLeft(0L)(_ + _) // length |V_Z| + 1
    val rangeLookup = udf { (id: Long) =>
      // first v with cum(v+1) > id
      val pos = java.util.Arrays.binarySearch(cum, id)
      if (pos >= 0) pos else -pos - 2
    }

    var df = spark.range(rows).withColumn(range.name, rangeLookup(col("id")))
    specs.tail.foreach {
      case IidCol(name, weights, off) =>
        val cdf = cdfOf(weights)
        val draw = udf { (u: Double) => invert(cdf, u) }
        df = df.withColumn(name, draw(u01(col("id"), seed + off)))
      case CondCol(name, parent, dists, off) =>
        val cdfs = dists.map(cdfOf)
        val draw = udf { (z: Int, u: Double) => invert(cdfs(z), u) }
        df = df.withColumn(name, draw(col(parent), u01(col("id"), seed + off)))
      case NumCol(name, lo, hi, off) =>
        df = df.withColumn(name, lit(lo) + u01(col("id"), seed + off) * lit(hi - lo))
      case rc: RangeCol =>
        throw new IllegalArgumentException(s"only the first spec may be a RangeCol: ${rc.name}")
    }
    df
  }

  /** Assign each tuple to a storage block uniformly at random — the
    * Spark analogue of the paper's preprocessing step that randomly
    * permutes tuples on disk (Section 4.2, Challenge 1): a linear scan of
    * blocks in id order is then a uniform without-replacement sample.
    * Returns the augmented frame and the number of blocks.
    */
  def withBlocks(df: DataFrame, rows: Long, tuplesPerBlock: Int, seed: Long): (DataFrame, Int) = {
    require(tuplesPerBlock >= 1)
    val numBlocks = math.max(1L, (rows + tuplesPerBlock - 1) / tuplesPerBlock).toInt
    val out = df.withColumn("block",
      (u01(col("id"), seed) * lit(numBlocks)).cast("int"))
    (out, numBlocks)
  }
}
