package repro.engine

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.Hist
import repro.data.{CondCol, Gen, NumCol, RangeCol}

/** Appendix A.1.1: COUNT histograms over a measure-biased sample
  * estimate SUM(Y) histograms.
  */
class MeasureBiasedSpec extends SparkSpec {

  // y ~ uniform[0, 10): avg 5; two candidates with distinct x-shapes
  private lazy val df = Gen.dataset(spark, Seq(
    RangeCol("z", Array(30000L, 30000L)),
    CondCol("x", "z", Array(Array(0.7, 0.2, 0.1), Array(0.2, 0.3, 0.5)), 1),
    NumCol("y", 0.0, 10.0, 2),
  ), seed = 41)

  test("oracle: SUM ground truth matches DuckDB") {
    val got = df.groupBy("z", "x").agg(round(sum(col("y")), 4).as("s"))
    // Oracle ingests columns as VARCHAR; cast the measure explicitly
    Oracle.assertEquivalent(got,
      "SELECT z, x, ROUND(SUM(CAST(y AS DOUBLE)), 4) AS s FROM t GROUP BY z, x",
      "t" -> df.select("z", "x", "y"))
  }

  test("sumHistograms returns the dense SUM(Y) matrix") {
    val sums = MeasureBiased.sumHistograms(df, "z", "x", "y", 2, 3)
    val expected = df.groupBy("z", "x").agg(sum("y")).collect()
      .map(r => (r.getInt(0), r.getInt(1)) -> r.getDouble(2)).toMap
    for (z <- 0 until 2; x <- 0 until 3)
      assert(math.abs(sums(z)(x) - expected((z, x))) < 1e-6)
  }

  test("biased-sample COUNT distribution approximates the SUM distribution") {
    val sample = MeasureBiased.sample(df, "y", avgY = 5.0, rate = 0.3, seed = 77)
    val counts = GroundTruth.histograms(sample, "z", "x", 2, 3)
    val sums = MeasureBiased.sumHistograms(df, "z", "x", "y", 2, 3)
    for (z <- 0 until 2) {
      val est = Hist.normalize(counts(z))
      val truth = Hist.normalize(sums(z))
      assert(Hist.l1(est, truth) < 0.05,
        s"z=$z: biased-count ${est.mkString(",")} vs sum ${truth.mkString(",")}")
    }
  }

  test("plain COUNT distribution does NOT match the SUM distribution when y correlates with x") {
    // make y depend on x so COUNT and SUM shapes diverge
    val skewed = df.withColumn("y2", col("y") * (col("x") + lit(1)))
    val counts = GroundTruth.histograms(skewed, "z", "x", 2, 3)
    val sums = MeasureBiased.sumHistograms(skewed, "z", "x", "y2", 2, 3)
    val plain = Hist.normalize(counts(0))
    val truth = Hist.normalize(sums(0))
    assert(Hist.l1(plain, truth) > 0.2, "COUNT should misestimate SUM here")
    // ... while the measure-biased sample still tracks it
    val sample = MeasureBiased.sample(skewed, "y2", avgY = 10.0, rate = 0.3, seed = 78)
    val biased = GroundTruth.histograms(sample, "z", "x", 2, 3)
    assert(Hist.l1(Hist.normalize(biased(0)), truth) < 0.06)
  }

  test("sample is deterministic in the seed and respects the rate") {
    val a = MeasureBiased.sample(df, "y", 5.0, 0.2, seed = 9).count()
    val b = MeasureBiased.sample(df, "y", 5.0, 0.2, seed = 9).count()
    assert(a == b)
    // expected fraction ~rate (y uniform => E[min(1, rate*y/avg)] ~= rate)
    val frac = a.toDouble / 60000
    assert(math.abs(frac - 0.2) < 0.02, s"frac=$frac")
  }

  test("zero-measure tuples are never sampled") {
    val withZero = df.withColumn("y0", when(col("x") === 0, lit(0.0)).otherwise(col("y")))
    val sample = MeasureBiased.sample(withZero, "y0", 5.0, 0.5, seed = 10)
    assert(sample.filter(col("x") === 0).count() == 0L)
  }

  test("argument validation") {
    intercept[IllegalArgumentException](MeasureBiased.sample(df, "y", 5.0, 0.0, 1))
    intercept[IllegalArgumentException](MeasureBiased.sample(df, "y", 5.0, 1.5, 1))
    intercept[IllegalArgumentException](MeasureBiased.sample(df, "y", 0.0, 0.5, 1))
  }
}
