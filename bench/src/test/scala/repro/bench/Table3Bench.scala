package repro.bench

import repro.SparkSpec
import repro.core.Hist
import repro.data.{TargetSpec, Workloads}
import repro.engine.GroundTruth

/** Reproduces Table 3: "Summary of queries".
  *
  * Prints each query's template — Z(|V_Z|), X(|V_X|), k, target — with
  * the target resolved against the generated data (e.g. which candidate
  * is "closest to uniform"), and validates the dimensional structure the
  * paper calls out: frequent vs rare top-k, high-cardinality Z, and
  * high-cardinality X.
  */
class Table3Bench extends SparkSpec {

  private val sf = sys.env.getOrElse("REPRO_BENCH_SF", "0.2").toDouble

  private lazy val datasets =
    Workloads.queries.map(_.dataset).distinct
      .map { n =>
        val ds = Workloads.dataset(spark, n, sf)
        ds.df.cache().count()
        n -> ds
      }.toMap

  private lazy val rows = Workloads.queries.map { q =>
    val ds = datasets(q.dataset)
    val truth = GroundTruth.forQuery(spark, ds, q)
    (q, ds, truth)
  }

  test("Table 3: query summaries with resolved targets") {
    println(f"${"Query"}%-12s ${"Z(|V_Z|)"}%-18s ${"X(|V_X|)"}%-20s k   target")
    rows.foreach { case (q, _, truth) =>
      val desc = q.target match {
        case TargetSpec.FromCandidate(z) => s"candidate $z's histogram"
        case TargetSpec.Explicit(v)      => v.map(x => f"$x%.3f").mkString("[", ", ", "]")
        case TargetSpec.ClosestToUniform =>
          val u = Hist.uniform(q.vx)
          val d = GroundTruth.distances(truth.hists, u)
          s"closest to uniform = candidate ${d.indices.minBy(d)}"
      }
      println(f"${q.dataset + "-" + q.name}%-12s ${q.zCol + s"(${q.vz})"}%-18s " +
        f"${q.xCol + s"(${q.vx})"}%-20s ${q.k}%-3d $desc")
      assert(truth.target.length == q.vx)
      assert(math.abs(truth.target.sum - 1.0) < 1e-9)
    }
  }

  test("Table 3: FLIGHTS-q1 top-k candidates are frequently-appearing") {
    val (q, ds, truth) = rows.find(r => r._1.dataset == "FLIGHTS" && r._1.name == "q1").get
    val freq = Workloads.flightsFreq(sf)
    val medianFreq = freq.sorted.apply(freq.length / 2)
    assert(truth.topK.forall(z => freq(z) > medianFreq),
      s"q1 top-k ${truth.topK.mkString(",")} should be frequent")
    assert(q.k == 10 && ds.rows == freq.sum)
  }

  test("Table 3: FLIGHTS-q2/q3 top-k candidates are rarely-appearing") {
    val freq = Workloads.flightsFreq(sf)
    val medianFreq = freq.sorted.apply(freq.length / 2)
    for (name <- Seq("q2", "q3")) {
      val (_, _, truth) = rows.find(r => r._1.dataset == "FLIGHTS" && r._1.name == name).get
      assert(truth.topK.forall(z => freq(z) < medianFreq),
        s"$name top-k ${truth.topK.mkString(",")} should be rare")
    }
  }

  test("Table 3: TAXI and POLICE-q3 have high-cardinality Z") {
    assert(Workloads.queries.filter(_.dataset == "TAXI").forall(_.vz == 2000))
    assert(Workloads.queries.find(q => q.dataset == "POLICE" && q.name == "q3").get.vz == 800)
  }

  test("Table 3: FLIGHTS-q4 has high-cardinality X (|V_X| = |V_Z| = 161)") {
    val q = Workloads.queries.find(q => q.dataset == "FLIGHTS" && q.name == "q4").get
    assert(q.vx == 161 && q.vz == 161)
  }

  test("Table 3: explicit q3 target matches the paper's vector") {
    val q = Workloads.queries.find(q => q.dataset == "FLIGHTS" && q.name == "q3").get
    q.target match {
      case TargetSpec.Explicit(v) =>
        assert(v.sameElements(Array(0.25, 0.125, 0.125, 0.125, 0.125, 0.125, 0.125)))
      case other => fail(s"expected explicit target, got $other")
    }
  }

  test("Table 3: closest-to-uniform targets resolve to planted near-uniform candidates") {
    for ((q, _, truth) <- rows if q.target == TargetSpec.ClosestToUniform) {
      val u = Hist.uniform(q.vx)
      val d = GroundTruth.distances(truth.hists, u)
      val closest = d.indices.minBy(d)
      val plantedCluster = if (q.dataset == "POLICE" && q.name == "q3") 0 until 5 else 0 until 10
      assert(plantedCluster.contains(closest),
        s"${q.dataset}-${q.name}: closest-to-uniform candidate $closest outside planted cluster")
    }
  }
}
