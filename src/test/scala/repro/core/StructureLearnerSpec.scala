package repro.core

import repro.{Oracle, SparkSpec}
import repro.linalg.Mat

class StructureLearnerSpec extends SparkSpec {

  test("similarityObservations yields m-dim vectors in [0,1]") {
    val df = Fixtures.fdTable(spark, 60)
    val obs = StructureLearner.similarityObservations(df, Fixtures.fdAttrs).collect()
    assert(obs.nonEmpty)
    assert(obs.forall(_.length == 3))
    assert(obs.forall(_.forall(v => v >= 0.0 && v <= 1.0)))
  }

  test("similarityObservations count is ~ m sorts × (n − partitions)") {
    val df = Fixtures.fdTable(spark, 60).coalesce(1)
    val obs = StructureLearner.similarityObservations(df, Fixtures.fdAttrs).count()
    assert(obs == 3 * 59) // one partition → exactly n−1 pairs per sort
  }

  test("identical-attribute pairs produce similarity 1") {
    // Sorting by "code" puts equal codes adjacent; their city/state also
    // agree in a clean FD table, so most vector entries are exactly 1.
    val df = Fixtures.fdTable(spark, 100).coalesce(1)
    val obs = StructureLearner.similarityObservations(df, Fixtures.fdAttrs).collect()
    val ones = obs.map(_.count(_ == 1.0)).sum.toDouble / (obs.length * 3)
    assert(ones > 0.5, s"fraction of exact agreements $ones")
  }

  test("covariance matches a DuckDB aggregate") {
    val df = Fixtures.fdTable(spark, 50).coalesce(1)
    val obs = StructureLearner.similarityObservations(df, Fixtures.fdAttrs)
    val sigma = StructureLearner.covariance(obs, 3)
    // Cross-check one covariance entry against DuckDB over the same vectors.
    import spark.implicits._
    val obsDf = obs.map(a => (a(0), a(1), a(2))).toDF("s0", "s1", "s2")
    val sparkAgg = obsDf.selectExpr(
      "cast(avg(s0*s1) - avg(s0)*avg(s1) as double) as cov01")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT avg(CAST(s0 AS DOUBLE)*CAST(s1 AS DOUBLE)) - avg(CAST(s0 AS DOUBLE))*avg(CAST(s1 AS DOUBLE)) AS cov01 FROM obs",
      "obs" -> obsDf)
    val duckLike = obsDf.selectExpr("avg(s0*s1) - avg(s0)*avg(s1) as c").collect()(0).getDouble(0)
    assert(math.abs(sigma(0, 1) - duckLike) < 1e-9)
  }

  test("sinkOrdering puts the root of a chain first") {
    // Precision of x0→x1→x2 (coef .7, noise var .36): Θ = (I−B)ᵀΩ⁻¹(I−B) =
    // [[4.14,−1.94,0],[−1.94,4.14,−1.94],[0,−1.94,2.78]] — the sink x2 has
    // the smallest diagonal.
    val theta = Mat.of(3, 3)(4.14, -1.94, 0.0, -1.94, 4.14, -1.94, 0.0, -1.94, 2.78)
    val ord = StructureLearner.sinkOrdering(theta)
    assert(ord.last == 2)
    assert(ord.head == 0 || ord.head == 1)
  }

  test("autoregression recovers chain coefficients") {
    // Θ built from SEM x1 = 0.8·x0 + ε, x2 = 0.5·x1 + ε (Ω = I):
    // Θ = (I−B)ᵀ(I−B) with B(1,0)=0.8, B(2,1)=0.5.
    val b0 = Mat.zeros(3, 3); b0(1, 0) = 0.8; b0(2, 1) = 0.5
    val imb = Mat.eye(3) - b0
    val theta = imb.t * imb
    val order = Seq(0, 1, 2)
    val b = StructureLearner.autoregression(theta, order)
    assert(math.abs(b(1, 0) - 0.8) < 1e-9, b.toString)
    assert(math.abs(b(2, 1) - 0.5) < 1e-9)
    assert(math.abs(b(2, 0)) < 1e-9)
  }

  test("learn discovers FD-aligned edges on a clean relation") {
    val df = Fixtures.fdTable(spark, 200)
    val dag = StructureLearner.learn(df, Fixtures.fdAttrs)
    // code/city/state are mutually deterministic: expect a connected graph.
    assert(dag.edges.nonEmpty, "expected at least one edge")
    val connected = (0 until 3).filter(v => dag.parents(v).nonEmpty || dag.children(v).nonEmpty)
    assert(connected.size == 3, s"dag=${dag.edges}")
  }

  test("learn tolerates dirty data (softened FDs)") {
    val dag = StructureLearner.learn(Fixtures.fdTableDirty(spark, 200), Fixtures.fdAttrs)
    assert(dag.edges.nonEmpty)
  }

  test("learn respects the maxParents cap") {
    val df = Fixtures.fdTable(spark, 150)
    val dag = StructureLearner.learn(df, Fixtures.fdAttrs,
      StructureLearner.Config(maxParents = 1))
    assert((0 until 3).forall(v => dag.parents(v).size <= 1))
  }

  test("learn on an uncorrelated relation yields few edges") {
    import spark.implicits._
    val rng = new scala.util.Random(3)
    val df = (0 until 300).map(i =>
      (i.toLong, rng.nextInt(50).toString, rng.nextInt(50).toString, rng.nextInt(50).toString))
      .toDF("_tid", "a", "b", "c")
    val dag = StructureLearner.learn(df, Seq("a", "b", "c"))
    assert(dag.edges.size <= 1, s"independent attrs produced ${dag.edges}")
  }
}
