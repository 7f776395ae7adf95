package repro.core

import repro.{Oracle, SparkSpec}

class MetricsSpec extends SparkSpec {

  private val attrs = Seq("a", "b")

  private def df(rows: (Long, String, String)*) = {
    import spark.implicits._
    rows.toSeq.toDF("_tid", "a", "b")
  }

  test("melt produces one row per cell") {
    val m = Metrics.melt(df((0L, "x", "y"), (1L, "p", "q")), attrs)
    assert(m.count() == 4)
    assert(m.columns.toSeq == Seq("_tid", "attr", "value"))
  }

  test("melt matches DuckDB unpivot") {
    val d = df((0L, "x", "y"), (1L, "p", "q"))
    val m = Metrics.melt(d, attrs)
    Oracle.assertEquivalent(
      m,
      """SELECT _tid, 'a' AS attr, coalesce(a,'') AS value FROM t
         UNION ALL SELECT _tid, 'b', coalesce(b,'') FROM t""",
      "t" -> d)
  }

  test("melt normalizes nulls to empty string") {
    import spark.implicits._
    val d = Seq((0L, null.asInstanceOf[String], "y")).toDF("_tid", "a", "b")
    val vals = Metrics.melt(d, attrs).collect().map(_.getString(2)).toSet
    assert(vals == Set("", "y"))
  }

  test("perfect cleaning gives P=R=F1=1") {
    val dirty = df((0L, "x", "WRONG"), (1L, "p", "q"))
    val truth = df((0L, "x", "y"), (1L, "p", "q"))
    val prf = Metrics.evaluate(dirty, truth, truth, attrs)
    assert(prf.precision == 1.0 && prf.recall == 1.0 && prf.f1 == 1.0)
    assert(prf.errors == 1 && prf.repairs == 1 && prf.correctRepairs == 1)
  }

  test("no repairs gives P=0, R=0") {
    val dirty = df((0L, "x", "WRONG"))
    val truth = df((0L, "x", "y"))
    val prf = Metrics.evaluate(dirty, dirty, truth, attrs)
    assert(prf.precision == 0.0 && prf.recall == 0.0 && prf.repairs == 0)
  }

  test("wrong repair hurts precision but not recall numerator") {
    val dirty = df((0L, "x", "WRONG"), (1L, "p", "q"))
    val cleaned = df((0L, "x", "ALSO-WRONG"), (1L, "p", "q"))
    val truth = df((0L, "x", "y"), (1L, "p", "q"))
    val prf = Metrics.evaluate(dirty, cleaned, truth, attrs)
    assert(prf.repairs == 1 && prf.correctRepairs == 0)
    assert(prf.precision == 0.0 && prf.recall == 0.0)
  }

  test("breaking a clean cell counts as an incorrect repair") {
    val dirty = df((0L, "x", "y"))
    val cleaned = df((0L, "x", "BROKEN"))
    val truth = df((0L, "x", "y"))
    val prf = Metrics.evaluate(dirty, cleaned, truth, attrs)
    assert(prf.repairs == 1 && prf.correctRepairs == 0 && prf.errors == 0)
  }

  test("mixed case: P and R computed per paper definitions") {
    // 3 errors; 2 repairs of which 1 correct → P=1/2, R=1/3.
    val dirty = df((0L, "E1", "E2"), (1L, "E3", "q"))
    val cleaned = df((0L, "t1", "STILL-WRONG"), (1L, "E3", "q"))
    val truth = df((0L, "t1", "t2"), (1L, "t3", "q"))
    val prf = Metrics.evaluate(dirty, cleaned, truth, attrs)
    assert(prf.repairs == 2 && prf.correctRepairs == 1 && prf.errors == 3)
    assert(math.abs(prf.precision - 0.5) < 1e-12)
    assert(math.abs(prf.recall - 1.0 / 3.0) < 1e-12)
    assert(math.abs(prf.f1 - 0.4) < 1e-12)
  }

  test("cell counts match DuckDB join") {
    val dirty = df((0L, "E1", "y"), (1L, "p", "q"))
    val cleaned = df((0L, "t1", "y"), (1L, "p", "q"))
    val truth = df((0L, "t1", "y"), (1L, "p", "q"))
    val cells = Metrics.cellTable(dirty, cleaned, truth, attrs)
      .selectExpr("cast(sum(case when cleaned <> dirty then 1 else 0 end) as bigint) as repairs")
    Oracle.assertEquivalent(
      cells,
      """SELECT CAST(sum(CASE WHEN c.value <> d.value THEN 1 ELSE 0 END) AS BIGINT) AS repairs
         FROM (SELECT _tid, 'a' AS attr, a AS value FROM dirty UNION ALL SELECT _tid, 'b', b FROM dirty) d
         JOIN (SELECT _tid, 'a' AS attr, a AS value FROM cleaned UNION ALL SELECT _tid, 'b', b FROM cleaned) c
         USING (_tid, attr)""",
      "dirty" -> dirty, "cleaned" -> cleaned)
  }

  test("recallByType splits by the mask's error types") {
    import spark.implicits._
    val dirty = df((0L, "TYPO", "y"), (1L, "p", ""))
    val cleaned = df((0L, "t1", "y"), (1L, "p", ""))     // fixed T, missed M
    val truth = df((0L, "t1", "y"), (1L, "p", "q"))
    val mask = Seq((0L, "a", "T"), (1L, "b", "M")).toDF("_tid", "attr", "errType")
    val rec = Metrics.recallByType(dirty, cleaned, truth, attrs, mask)
    assert(rec("T") == 1.0 && rec("M") == 0.0)
  }
}
