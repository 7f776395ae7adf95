package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.core.{BClean, CompensatoryScore, Metrics}

/** spark-submit entrypoint regenerating Tables 8–10 (λ/β/τ sweeps, Hospital). */
object RunTables8to10 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("bclean-tables8to10").getOrCreate()
    val ds = Harness.dataset(spark, "Hospital")
    def f1(lambda: Double, beta: Double, tau: Double): Double = {
      val cfg = BClean.Config(score = CompensatoryScore.Params(lambda, beta, tau))
      val cleaned = BClean.clean(ds.dirty, ds.attrs, ds.ucs, cfg, userEdits = ds.fdEdges)
      Metrics.evaluate(ds.dirty, cleaned, ds.clean, ds.attrs).f1
    }
    Seq(0.0, 1.0, 2.0, 5.0, 10.0, 15.0).foreach(l => println(f"lambda=$l F1=${f1(l, 2, 0.5)}%.5f"))
    Seq(0.0, 1.0, 2.0, 10.0, 50.0).foreach(b => println(f"beta=$b F1=${f1(1, b, 0.5)}%.5f"))
    Seq(0.1, 0.3, 0.5, 0.7, 0.9).foreach(t => println(f"tau=$t F1=${f1(1, 2, t)}%.5f"))
    spark.stop()
  }
}
