package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness
import repro.core.Metrics

/** spark-submit entrypoint regenerating the measured side of Table 6
  * (recall per error type).
  */
object RunTable6 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("bclean-table6").getOrCreate()
    for {
      dsName <- Seq("Soccer", "Inpatient", "Facilities")
      method <- Seq("BClean_PI", "PClean", "HoloClean", "Raha+Baran")
    } {
      val ds = Harness.dataset(spark, dsName)
      val run = Harness.run(spark, ds, method)
      val rec = Metrics.recallByType(ds.dirty, run.cleaned, ds.clean, ds.attrs, ds.mask)
      println(f"$dsName%-11s $method%-11s " +
        f"T=${rec.getOrElse("T", 0.0)}%.3f M=${rec.getOrElse("M", 0.0)}%.3f " +
        f"I=${rec.getOrElse("I", 0.0)}%.3f S=${rec.getOrElse("S", 0.0)}%.3f")
    }
    spark.stop()
  }
}
