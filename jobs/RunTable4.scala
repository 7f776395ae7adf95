package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness

/** spark-submit entrypoint regenerating the measured side of Table 4
  * (and, as a byproduct, the execution times of Table 7).
  */
object RunTable4 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("bclean-table4").getOrCreate()
    val methods = if (args.nonEmpty) args.toSeq else Harness.Methods
    for (ds <- Harness.datasets(spark); m <- methods) {
      val r = Harness.run(spark, ds, m)
      println(f"${ds.name}%-11s $m%-11s P=${r.prf.precision}%.3f R=${r.prf.recall}%.3f " +
        f"F1=${r.prf.f1}%.3f exec=${Harness.fmtMillis(r.millis)}")
    }
    spark.stop()
  }
}
