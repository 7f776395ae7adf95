package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness

/** spark-submit entrypoint regenerating the measured side of Table 2. */
object RunTable2 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("bclean-table2").getOrCreate()
    Harness.datasets(spark).foreach { ds =>
      val rows = ds.dirty.count()
      val cells = rows * ds.attrs.length
      val noise = ds.mask.count().toDouble / cells
      println(f"${ds.name}%-11s rows=$rows cols=${ds.attrs.length} cells=$cells " +
        f"noise=${noise * 100}%.1f%% types=${ds.errorTypes.mkString(",")} ucs=${ds.ucs.count}")
    }
    spark.stop()
  }
}
