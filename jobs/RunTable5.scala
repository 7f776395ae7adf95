package repro.jobs

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col
import repro.baselines.{HoloCleanLike, PCleanLike, RahaBaranLike}
import repro.bench.Harness
import repro.core.{BClean, Metrics}

/** spark-submit entrypoint regenerating the measured side of Table 5
  * (sampled Soccer).
  */
object RunTable5 {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("bclean-table5").getOrCreate()
    val full = Harness.dataset(spark, "Soccer")
    val sampleRows = math.max(500L, Harness.soccerRows / 4)
    val ds = full.copy(
      clean = full.clean.where(col("_tid") < sampleRows).cache(),
      dirty = full.dirty.where(col("_tid") < sampleRows).cache(),
      mask = full.mask.where(col("_tid") < sampleRows).cache())
    val runs = Seq(
      "BClean" -> (() => BClean.clean(ds.dirty, ds.attrs, ds.ucs, BClean.Config.pi, userEdits = ds.fdEdges)),
      "HoloClean" -> (() => HoloCleanLike.clean(ds)),
      "PClean" -> (() => PCleanLike.clean(ds)),
      "Raha+Baran" -> (() => RahaBaranLike.clean(ds)))
    runs.foreach { case (name, f) =>
      val prf = Metrics.evaluate(ds.dirty, f(), ds.clean, ds.attrs)
      println(f"$name%-11s P=${prf.precision}%.3f R=${prf.recall}%.3f F1=${prf.f1}%.3f")
    }
    spark.stop()
  }
}
