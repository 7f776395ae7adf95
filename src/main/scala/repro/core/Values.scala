package repro.core

import org.apache.spark.sql.Row

/** Cell-value conventions shared across the system: NULL is represented as the
  * empty string (generators emit "", Spark nulls are normalized on ingestion).
  */
object Values {
  val Null: String = ""

  def norm(s: String): String = if (s == null) Null else s

  def isNull(s: String): Boolean = s == null || s.isEmpty

  /** Extract the attribute values of a row (positions given by `attrIdx`). */
  def ofRow(row: Row, attrIdx: Array[Int]): Array[String] = {
    val out = new Array[String](attrIdx.length)
    var i = 0
    while (i < attrIdx.length) { out(i) = norm(row.getString(attrIdx(i))); i += 1 }
    out
  }
}
