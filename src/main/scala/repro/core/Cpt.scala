package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.graph.Dag

/** Per-edge conditional probability table (Section 2: "CPTs θ that weight the
  * edges"). One table per BN edge parent → child, estimated from the observed
  * (dirty) relation with Laplace smoothing — errors are modeled as part of
  * the distribution. Pairwise tables stay dense under dirty co-parents,
  * unlike joint multi-parent tables whose combos go unseen the moment any
  * one parent cell is corrupted.
  *
  * @param parent  attribute index of the edge's source
  * @param child   attribute index of the edge's target
  * @param table   parent value → (child value → count, total)
  * @param domSize |dom(child)| used for smoothing
  * @param alpha   Laplace pseudo-count
  */
final case class Cpt(
    parent: Int,
    child: Int,
    table: Map[String, (Map[String, Long], Long)],
    domSize: Int,
    alpha: Double,
) extends Serializable {

  /** Smoothed Pr[child = v | parent = p]; an unseen parent value (possible
    * only for values absent from the relation) is uniform over the domain.
    */
  def prob(p: String, v: String): Double =
    table.get(p) match {
      case Some((counts, total)) =>
        (counts.getOrElse(v, 0L) + alpha) / (total + alpha * domSize)
      case None => 1.0 / math.max(domSize, 1)
    }

  def logProb(p: String, v: String): Double = math.log(prob(p, v))
}

object Cpt {

  /** Learn the per-edge CPT parent → child by a distributed groupBy. */
  def learn(df: DataFrame, attrs: Seq[String], parent: Int, child: Int, alpha: Double = 0.05): Cpt = {
    val pCol = attrs(parent); val cCol = attrs(child)
    val domSize = df.select(col(cCol)).na.fill("").distinct().count().toInt
    val grouped = df.na.fill("", Seq(pCol, cCol)).groupBy(col(pCol), col(cCol)).count().collect()
    val table = grouped
      .groupBy(r => Values.norm(r.getString(0)))
      .map { case (pv, rows) =>
        val counts = rows.map(r => Values.norm(r.getString(1)) -> r.getLong(2)).toMap
        pv -> (counts, counts.values.sum)
      }
    Cpt(parent, child, table, domSize, alpha)
  }

  /** Learn all edge CPTs of a DAG, keyed by child. */
  def learnAll(df: DataFrame, attrs: Seq[String], dag: Dag, alpha: Double = 0.05): Map[Int, Seq[Cpt]] =
    attrs.indices
      .map(v => v -> dag.parents(v).map(p => learn(df, attrs, p, v, alpha)))
      .filter(_._2.nonEmpty)
      .toMap

  /** Prior (marginal) distribution of one attribute, Laplace-smoothed. */
  def prior(df: DataFrame, attr: String, alpha: Double = 1.0): Map[String, Double] = {
    val counts = df.na.fill("", Seq(attr)).groupBy(col(attr)).count().collect()
      .map(r => Values.norm(r.getString(0)) -> r.getLong(1)).toMap
    val total = counts.values.sum.toDouble
    val dom = counts.size
    counts.map { case (v, c) => v -> (c + alpha) / (total + alpha * dom) }
  }
}
