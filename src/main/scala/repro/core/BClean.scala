package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions.col
import repro.graph.Dag

/** End-to-end BClean pipeline (Figure 2): BN construction → compensatory
  * score computation → per-cell MAP inference.
  *
  * The four experimental variants of Section 7 map to configurations:
  *  - `basic`     — full-joint inference, no pruning (BClean)
  *  - `noUc`      — partitioned inference without user constraints (BClean-UC)
  *  - `pi`        — partitioned inference (BClean_PI)
  *  - `pip`       — partitioned inference + tuple & domain pruning (BClean_PIP)
  */
object BClean {

  final case class Config(
      structure: StructureLearner.Config = StructureLearner.Config(),
      score: CompensatoryScore.Params = CompensatoryScore.Params(),
      inference: Inference.Config = Inference.Config(),
      cptAlpha: Double = 0.05, // small Laplace mass — α=1 drowns sparse FDs
  )

  object Config {
    val basic: Config = Config(inference = Inference.Config(partitioned = false))
    val noUc: Config = Config(inference = Inference.Config(useUc = false))
    val pi: Config = Config()
    val pip: Config = Config(inference = Inference.Config(tuplePruning = true, domainPruning = true))

    def variant(name: String): Config = name match {
      case "BClean"     => basic
      case "BClean-UC"  => noUc
      case "BClean_PI"  => pi
      case "BClean_PIP" => pip
      case other        => throw new IllegalArgumentException(s"unknown variant $other")
    }
  }

  /** Build the full inference model (network, scores, domains) from a dirty
    * relation. Exposed separately so tests and the user-interaction API can
    * inspect or edit the network before cleaning.
    */
  def buildModel(
      dirty: DataFrame,
      attrs: Seq[String],
      ucs: UcSet,
      cfg: Config = Config.pi,
      presetDag: Option[Dag] = None,
      userEdits: Seq[(Int, Int)] = Nil,
  ): Inference.Model = {
    val effUcs = if (cfg.inference.useUc) ucs else UcSet.empty
    val dag0 = presetDag.getOrElse(StructureLearner.learn(dirty, attrs, cfg.structure))
    val bn0 = BayesNet.learn(dirty, attrs, dag0, cfg.cptAlpha)
    // Section 7.3.2: the user inspects the learned network and adjusts it
    // with lightweight domain knowledge (FD-shaped edges).
    val bn = if (userEdits.isEmpty) bn0 else BayesNet.applyUserEdits(dirty, bn0, userEdits)
    val dag = bn.dag
    val withConf =
      CompensatoryScore.withConfidence(dirty, attrs, effUcs, cfg.score.lambda).cache()
    val corr = CompensatoryScore.collect(
      CompensatoryScore.corrTable(withConf, attrs, cfg.score.tau, cfg.score.beta))
    // Mean per-tuple weight (1 for conf ≥ τ, −β below) — the centering scale.
    val avgW = {
      import org.apache.spark.sql.functions.{avg, when, col => c}
      withConf.agg(avg(when(c("conf") >= cfg.score.tau, 1.0).otherwise(-cfg.score.beta)))
        .collect()(0).getDouble(0)
    }
    val co = CoOccurrence.compute(dirty, attrs)
    val domains: Map[Int, IndexedSeq[String]] = attrs.indices.map { i =>
      i -> dirty.select(col(attrs(i))).na.fill("").distinct().collect()
        .map(r => Values.norm(r.getString(0))).toIndexedSeq
    }.toMap
    val pruned =
      if (cfg.inference.domainPruning) DomainPruning.prune(domains, co, dag, cfg.inference.topK)
      else domains
    Inference.Model(attrs, bn, corr, co, domains, pruned, effUcs, cfg.inference, cfg.score, avgW)
  }

  /** Clean a dirty relation: returns a DataFrame with the same schema where
    * every cell holds the MAP value (Algorithm 1).
    */
  def clean(
      dirty: DataFrame,
      attrs: Seq[String],
      ucs: UcSet,
      cfg: Config = Config.pi,
      presetDag: Option[Dag] = None,
      userEdits: Seq[(Int, Int)] = Nil,
  ): DataFrame = {
    val model = buildModel(dirty, attrs, ucs, cfg, presetDag, userEdits)
    Inference.clean(dirty, model)
  }
}
