package repro.core

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions.col
import repro.graph.Dag
import repro.linalg.{GraphicalLasso, Mat}
import repro.text.Similarity

/** Automatic Bayesian-network skeleton construction (Section 4).
  *
  * Extends the FDX structure-learning recipe with the paper's softened-FD
  * similarity: for each attribute A, sort the relation by A and, within each
  * partition, compute the m-dimensional similarity vector of every adjacent
  * tuple pair. These vectors are treated as observations of a multivariate
  * Gaussian; graphical lasso estimates the inverse covariance Θ, which is
  * decomposed as Θ = (I−B)ᵀΩ⁻¹(I−B) (UDUᵀ under a sink-first ordering per
  * Ghoshal–Honorio) to recover the autoregression matrix B. Entries of B with
  * |weight| ≥ threshold become directed BN edges.
  *
  * Approximation note (documented in DESIGN.md): adjacent pairs are formed
  * inside each partition after a global sort, so the p−1 pairs straddling
  * partition boundaries are dropped — immaterial at n ≫ p.
  */
object StructureLearner {

  final case class Config(
      rho: Double = 0.05,          // graphical-lasso L1 penalty
      edgeThreshold: Double = 0.12, // min |B| weight kept as an edge
      maxParents: Int = 3,          // in-degree cap (bounds CPT size)
      ridge: Double = 1e-3,         // diagonal ridge for degenerate covariances
  )

  /** Sufficient statistics of the similarity observations. */
  final case class MomentStats(n: Long, sum: Array[Double], prod: Array[Double]) {
    def merge(o: MomentStats): MomentStats = {
      val s = sum.clone(); val p = prod.clone()
      var i = 0; while (i < s.length) { s(i) += o.sum(i); i += 1 }
      i = 0; while (i < p.length) { p(i) += o.prod(i); i += 1 }
      MomentStats(n + o.n, s, p)
    }
  }

  /** Adjacent-pair similarity observations, one sort per attribute (the FDX
    * trick from the paper's Remarks: sorting brings equal-on-A pairs next to
    * each other, so only 2n·m pairs are scored instead of n²).
    * Returns a Dataset of m-dimensional similarity vectors.
    */
  def similarityObservations(df: DataFrame, attrs: Seq[String]): Dataset[Array[Double]] = {
    val spark = df.sparkSession
    import spark.implicits._
    val m = attrs.length
    val projected = df.select(attrs.map(col): _*)
    attrs.indices.map { a =>
      projected.sort(col(attrs(a))).mapPartitions { rows =>
        var prev: Array[String] = null
        rows.flatMap { r =>
          val cur = Array.tabulate(m)(i => Values.norm(r.getString(i)))
          val out =
            if (prev == null) Iterator.empty
            else {
              val p = prev
              Iterator.single(Array.tabulate(m)(i => Similarity.value(p(i), cur(i))))
            }
          prev = cur
          out
        }
      }
    }.reduce(_ union _)
  }

  /** Empirical covariance of the observations via a single distributed pass. */
  def covariance(obs: Dataset[Array[Double]], m: Int): Mat = {
    val spark = obs.sparkSession
    import spark.implicits._
    val zero = MomentStats(0L, new Array[Double](m), new Array[Double](m * m))
    val stats = obs
      .mapPartitions { it =>
        val sum = new Array[Double](m)
        val prod = new Array[Double](m * m)
        var n = 0L
        it.foreach { v =>
          n += 1
          var i = 0
          while (i < m) {
            sum(i) += v(i)
            var j = 0
            while (j < m) { prod(i * m + j) += v(i) * v(j); j += 1 }
            i += 1
          }
        }
        if (n == 0) Iterator.empty else Iterator.single(MomentStats(n, sum, prod))
      }
      .collect() // ≤ one partial per partition — tiny
      .foldLeft(zero)(_ merge _)
    val n = math.max(stats.n, 1L).toDouble
    val sigma = Mat.zeros(m, m)
    for (i <- 0 until m; j <- 0 until m)
      sigma(i, j) = stats.prod(i * m + j) / n - (stats.sum(i) / n) * (stats.sum(j) / n)
    sigma
  }

  /** Ghoshal–Honorio sink-first variable ordering: repeatedly pick the node
    * with the minimum diagonal entry of the (Schur-complemented) precision —
    * a terminal vertex of the underlying SEM — and place it last.
    */
  def sinkOrdering(theta: Mat): Seq[Int] = {
    val p = theta.rows
    var remaining = (0 until p).toVector
    var cur = theta.copy
    var order = List.empty[Int]
    while (remaining.length > 1) {
      var best = 0
      for (k <- remaining.indices) if (cur(k, k) < cur(best, best)) best = k
      order = remaining(best) :: order
      val keep = remaining.indices.filter(_ != best).toVector
      val next = Mat.zeros(keep.length, keep.length)
      val drr = cur(best, best)
      for (i <- keep.indices; j <- keep.indices)
        next(i, j) = cur(keep(i), keep(j)) - cur(keep(i), best) * cur(best, keep(j)) / drr
      cur = next
      remaining = keep.map(remaining)
    }
    (remaining.head :: order).toSeq
  }

  /** Decompose Θ into the autoregression matrix B under `order` (roots first):
    * permute Θ, factor UDUᵀ, read B̃ = I − Uᵀ, un-permute. B(child,parent).
    */
  def autoregression(theta: Mat, order: Seq[Int]): Mat = {
    val p = theta.rows
    val perm = Mat.zeros(p, p)
    for (i <- 0 until p; j <- 0 until p) perm(i, j) = theta(order(i), order(j))
    val (u, _) = Mat.udu(perm)
    val b = Mat.zeros(p, p)
    for (i <- 0 until p; j <- 0 until i) // B̃ strictly lower triangular: B̃(i,j) = −U(j,i)
      b(order(i), order(j)) = -u(j, i)
    b
  }

  /** Normalize a covariance to a correlation matrix so the glasso penalty is
    * scale-free (similarity observations can be nearly constant, which would
    * otherwise let any fixed ρ shrink everything to zero). Zero-variance
    * attributes become uncorrelated unit-variance rows (no edges).
    */
  def toCorrelation(sigma: Mat, eps: Double = 1e-9): Mat = {
    val m = sigma.rows
    val sd = Array.tabulate(m)(i => math.sqrt(math.max(sigma(i, i), 0.0)))
    val r = Mat.eye(m)
    for (i <- 0 until m; j <- 0 until m if i != j) {
      if (sd(i) > eps && sd(j) > eps) {
        // Clamp to [-0.999, 0.999]: sampling noise can push |r| past 1.
        r(i, j) = math.max(-0.999, math.min(0.999, sigma(i, j) / (sd(i) * sd(j))))
      }
    }
    r
  }

  /** End-to-end skeleton learning. */
  def learn(df: DataFrame, attrs: Seq[String], cfg: Config = Config()): Dag = {
    val m = attrs.length
    val obs = similarityObservations(df, attrs)
    val sigma = covariance(obs, m)
    val corr = toCorrelation(sigma)
    for (i <- 0 until m) corr(i, i) += cfg.ridge
    val theta = GraphicalLasso.fit(corr, cfg.rho).theta
    val order = sinkOrdering(theta)
    val b = autoregression(theta, order)
    // Pooling the per-attribute sorted blocks induces a *negative* artifact
    // correlation between independent attributes (the sorted attribute's
    // similarity is high exactly when the others sit at baseline), while
    // genuine softened-FD dependencies surface as strongly positive weights.
    // Only positive autoregression weights are kept as edges.
    for (i <- 0 until m; j <- 0 until m if b(i, j) < 0) b(i, j) = 0.0
    Dag.fromAutoregression(b, cfg.edgeThreshold).capParents(cfg.maxParents)
  }
}
