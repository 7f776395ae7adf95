package repro.linalg

import org.scalatest.funsuite.AnyFunSuite

class GraphicalLassoSpec extends AnyFunSuite {

  test("1x1 covariance inverts directly") {
    val r = GraphicalLasso.fit(Mat.of(1, 1)(4.0), rho = 0.0)
    assert(math.abs(r.theta(0, 0) - 0.25) < 1e-9)
  }

  test("diagonal covariance yields diagonal precision") {
    val s = Mat.of(3, 3)(2, 0, 0, 0, 4, 0, 0, 0, 8)
    val r = GraphicalLasso.fit(s, rho = 0.01)
    for (i <- 0 until 3; j <- 0 until 3 if i != j) assert(math.abs(r.theta(i, j)) < 1e-6)
    assert(r.theta(0, 0) > r.theta(1, 1) && r.theta(1, 1) > r.theta(2, 2))
  }

  test("rho=0 recovers the plain matrix inverse") {
    val s = Mat.of(2, 2)(2.0, 0.5, 0.5, 1.0)
    val r = GraphicalLasso.fit(s, rho = 0.0, tol = 1e-10)
    val inv = Mat.inverse(s)
    assert(r.theta.maxAbsDiff(inv) < 1e-4)
  }

  test("large rho shrinks off-diagonal precision to zero") {
    val s = Mat.of(2, 2)(1.0, 0.6, 0.6, 1.0)
    val r = GraphicalLasso.fit(s, rho = 0.9)
    assert(math.abs(r.theta(0, 1)) < 1e-8)
  }

  test("small rho keeps strong conditional dependence") {
    val s = Mat.of(2, 2)(1.0, 0.8, 0.8, 1.0)
    val r = GraphicalLasso.fit(s, rho = 0.01)
    assert(math.abs(r.theta(0, 1)) > 0.5)
  }

  test("theta is symmetric") {
    val s = Mat.of(3, 3)(1.0, 0.5, 0.2, 0.5, 1.0, 0.3, 0.2, 0.3, 1.0)
    val r = GraphicalLasso.fit(s, rho = 0.05)
    assert(r.theta.maxAbsDiff(r.theta.t) < 1e-9)
  }

  test("W stays close to S on the diagonal (S + rho I)") {
    val s = Mat.of(2, 2)(1.0, 0.3, 0.3, 2.0)
    val r = GraphicalLasso.fit(s, rho = 0.1)
    assert(math.abs(r.w(0, 0) - 1.1) < 1e-9)
    assert(math.abs(r.w(1, 1) - 2.1) < 1e-9)
  }

  test("chain structure: conditional independence is weakest in Θ") {
    // X0 → X1 → X2: Σ has a marginal correlation between 0 and 2, but the
    // precision entry Θ(0,2) (conditional dependence) must be far weaker
    // than the true-edge entries Θ(0,1) and Θ(1,2).
    val n = 20000
    val rng = new java.util.Random(7)
    val xs = Array.fill(n) {
      val x0 = rng.nextGaussian()
      val x1 = 0.7 * x0 + 0.6 * rng.nextGaussian()
      val x2 = 0.7 * x1 + 0.6 * rng.nextGaussian()
      Array(x0, x1, x2)
    }
    val s = Mat.zeros(3, 3)
    for (v <- xs; i <- 0 until 3; j <- 0 until 3) s(i, j) += v(i) * v(j) / n
    assert(s(0, 2) > 0.3, "marginal correlation present")
    val r = GraphicalLasso.fit(s, rho = 0.02)
    val spurious = math.abs(r.theta(0, 2))
    assert(spurious < 0.35 * math.abs(r.theta(0, 1)), s"theta=${r.theta}")
    assert(spurious < 0.35 * math.abs(r.theta(1, 2)), s"theta=${r.theta}")
  }

  test("rho=0 on a near-singular covariance reproduces the exact inverse") {
    val s = Mat.of(3, 3)(1.0055, 0.9042, 0.8116, 0.9042, 0.9028, 0.8112, 0.8116, 0.8112, 0.8192)
    val r = GraphicalLasso.fit(s, rho = 0.0)
    assert(r.theta.maxAbsDiff(Mat.inverse(s)) < 1e-3)
  }

  test("converges within maxIter on a well-behaved input") {
    val s = Mat.of(3, 3)(1.0, 0.4, 0.1, 0.4, 1.0, 0.4, 0.1, 0.4, 1.0)
    val r = GraphicalLasso.fit(s, rho = 0.05, maxIter = 100)
    assert(r.iterations < 100)
  }
}
