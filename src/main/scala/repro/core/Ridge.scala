package repro.core

import repro.linalg.LinAlg
import repro.linalg.LinAlg.{Mat, Vec}

/** Ridge regression with intercept (paper Formula 5):
  *
  *   φ = (XᵀX + αE)⁻¹ XᵀY,  with rows of X being (1, x₁ … x_{m-1}).
  *
  * The incremental [[Ridge.State]] carries U = XᵀX and V = XᵀY so that rows
  * can be appended one at a time — exactly Proposition 3 of the paper, which
  * makes the per-ℓ learning cost constant instead of linear in ℓ.
  */
object Ridge {

  /** Accumulator of the normal equations over appended rows. */
  final class State(val nFeatures: Int, val alpha: Double) {
    private val d = nFeatures + 1
    /** U = XᵀX over all rows added so far (d×d, includes intercept column). */
    val u: Mat = LinAlg.zeros(d, d)
    /** V = XᵀY over all rows added so far. */
    val v: Vec = new Array[Double](d)
    /** Number of rows added. */
    var count: Int = 0

    /** Append one observation (feature vector without the leading 1). */
    def add(x: Vec, y: Double): Unit = {
      require(x.length == nFeatures, s"expected $nFeatures features, got ${x.length}")
      // Augmented row a = (1, x); accumulate aᵀa into U and aᵀy into V.
      u(0)(0) += 1.0
      v(0) += y
      var i = 0
      while (i < nFeatures) {
        val xi = x(i)
        u(0)(i + 1) += xi
        u(i + 1)(0) += xi
        v(i + 1) += xi * y
        var j = 0
        while (j < nFeatures) { u(i + 1)(j + 1) += xi * x(j); j += 1 }
        i += 1
      }
      count += 1
    }

    /** Solve (U + αE)⁻¹ V for the current rows. */
    def solve(): Vec = {
      val a = LinAlg.copy(u)
      var i = 0
      while (i < d) { a(i)(i) += alpha; i += 1 }
      LinAlg.solve(a, v)
    }
  }

  /** Batch fit over the given rows (features without intercept). */
  def fit(xs: Array[Vec], ys: Vec, alpha: Double): Vec = {
    require(xs.nonEmpty, "cannot fit on zero rows")
    val st = new State(xs(0).length, alpha)
    var i = 0
    while (i < xs.length) { st.add(xs(i), ys(i)); i += 1 }
    st.solve()
  }

  /** Weighted fit (row weights w ≥ 0), used by the LOESS baseline. */
  def fitWeighted(xs: Array[Vec], ys: Vec, ws: Vec, alpha: Double): Vec = {
    require(xs.nonEmpty, "cannot fit on zero rows")
    val f = xs(0).length
    val st = new State(f, alpha)
    // Weighted least squares = OLS on rows scaled by sqrt(w).
    var i = 0
    while (i < xs.length) {
      val s = math.sqrt(math.max(ws(i), 0.0))
      if (s > 0.0) {
        // Scale the augmented row (1, x) by s: fold s into U/V manually.
        val x = xs(i)
        st.u(0)(0) += s * s
        st.v(0) += s * s * ys(i)
        var a = 0
        while (a < f) {
          val xa = s * x(a); val one = s
          st.u(0)(a + 1) += one * xa
          st.u(a + 1)(0) += one * xa
          st.v(a + 1) += xa * (s * ys(i))
          var b = 0
          while (b < f) { st.u(a + 1)(b + 1) += xa * (s * x(b)); b += 1 }
          a += 1
        }
        st.count += 1
      }
      i += 1
    }
    st.solve()
  }

  /** Apply a fitted model to a feature vector: φ₀ + Σ φ_{j+1}·x_j. */
  def predict(phi: Vec, x: Vec): Double = {
    var s = phi(0); var j = 0
    while (j < x.length) { s += phi(j + 1) * x(j); j += 1 }
    s
  }
}
