package repro.linalg

import repro.graph.CsrGraph

/** Dense linear algebra substrate, written from scratch.
  *
  * Provides what the EXACT baseline and the ground-truth oracle need:
  * Gauss–Jordan inversion, the Moore–Penrose pseudo-inverse of the graph
  * Laplacian, and exact effective resistances. `O(n³)` — used on graphs
  * with up to a few thousand nodes only (larger ground truth comes from
  * SMM with 1000 iterations, exactly as the paper's §5.1 does).
  */
object Dense {

  /** In-place Gauss–Jordan inversion with partial pivoting.
    * `a` is row-major `n × n`; returns its inverse (destroys `a`).
    */
  def invertInPlace(a: Array[Array[Double]]): Array[Array[Double]] = {
    val n = a.length
    val inv = Array.tabulate(n, n)((i, j) => if (i == j) 1.0 else 0.0)
    var col = 0
    while (col < n) {
      // pivot
      var piv = col
      var best = math.abs(a(col)(col))
      var r = col + 1
      while (r < n) {
        val v = math.abs(a(r)(col))
        if (v > best) { best = v; piv = r }
        r += 1
      }
      require(best > 1e-300, s"singular matrix at column $col")
      if (piv != col) {
        val t = a(piv); a(piv) = a(col); a(col) = t
        val ti = inv(piv); inv(piv) = inv(col); inv(col) = ti
      }
      val d = a(col)(col)
      var j = 0
      while (j < n) { a(col)(j) /= d; inv(col)(j) /= d; j += 1 }
      r = 0
      while (r < n) {
        if (r != col) {
          val f = a(r)(col)
          if (f != 0.0) {
            var k = 0
            while (k < n) {
              a(r)(k) -= f * a(col)(k)
              inv(r)(k) -= f * inv(col)(k)
              k += 1
            }
          }
        }
        r += 1
      }
      col += 1
    }
    inv
  }

  /** Moore–Penrose pseudo-inverse of the Laplacian `L = D − A` via the
    * identity `L† = (L + J/n)⁻¹ − J/n` (valid for connected graphs, where
    * `J` is the all-ones matrix).
    */
  def laplacianPseudoInverse(g: CsrGraph): Array[Array[Double]] = {
    val n = g.n
    val a = Array.tabulate(n, n) { (i, j) =>
      val lap = if (i == j) g.degree(i).toDouble
                else if (g.hasEdge(i, j)) -1.0 else 0.0
      lap + 1.0 / n
    }
    val inv = invertInPlace(a)
    var i = 0
    while (i < n) {
      var j = 0
      while (j < n) { inv(i)(j) -= 1.0 / n; j += 1 }
      i += 1
    }
    inv
  }

  /** Exact ER from a precomputed `L†`:
    * `r(s,t) = L†(s,s) + L†(t,t) − 2 L†(s,t)` (Definition 2.1).
    */
  def erFromPinv(pinv: Array[Array[Double]], s: Int, t: Int): Double =
    pinv(s)(s) + pinv(t)(t) - 2.0 * pinv(s)(t)

  /** Exact ER of a single pair by one dense solve of
    * `(L + J/n) x = e_s − e_t`; `r = (e_s − e_t)ᵀ x` (the `J/n` shifts
    * cancel because the right-hand side is mean-zero).
    */
  def exactEr(g: CsrGraph, s: Int, t: Int): Double = {
    if (s == t) return 0.0
    val pinv = laplacianPseudoInverse(g)
    erFromPinv(pinv, s, t)
  }

  /** Conjugate-gradient solve of `L x = b` for mean-zero `b` on a
    * connected graph, keeping iterates mean-zero (the component along the
    * null space `1` is projected out). Used by the RP baseline.
    *
    * @return x with `Σ x(i) = 0`
    */
  def cgLaplacian(g: CsrGraph, b: Array[Double],
                  tol: Double = 1e-10, maxIter: Int = 10000): Array[Double] = {
    val n = g.n
    def lapMul(x: Array[Double]): Array[Double] = {
      val y = new Array[Double](n)
      var v = 0
      while (v < n) {
        var acc = g.degree(v) * x(v)
        var i = g.offsets(v)
        while (i < g.offsets(v + 1)) { acc -= x(g.neighbors(i)); i += 1 }
        y(v) = acc
        v += 1
      }
      y
    }
    def project(x: Array[Double]): Unit = {
      var mean = 0.0; var i = 0
      while (i < n) { mean += x(i); i += 1 }
      mean /= n; i = 0
      while (i < n) { x(i) -= mean; i += 1 }
    }
    def dot(u: Array[Double], v: Array[Double]): Double = {
      var acc = 0.0; var i = 0
      while (i < n) { acc += u(i) * v(i); i += 1 }
      acc
    }
    val x = new Array[Double](n)
    val r = b.clone(); project(r)
    val p = r.clone()
    var rs = dot(r, r)
    val bNorm = math.sqrt(rs) max 1e-300
    var it = 0
    while (it < maxIter && math.sqrt(rs) / bNorm > tol) {
      val ap = lapMul(p)
      val alpha = rs / dot(p, ap)
      var i = 0
      while (i < n) { x(i) += alpha * p(i); r(i) -= alpha * ap(i); i += 1 }
      val rsNew = dot(r, r)
      val beta = rsNew / rs
      i = 0
      while (i < n) { p(i) = r(i) + beta * p(i); i += 1 }
      rs = rsNew
      it += 1
      if (it % 50 == 0) project(r) // counter numerical drift into null space
    }
    project(x)
    x
  }
}
