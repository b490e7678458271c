package repro.util

/** Tiny dense linear algebra for the quality-score ridge fit (Lemma 4).
  *
  * Dimensions here are the number of data profiles (l <= ~15), so a plain
  * Gaussian elimination is simpler and faster than pulling in a library.
  */
object LinAlg {

  /** Solve `A x = b` for square `A` via Gaussian elimination with partial
    * pivoting. Throws on (numerically) singular systems.
    */
  def solve(aIn: Array[Array[Double]], bIn: Array[Double]): Array[Double] = {
    val n = aIn.length
    require(aIn.forall(_.length == n), "A must be square")
    require(bIn.length == n, "b dimension mismatch")
    val a = aIn.map(_.clone())
    val b = bIn.clone()
    var col = 0
    while (col < n) {
      var piv = col
      var best = math.abs(a(col)(col))
      var r = col + 1
      while (r < n) {
        if (math.abs(a(r)(col)) > best) { best = math.abs(a(r)(col)); piv = r }
        r += 1
      }
      require(best > 1e-12, s"singular matrix at column $col")
      if (piv != col) {
        val tmp = a(piv); a(piv) = a(col); a(col) = tmp
        val tb = b(piv); b(piv) = b(col); b(col) = tb
      }
      r = col + 1
      while (r < n) {
        val f = a(r)(col) / a(col)(col)
        if (f != 0.0) {
          var c = col
          while (c < n) { a(r)(c) -= f * a(col)(c); c += 1 }
          b(r) -= f * b(col)
        }
        r += 1
      }
      col += 1
    }
    val x = new Array[Double](n)
    var i = n - 1
    while (i >= 0) {
      var s = b(i)
      var j = i + 1
      while (j < n) { s -= a(i)(j) * x(j); j += 1 }
      x(i) = s / a(i)(i)
      i -= 1
    }
    x
  }

  /** Ridge regression `argmin_w ||Xw - y||^2 + lambda ||w||^2` in closed
    * form `(X^T X + lambda I)^-1 X^T y` — the profile-importance estimator
    * of METAM's quality score (paper Lemma 4 closed form).
    */
  def ridge(x: Array[Array[Double]], y: Array[Double], lambda: Double): Array[Double] = {
    require(x.length == y.length, "row mismatch")
    require(x.nonEmpty, "empty design matrix")
    require(lambda > 0, "lambda must be positive (guarantees invertibility)")
    val l = x.head.length
    val xtx = Array.ofDim[Double](l, l)
    val xty = new Array[Double](l)
    x.indices.foreach { i =>
      val row = x(i)
      require(row.length == l, "ragged design matrix")
      var a = 0
      while (a < l) {
        xty(a) += row(a) * y(i)
        var b = 0
        while (b < l) { xtx(a)(b) += row(a) * row(b); b += 1 }
        a += 1
      }
    }
    var d = 0
    while (d < l) { xtx(d)(d) += lambda; d += 1 }
    solve(xtx, xty)
  }

  def dot(a: Array[Double], b: Array[Double]): Double = {
    require(a.length == b.length, "dimension mismatch")
    var s = 0.0; var i = 0
    while (i < a.length) { s += a(i) * b(i); i += 1 }
    s
  }

  def cosine(a: Array[Double], b: Array[Double]): Double = {
    val na = math.sqrt(dot(a, a)); val nb = math.sqrt(dot(b, b))
    if (na < 1e-12 || nb < 1e-12) 0.0 else dot(a, b) / (na * nb)
  }
}
