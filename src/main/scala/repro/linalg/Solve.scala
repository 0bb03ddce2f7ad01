package repro.linalg

/** Dense linear-system solver used by the OLS substrate.
  *
  * Solves `A x = b` by Gaussian elimination with partial pivoting. The
  * normal-equation matrices the reproduction produces can be singular
  * (the airlines dataset is *deliberately* collinear — `arr−dep` vs
  * `duration`), so callers pass a small ridge `λ` that is added to the
  * diagonal, mirroring what numerical LS libraries do for rank-deficient
  * systems.
  */
object Solve {

  /** Solve (A + λI) x = b.
    *
    * @param a     square coefficient matrix (not mutated)
    * @param b     right-hand side (not mutated)
    * @param ridge λ added to the diagonal (0 for exact solves)
    */
  def solve(a: Mat, b: Array[Double], ridge: Double = 0.0): Array[Double] = {
    require(a.rows == a.cols, "Solve.solve: matrix must be square")
    require(a.rows == b.length, "Solve.solve: dimension mismatch")
    val n = a.rows
    val m = a.copy()
    var d = 0
    while (d < n) { m(d, d) += ridge; d += 1 }
    val x = b.clone()

    var col = 0
    while (col < n) {
      // Partial pivot: largest |m(row, col)| for row >= col.
      var piv = col; var best = math.abs(m(col, col)); var r = col + 1
      while (r < n) { val v = math.abs(m(r, col)); if (v > best) { best = v; piv = r }; r += 1 }
      require(best > 1e-300, s"Solve.solve: singular matrix at column $col (add ridge)")
      if (piv != col) {
        var j = 0
        while (j < n) { val t = m(col, j); m(col, j) = m(piv, j); m(piv, j) = t; j += 1 }
        val t = x(col); x(col) = x(piv); x(piv) = t
      }
      r = col + 1
      while (r < n) {
        val f = m(r, col) / m(col, col)
        if (f != 0.0) {
          var j = col
          while (j < n) { m(r, j) -= f * m(col, j); j += 1 }
          x(r) -= f * x(col)
        }
        r += 1
      }
      col += 1
    }

    // Back substitution.
    var i = n - 1
    while (i >= 0) {
      var s = x(i); var j = i + 1
      while (j < n) { s -= m(i, j) * x(j); j += 1 }
      x(i) = s / m(i, i)
      i -= 1
    }
    x
  }
}
