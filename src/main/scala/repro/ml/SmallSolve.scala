package repro.ml

/** Tiny dense linear solvers for the 3-parameter fits used by the Poisson
  * IRLS (CardLearner) and the per-query partition-cost fits (Spark retrofit).
  */
object SmallSolve {

  /** Solves a 3×3 system by Gaussian elimination with partial pivoting. */
  def solve3(a: Array[Array[Double]], b: Array[Double]): Option[Array[Double]] = {
    val m = Array.tabulate(3, 4)((r, c) => if (c < 3) a(r)(c) else b(r))
    var col = 0
    while (col < 3) {
      var piv = col
      var r = col + 1
      while (r < 3) { if (math.abs(m(r)(col)) > math.abs(m(piv)(col))) piv = r; r += 1 }
      if (math.abs(m(piv)(col)) < 1e-12) return None
      val tmp = m(col); m(col) = m(piv); m(piv) = tmp
      r = col + 1
      while (r < 3) {
        val f = m(r)(col) / m(col)(col)
        var c = col
        while (c < 4) { m(r)(c) -= f * m(col)(c); c += 1 }
        r += 1
      }
      col += 1
    }
    val x = new Array[Double](3)
    var r = 2
    while (r >= 0) {
      var s = m(r)(3)
      var c = r + 1
      while (c < 3) { s -= m(r)(c) * x(c); c += 1 }
      x(r) = s / m(r)(r)
      r -= 1
    }
    Some(x)
  }

  /** Least-squares fit of y ≈ w·basis(x) for a 3-element basis. */
  def lsq3(rows: Seq[(Array[Double], Double)]): Option[Array[Double]] = {
    val a = Array.ofDim[Double](3, 3)
    val b = new Array[Double](3)
    rows.foreach { case (x, y) =>
      var r = 0
      while (r < 3) {
        b(r) += x(r) * y
        var c = 0
        while (c < 3) { a(r)(c) += x(r) * x(c); c += 1 }
        r += 1
      }
    }
    var r = 0
    while (r < 3) { a(r)(r) += 1e-9 * (1.0 + a(r)(r)); r += 1 }
    solve3(a, b)
  }
}
