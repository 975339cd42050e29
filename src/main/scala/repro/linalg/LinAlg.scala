package repro.linalg

/** Small dense linear algebra used to train models from cofactor matrices.
  *
  * The paper relies on LAPACK for these routines; at our dimensionalities
  * (m ≤ ~60 after one-hot expansion) a plain LU solve with partial pivoting
  * and a preconditioned conjugate-gradient solver are numerically adequate
  * and keep the build dependency-free.
  *
  * Matrices are row-major `Array[Array[Double]]`; all routines are pure
  * (inputs are copied before factorization).
  */
object LinAlg {

  /** Deep copy of a matrix. */
  def copy(a: Array[Array[Double]]): Array[Array[Double]] = a.map(_.clone())

  /** Matrix-vector product `a * x`. */
  def matVec(a: Array[Array[Double]], x: Array[Double]): Array[Double] = {
    val n = a.length
    val out = new Array[Double](n)
    var i = 0
    while (i < n) {
      val row = a(i)
      var s = 0.0
      var j = 0
      while (j < row.length) { s += row(j) * x(j); j += 1 }
      out(i) = s
      i += 1
    }
    out
  }

  /** Dot product. */
  def dot(x: Array[Double], y: Array[Double]): Double = {
    var s = 0.0; var i = 0
    while (i < x.length) { s += x(i) * y(i); i += 1 }
    s
  }

  /** Outer product `x yᵀ` added in place into `acc` scaled by `w`. */
  def addOuter(acc: Array[Array[Double]], x: Array[Double], y: Array[Double], w: Double): Unit = {
    var i = 0
    while (i < x.length) {
      val row = acc(i); val xi = x(i) * w
      var j = 0
      while (j < y.length) { row(j) += xi * y(j); j += 1 }
      i += 1
    }
  }

  /** Solve `A x = b` by LU decomposition with partial pivoting.
    *
    * @throws IllegalArgumentException if `A` is (numerically) singular.
    */
  def solve(a: Array[Array[Double]], b: Array[Double]): Array[Double] =
    solveMany(a, Array(b)).head

  /** Solve `A x_k = b_k` for several right-hand sides sharing one factorization. */
  def solveMany(a0: Array[Array[Double]], bs: Array[Array[Double]]): Array[Array[Double]] = {
    val n = a0.length
    require(a0.forall(_.length == n), "solve requires a square matrix")
    require(bs.forall(_.length == n), "rhs length must match matrix dimension")
    val a = copy(a0)
    val perm = Array.tabulate(n)(identity)
    // LU with partial pivoting, in place.
    var k = 0
    while (k < n) {
      var p = k; var best = math.abs(a(k)(k))
      var i = k + 1
      while (i < n) { val v = math.abs(a(i)(k)); if (v > best) { best = v; p = i }; i += 1 }
      if (best < 1e-12)
        throw new IllegalArgumentException(s"singular matrix at pivot $k (|pivot|=$best)")
      if (p != k) { val t = a(p); a(p) = a(k); a(k) = t; val tp = perm(p); perm(p) = perm(k); perm(k) = tp }
      i = k + 1
      while (i < n) {
        val f = a(i)(k) / a(k)(k)
        a(i)(k) = f
        var j = k + 1
        while (j < n) { a(i)(j) -= f * a(k)(j); j += 1 }
        i += 1
      }
      k += 1
    }
    bs.map { b =>
      val y = new Array[Double](n)
      var i = 0
      while (i < n) { // forward substitution on permuted b
        var s = b(perm(i))
        var j = 0
        while (j < i) { s -= a(i)(j) * y(j); j += 1 }
        y(i) = s
        i += 1
      }
      val x = new Array[Double](n)
      i = n - 1
      while (i >= 0) { // back substitution
        var s = y(i)
        var j = i + 1
        while (j < n) { s -= a(i)(j) * x(j); j += 1 }
        x(i) = s / a(i)(i)
        i -= 1
      }
      x
    }
  }

  /** Solve the SPD system `A x = b` by diagonally-preconditioned conjugate
    * gradient. This is the "gradient descent decoupled from the data" solver
    * of the paper: each step is O(m²) off the precomputed cofactor matrix.
    *
    * Rows/columns with a zero diagonal (categories absent from the training
    * partition) are frozen at x=0.
    */
  def cgSolve(a: Array[Array[Double]], b: Array[Double],
              maxIter: Int = 500, tol: Double = 1e-10): Array[Double] = {
    val n = a.length
    val d = Array.tabulate(n) { i => val v = a(i)(i); if (v > 1e-12) 1.0 / math.sqrt(v) else 0.0 }
    // Normalized system: Â = D A D, b̂ = D b, x = D x̂ — unit diagonal keeps CG stable.
    val ah = Array.tabulate(n, n)((i, j) => a(i)(j) * d(i) * d(j))
    val bh = Array.tabulate(n)(i => b(i) * d(i))
    val x = new Array[Double](n)
    val r = bh.clone()
    val p = bh.clone()
    var rs = dot(r, r)
    val rs0 = math.max(rs, 1e-300)
    var it = 0
    while (it < maxIter && rs / rs0 > tol * tol) {
      val ap = matVec(ah, p)
      val pap = dot(p, ap)
      if (math.abs(pap) < 1e-300) { it = maxIter } // stagnated (e.g. all-zero system)
      else {
        val alpha = rs / pap
        var i = 0
        while (i < n) { x(i) += alpha * p(i); r(i) -= alpha * ap(i); i += 1 }
        val rsNew = dot(r, r)
        val beta = rsNew / rs
        i = 0
        while (i < n) { p(i) = r(i) + beta * p(i); i += 1 }
        rs = rsNew
        it += 1
      }
    }
    Array.tabulate(n)(i => x(i) * d(i))
  }
}
