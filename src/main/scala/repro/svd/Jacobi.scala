package repro.svd

/** Cyclic Jacobi eigendecomposition for dense symmetric matrices — the
  * linear-algebra substrate for the TTHRESH-like HOSVD compressor (no
  * external LAPACK in this sealed environment).
  */
object Jacobi {

  /** Eigen-decomposition result: values descending, vectors as columns of
    * `vectors` (vectors(i)(j) = component i of eigenvector j), so
    * A = V diag(λ) Vᵀ.
    */
  final case class Eigen(values: Array[Double], vectors: Array[Array[Double]])

  /** Decomposes the symmetric matrix `a` (n×n, row-major 2-D array;
    * `a` is not modified). Converges for any symmetric input; tolerance
    * is relative to the Frobenius norm.
    */
  def eigen(aIn: Array[Array[Double]], maxSweeps: Int = 30, tol: Double = 1e-12): Eigen = {
    val n = aIn.length
    require(n > 0 && aIn.forall(_.length == n), "matrix must be square")
    val a = Array.tabulate(n, n)((i, j) => aIn(i)(j))
    val v = Array.tabulate(n, n)((i, j) => if (i == j) 1.0 else 0.0)

    def offDiagNorm(): Double = {
      var s = 0.0
      var i = 0
      while (i < n) {
        var j = i + 1
        while (j < n) { s += 2 * a(i)(j) * a(i)(j); j += 1 }
        i += 1
      }
      math.sqrt(s)
    }
    var frob = 0.0
    for (i <- 0 until n; j <- 0 until n) frob += a(i)(j) * a(i)(j)
    frob = math.sqrt(frob)
    val threshold = math.max(tol * frob, Double.MinPositiveValue)

    var sweep = 0
    while (sweep < maxSweeps && offDiagNorm() > threshold) {
      var p = 0
      while (p < n - 1) {
        var q = p + 1
        while (q < n) {
          val apq = a(p)(q)
          if (math.abs(apq) > threshold / (n * n)) {
            val theta = (a(q)(q) - a(p)(p)) / (2 * apq)
            val t =
              if (theta == 0.0) 1.0
              else math.signum(theta) / (math.abs(theta) + math.sqrt(theta * theta + 1))
            val c = 1.0 / math.sqrt(t * t + 1)
            val s = t * c
            // rotate rows/cols p and q
            var k = 0
            while (k < n) {
              val akp = a(k)(p); val akq = a(k)(q)
              a(k)(p) = c * akp - s * akq
              a(k)(q) = s * akp + c * akq
              k += 1
            }
            k = 0
            while (k < n) {
              val apk = a(p)(k); val aqk = a(q)(k)
              a(p)(k) = c * apk - s * aqk
              a(q)(k) = s * apk + c * aqk
              k += 1
            }
            k = 0
            while (k < n) {
              val vkp = v(k)(p); val vkq = v(k)(q)
              v(k)(p) = c * vkp - s * vkq
              v(k)(q) = s * vkp + c * vkq
              k += 1
            }
          }
          q += 1
        }
        p += 1
      }
      sweep += 1
    }

    val idx = (0 until n).sortBy(i => -a(i)(i)).toArray
    val values = idx.map(i => a(i)(i))
    val vectors = Array.tabulate(n, n)((i, j) => v(i)(idx(j)))
    Eigen(values, vectors)
  }
}
