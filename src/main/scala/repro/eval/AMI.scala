package repro.eval

/** Adjusted Mutual Information (Vinh, Epps, Bailey 2010).
  *
  * AMI = (MI − E[MI]) / (max(H(U), H(V)) − E[MI])
  *
  * with the exact hypergeometric expected mutual information. We use the
  * `max` normalization — the scikit-learn default until 0.22, i.e. the
  * convention in force when the paper and its SkinnyDip predecessor were
  * evaluated. 0 ≈ chance agreement, 1 = identical partitions.
  */
object AMI {

  def ami(a: Array[Int], b: Array[Int]): Double = {
    require(a.length == b.length, s"label arrays differ: ${a.length} vs ${b.length}")
    val n = a.length
    if (n == 0) return 0.0
    val aIds = a.distinct.sorted
    val bIds = b.distinct.sorted
    val r = aIds.length
    val c = bIds.length
    if (r == 1 && c == 1) return 1.0
    val aIdx = aIds.zipWithIndex.toMap
    val bIdx = bIds.zipWithIndex.toMap
    val cont = Array.ofDim[Long](r, c)
    var i = 0
    while (i < n) { cont(aIdx(a(i)))(bIdx(b(i))) += 1; i += 1 }
    val ai = Array.tabulate(r)(i => cont(i).sum)
    val bj = Array.tabulate(c)(j => (0 until r).map(cont(_)(j).toLong).sum)

    val mi = mutualInfo(cont, ai, bj, n)
    val emi = expectedMI(ai, bj, n)
    val hU = entropy(ai, n)
    val hV = entropy(bj, n)
    val denom = math.max(hU, hV) - emi
    if (math.abs(denom) < 1e-12) {
      if (math.abs(mi - emi) < 1e-12) 1.0 else 0.0
    } else (mi - emi) / denom
  }

  def entropy(counts: Array[Long], n: Long): Double = {
    var h = 0.0
    for (x <- counts if x > 0) { val p = x.toDouble / n; h -= p * math.log(p) }
    h
  }

  def mutualInfo(cont: Array[Array[Long]], ai: Array[Long], bj: Array[Long], n: Long): Double = {
    var mi = 0.0
    for (i <- cont.indices; j <- cont(i).indices) {
      val nij = cont(i)(j)
      if (nij > 0)
        mi += (nij.toDouble / n) * math.log(n.toDouble * nij / (ai(i).toDouble * bj(j)))
    }
    math.max(0.0, mi)
  }

  /** Exact expected MI under the permutation (hypergeometric) model. */
  def expectedMI(ai: Array[Long], bj: Array[Long], n: Long): Double = {
    val lf = logFactorials(n.toInt)
    var emi = 0.0
    for (a <- ai; b <- bj) {
      val lo = math.max(1L, a + b - n)
      val hi = math.min(a, b)
      var nij = lo
      while (nij <= hi) {
        val term = (nij.toDouble / n) * math.log(n.toDouble * nij / (a.toDouble * b))
        // P[N_ij = nij] = a! b! (n-a)! (n-b)! / (n! nij! (a-nij)! (b-nij)! (n-a-b+nij)!)
        val logP = lf(a.toInt) + lf(b.toInt) + lf((n - a).toInt) + lf((n - b).toInt) -
          lf(n.toInt) - lf(nij.toInt) - lf((a - nij).toInt) - lf((b - nij).toInt) -
          lf((n - a - b + nij).toInt)
        emi += term * math.exp(logP)
        nij += 1
      }
    }
    emi
  }

  private def logFactorials(n: Int): Array[Double] = {
    val lf = Array.ofDim[Double](n + 1)
    var i = 2
    while (i <= n) { lf(i) = lf(i - 1) + math.log(i); i += 1 }
    lf
  }

  /** The paper's synthetic-data protocol: AMI restricted to points whose
    * *true* label is not noise (`trueNoise`), so methods without a noise
    * concept are not penalized for the noise points themselves.
    */
  def amiNonNoise(truth: Array[Int], pred: Array[Int], trueNoise: Int): Double = {
    val keep = truth.indices.filter(truth(_) != trueNoise).toArray
    ami(keep.map(truth), keep.map(pred))
  }
}
