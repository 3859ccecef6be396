package repro.core

/** Step 3 of AdaWave (§IV-C): the adaptive "elbow theory" threshold.
  *
  * After low-pass filtering, the sorted (descending) cell-density curve
  * splits into three regimes — a steep *signal* head, a sloped *middle*
  * segment (cells between clusters and noise) and a nearly flat *noise*
  * tail. The paper's heuristic picks the density where the middle segment
  * meets the noise segment.
  *
  * We implement two estimators:
  *
  *  - [[threshold]] (default): the knee of the normalized curve — the point
  *    with maximal distance *below* the chord from (0, d_max) to (1, d_min).
  *    On a signal/middle/noise piecewise-linear curve this is exactly the
  *    middle–noise corner whenever the noise tail dominates the x-axis,
  *    which is the extreme-noise regime AdaWave targets.
  *  - [[angleThreshold]]: a faithful rendering of the paper's Algorithm 4 —
  *    scan the normalized curve with a window and return the density at the
  *    sharpest turn (minimum angle between the incoming and outgoing
  *    segments).
  *
  * Cells with density >= the returned threshold are kept.
  */
object Elbow {

  /** Knee estimator. Degenerate inputs (fewer than 3 distinct cells, or a
    * flat curve) return the minimum density, i.e. keep everything — this is
    * also the paper's observed low-noise failure mode (§VI).
    *
    * The returned threshold is the midpoint between the knee point and its
    * predecessor on the sorted curve, so `density >= threshold` keeps the
    * segments above the knee and drops the knee's own (noise) level.
    */
  def threshold(densities: Iterable[Double]): Double = {
    val s = densities.toArray.sorted(Ordering[Double].reverse)
    if (s.length < 3 || s.head == s.last) return if (s.isEmpty) 0.0 else s.last
    val n = s.length
    val yMax = s.head
    val yMin = s.last
    var best = Double.NegativeInfinity
    var bestIdx = 0
    var i = 0
    while (i < n) {
      val x = i.toDouble / (n - 1)
      val y = (s(i) - yMin) / (yMax - yMin)
      // Chord runs (0,1) → (1,0); distance below it is ∝ 1 - x - y.
      val dist = 1.0 - x - y
      if (dist > best) { best = dist; bestIdx = i }
      i += 1
    }
    if (bestIdx == 0) s(0) else (s(bestIdx) + s(bestIdx - 1)) / 2.0
  }

  /** Algorithm 4: windowed angle scan over the normalized sorted curve. */
  def angleThreshold(densities: Iterable[Double], window: Int = 0): Double = {
    val s = densities.toArray.sorted(Ordering[Double].reverse)
    if (s.length < 3 || s.head == s.last) return if (s.isEmpty) 0.0 else s.last
    val n = s.length
    val w = if (window > 0) window else math.max(1, n / 50)
    val yMax = s.head
    val yMin = s.last
    def pt(i: Int): (Double, Double) =
      (i.toDouble / (n - 1), (s(i) - yMin) / (yMax - yMin))
    var bestAngle = Double.MaxValue
    var bestIdx = 0
    var i = w
    while (i < n - w) {
      val (lx, ly) = pt(i - w)
      val (mx, my) = pt(i)
      val (rx, ry) = pt(i + w)
      val a = math.hypot(mx - lx, my - ly)
      val b = math.hypot(rx - mx, ry - my)
      if (a > 0 && b > 0) {
        val cos = ((mx - lx) * (rx - mx) + (my - ly) * (ry - my)) / (a * b)
        val angle = math.acos(math.max(-1.0, math.min(1.0, cos)))
        // Sharpest turn = largest angle between consecutive segments.
        if (math.Pi - angle < bestAngle) { bestAngle = math.Pi - angle; bestIdx = i }
      }
      i += w
    }
    s(bestIdx)
  }
}
