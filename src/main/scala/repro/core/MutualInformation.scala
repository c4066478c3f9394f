package repro.core

/** A symbolic time series (Def. 3.7): the symbol at each fine-granularity
  * position, 1-based positions implied by index.
  */
final case class SymbolicSeries(id: String, symbols: Vector[String]) {
  require(symbols.nonEmpty, s"series $id is empty")
  def length: Int = symbols.size
  def alphabet: Vector[String] = symbols.distinct.sorted
}

/** The symbolic database D_SYB (Def. 3.8): aligned symbolic series. */
final case class SymbolicDB(series: Vector[SymbolicSeries]) {
  require(series.nonEmpty, "empty symbolic database")
  require(series.forall(_.length == series.head.length),
    "all symbolic series must be aligned (same length)")
  def length: Int = series.head.length
  def ids: Vector[String] = series.map(_.id)
  def byId(id: String): SymbolicSeries = series.find(_.id == id)
    .getOrElse(throw new NoSuchElementException(s"no series $id"))
}

/** Entropy / mutual information over symbolic series (Sec. V-A) and the
  * μ threshold of Corollary 1.1 (Eq. 14).
  */
object MutualInformation {
  private val Ln2 = math.log(2.0)
  private def log2(x: Double): Double = math.log(x) / Ln2

  /** Empirical symbol probabilities p(x). */
  def probs(x: SymbolicSeries): Map[String, Double] = {
    val counts = new java.util.HashMap[String, Array[Long]]()
    val it = x.symbols.iterator
    while (it.hasNext) {
      val s = it.next()
      val c = counts.get(s)
      if (c == null) counts.put(s, Array(1L)) else c(0) += 1
    }
    val n = x.length.toDouble
    val b = Map.newBuilder[String, Double]
    counts.forEach((k, v) => b += (k -> v(0) / n))
    b.result()
  }

  /** Empirical joint probabilities p(x, y) over aligned positions. */
  def jointProbs(x: SymbolicSeries, y: SymbolicSeries): Map[(String, String), Double] = {
    require(x.length == y.length, "series must be aligned")
    val counts = new java.util.HashMap[(String, String), Array[Long]]()
    var i = 0
    val n = x.length
    while (i < n) {
      val k = (x.symbols(i), y.symbols(i))
      val c = counts.get(k)
      if (c == null) counts.put(k, Array(1L)) else c(0) += 1
      i += 1
    }
    val b = Map.newBuilder[(String, String), Double]
    counts.forEach((k, v) => b += (k -> v(0) / n.toDouble))
    b.result()
  }

  /** Shannon entropy H(X) in bits (Eq. 2). */
  def entropy(x: SymbolicSeries): Double =
    -probs(x).values.map(p => if (p > 0) p * log2(p) else 0.0).sum

  /** Conditional entropy H(X|Y) in bits (Eq. 3). */
  def condEntropy(x: SymbolicSeries, y: SymbolicSeries): Double = {
    val py = probs(y)
    -jointProbs(x, y).map { case ((_, ys), pxy) =>
      if (pxy > 0) pxy * log2(pxy / py(ys)) else 0.0
    }.sum
  }

  /** Mutual information I(X;Y) in bits (Eq. 4). */
  def mi(x: SymbolicSeries, y: SymbolicSeries): Double = {
    val px = probs(x); val py = probs(y)
    jointProbs(x, y).map { case ((xs, ys), pxy) =>
      if (pxy > 0) pxy * log2(pxy / (px(xs) * py(ys))) else 0.0
    }.sum
  }

  /** Normalized mutual information I(X;Y)/H(X) (Eq. 5). Asymmetric. A
    * constant X (H = 0) carries no information to reduce → defined as 0.
    */
  def nmi(x: SymbolicSeries, y: SymbolicSeries): Double = {
    val h = entropy(x)
    if (h <= 0.0) 0.0 else math.max(0.0, mi(x, y) / h)
  }

  /** μ for one event pair (X1 ∈ X_S, Y1 ∈ Y_S) (Eq. 14, appendix form):
    * λ1 = min symbol probability of X_S, λ2 = p(Y1).
    *
    *   ρ = minSeason · minDensity / (λ2 · |D_SEQ|)
    *   μ = 1 − λ2 / (e · ln2 · log2(1/λ1))          if ρ ≤ 1/e
    *   μ = 1 − ρ · λ2 · log2(ρ) / (ln2 · log2(λ1))  otherwise
    *
    * May exceed 1 when the pair can never reach minSeason seasons (then no
    * NMI passes — the pair is pruned outright).
    */
  def muForEventPair(lambda1: Double, lambda2: Double,
                     dseqSize: Int, minSeason: Int, minDensity: Int): Double = {
    require(lambda1 > 0 && lambda1 <= 1, s"bad lambda1=$lambda1")
    require(lambda2 > 0 && lambda2 <= 1, s"bad lambda2=$lambda2")
    if (lambda1 >= 1.0) {
      // Degenerate single-symbol X: log2(1/λ1) = 0; no uncertainty to
      // reduce — demand the impossible so the pair is pruned.
      Double.PositiveInfinity
    } else {
      val rho = minSeason.toDouble * minDensity / (lambda2 * dseqSize)
      if (rho <= 1.0 / math.E)
        1.0 - lambda2 / (math.E * Ln2 * log2(1.0 / lambda1))
      else
        1.0 - rho * lambda2 * log2(rho) / (Ln2 * log2(lambda1))
    }
  }

  /** μ for a series pair: the minimum over all event pairs in both NMI
    * directions (Sec. V-B "Setting the parameters").
    */
  def muForSeriesPair(x: SymbolicSeries, y: SymbolicSeries,
                      dseqSize: Int, minSeason: Int, minDensity: Int): Double = {
    def dir(a: SymbolicSeries, b: SymbolicSeries): Double = {
      val l1 = probs(a).values.min
      probs(b).values.map(l2 =>
        muForEventPair(l1, l2, dseqSize, minSeason, minDensity)).min
    }
    math.min(dir(x, y), dir(y, x))
  }

  /** Theorem 1 lower bound on maxSeason(X1, Y1) (Eq. 6), via Lambert W0.
    * Returns None when the W argument falls below −1/e (bound undefined).
    */
  def maxSeasonLowerBound(lambda1: Double, lambda2: Double, mu: Double,
                          dseqSize: Int, minDensity: Int): Option[Double] = {
    val z = log2(math.pow(lambda1, 1.0 - mu)) * Ln2 / lambda2
    if (z < -1.0 / math.E) None
    else Some(lambda2 * dseqSize / minDensity.toDouble * math.exp(LambertW.w0(z)))
  }

  /** Correlation test (Def. 5.4): min of both NMI directions >= μ. */
  def correlated(x: SymbolicSeries, y: SymbolicSeries, mu: Double): Boolean =
    math.min(nmi(x, y), nmi(y, x)) >= mu
}
