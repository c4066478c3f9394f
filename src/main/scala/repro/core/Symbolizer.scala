package repro.core

/** Symbolization (Def. 3.7): the mapping function f: X → Σ_X encoding each
  * raw value into a symbol. Two standard schemes are provided:
  *
  * - [[Symbolizer.thresholds]]: explicit ascending cut points (the paper's
  *   ON/OFF example is a 1-cut instance);
  * - [[Symbolizer.quantiles]]: SAX-style equi-depth binning computed from
  *   the series itself (Lin et al. 2003, as cited in Def. 3.7).
  *
  * Symbols are "0", "1", ... in ascending value order.
  */
object Symbolizer {

  /** Encode with explicit cut points: value < cuts(0) → "0", value in
    * [cuts(i-1), cuts(i)) → "i", value >= last cut → cuts.size as symbol.
    */
  def thresholds(values: Vector[Double], cuts: Vector[Double]): Vector[String] = {
    require(cuts.nonEmpty && cuts.sliding(2).forall {
      case Seq(a, b) => a < b
      case _         => true
    }, "cut points must be non-empty and strictly ascending")
    values.map { v =>
      var i = 0
      while (i < cuts.size && v >= cuts(i)) i += 1
      i.toString
    }
  }

  /** Equi-depth cut points for an `alpha`-symbol alphabet (SAX-like, but on
    * the empirical distribution rather than a Gaussian assumption — exact
    * and deterministic, which the DuckDB oracle requires).
    */
  def quantileCuts(values: Vector[Double], alpha: Int): Vector[Double] = {
    require(alpha >= 2, "alphabet size must be >= 2")
    val sorted = values.sorted
    (1 until alpha).toVector
      .map(i => sorted(((i.toLong * sorted.size) / alpha).toInt.min(sorted.size - 1)))
      .distinct
  }

  /** Quantile-binned symbolization with an `alpha`-symbol alphabet. */
  def quantiles(values: Vector[Double], alpha: Int): Vector[String] =
    thresholds(values, quantileCuts(values, alpha))

  /** Symbolize a whole raw database into D_SYB with per-series quantile
    * alphabets.
    */
  def symbolicDB(raw: Vector[(String, Vector[Double])], alpha: Int): SymbolicDB =
    SymbolicDB(raw.map { case (id, vs) => SymbolicSeries(id, quantiles(vs, alpha)) })
}
