package repro.core

/** Phase-1 step 2 (Defs. 3.11–3.13): fold a symbolic database of the finest
  * granularity G into the temporal sequence database D_SEQ of granularity H
  * with `G <=_m H`, run-length-encoding consecutive identical symbols into
  * event instances. Interval endpoints are *fine* granule positions, as in
  * the paper's Table IV.
  */
object SequenceDB {

  /** Temporal sequence of one series inside one coarse granule (Def. 3.12):
    * consecutive identical symbols grouped into instances.
    */
  def sequenceOf(seriesId: String, symbols: Vector[String], fineStart: Int): Vector[Instance] = {
    if (symbols.isEmpty) Vector.empty
    else {
      val out = Vector.newBuilder[Instance]
      var runSym = symbols.head
      var runStart = fineStart
      var p = fineStart
      for (s <- symbols.drop(1)) {
        p += 1
        if (s != runSym) {
          out += Instance(Event(seriesId, runSym), Interval(runStart, p - 1))
          runSym = s; runStart = p
        }
      }
      out += Instance(Event(seriesId, runSym), Interval(runStart, p))
      out.result()
    }
  }

  /** Build D_SEQ from D_SYB with the m-finer sequence mapping g (Def. 3.13).
    * A trailing partial granule is kept (complete partitioning, Def. 3.2).
    */
  def build(syb: SymbolicDB, m: Int): SeqDB = {
    require(m >= 1, "granularity factor must be >= 1")
    val nCoarse = Granularity.coarseLength(syb.length, m)
    val rows = (1 to nCoarse).toVector.map { h =>
      val (lo, hiRaw) = Granularity.fineRange(h, m)
      val hi = math.min(hiRaw, syb.length)
      val instances = syb.series.flatMap { s =>
        sequenceOf(s.id, s.symbols.slice(lo - 1, hi), lo)
      }.sorted(Instance.ordering)
      GranuleRow(h, instances)
    }
    SeqDB(m, rows)
  }
}
