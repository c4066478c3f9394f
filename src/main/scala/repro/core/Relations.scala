package repro.core

/** The three temporal relations of Table III (Allen-derived). */
sealed abstract class Rel(val sigil: String) extends Product with Serializable {
  override def toString: String = sigil
}

object Rel {
  /** `Ei -> Ej`: Ei ends (within tolerance) before Ej starts. */
  case object Follows extends Rel("->")
  /** `Ei >= Ej`: Ei's interval covers Ej's (within tolerance). */
  case object Contains extends Rel(">=")
  /** `Ei ol Ej`: Ei starts first, Ej outlives Ei, shared span >= d_o. */
  case object Overlaps extends Rel("ol")

  val all: Vector[Rel] = Vector(Follows, Contains, Overlaps)

  implicit val ordering: Ordering[Rel] = Ordering.by(_.sigil)
}

/** Relation determination with the tolerance buffer ε and minimal overlap
  * duration d_o (Table III, Property 1).
  *
  * The paper's `± ε` endpoints are resolved into one total, mutually
  * exclusive decision procedure over the *chronologically first* instance
  * `a` and second instance `b` (first = smaller start; ties by end, then
  * event id — [[Instance.ordering]]):
  *
  *   - Contains  iff  b.end <= a.end + ε          (b ends inside a, ε slack)
  *   - Overlaps  iff  not Contains and the shared span
  *                    `a.end - b.start + 1 >= max(1, d_o - ε)`
  *   - Follows   otherwise                        (negligible or no overlap)
  *
  * At ε = 0, d_o = 1 this is exactly Table III: Follows iff a ends strictly
  * before b starts, Contains iff a covers b, Overlaps iff they share >= d_o
  * granules and b ends after a. Mutual exclusivity and totality hold by
  * construction for any ε >= 0 (Property 1 / Lemma 3).
  */
object Relations {

  final case class RelCfg(epsilon: Int = 0, minOverlap: Int = 1) {
    require(epsilon >= 0, "epsilon must be >= 0")
    require(minOverlap >= 1, "d_o must be >= 1")
  }

  /** Relation between two instances, oriented: `a` must not start after
    * `b`. Returns the relation holding from `a` to `b`.
    */
  def relate(a: Interval, b: Interval, cfg: RelCfg = RelCfg()): Rel = {
    require(a.start <= b.start, s"relate() requires a to start first: $a vs $b")
    if (b.end <= a.end + cfg.epsilon) Rel.Contains
    else {
      val shared = a.end - b.start + 1
      if (shared >= math.max(1, cfg.minOverlap - cfg.epsilon)) Rel.Overlaps
      else Rel.Follows
    }
  }

  /** Orient two instances and relate them. Orientation follows
    * [[Instance.orientationOrdering]]: earlier start first; on a start tie
    * the longer (containing) instance first. Returns (first, second,
    * relation).
    */
  def orientAndRelate(x: Instance, y: Instance, cfg: RelCfg = RelCfg()): (Instance, Instance, Rel) = {
    val (a, b) = if (Instance.orientationOrdering.lteq(x, y)) (x, y) else (y, x)
    (a, b, relate(a.interval, b.interval, cfg))
  }
}
