package repro.core.cel

import repro.core.pred.Atom

/** Complex Event Logic abstract syntax (§3):
  *
  * `φ := R | φ AS X | φ FILTER X[P] | φ OR φ | φ ; φ | φ+ | π_L(φ)`
  */
sealed trait Cel extends Serializable {
  /** All variables (incl. event types) appearing in the formula. */
  def variables: Set[String] = this match {
    case CAtom(r)          => Set(r)
    case CAs(inner, x)     => inner.variables + x
    case CFilter(inner, _, _) => inner.variables
    case COr(l, r)         => l.variables ++ r.variables
    case CSeq(l, r)        => l.variables ++ r.variables
    case CPlus(inner)      => inner.variables
    case CProj(inner, l)   => inner.variables ++ l
  }
}

/** Event type `R` — matches a single event of that type. */
final case class CAtom(eventType: String) extends Cel
/** `φ AS X` — binds all positions matched by φ to variable X. */
final case class CAs(inner: Cel, x: String) extends Cel
/** `φ FILTER X[P]` — events bound to X must satisfy atomic predicate P. */
final case class CFilter(inner: Cel, x: String, pred: Atom) extends Cel
/** Disjunction. */
final case class COr(l: Cel, r: Cel) extends Cel
/** Non-contiguous sequencing `φ1 ; φ2` (arbitrary gap, §3). */
final case class CSeq(l: Cel, r: Cel) extends Cel
/** Iteration (Kleene plus), gaps allowed between iterations. */
final case class CPlus(inner: Cel) extends Cel
/** Projection `π_L(φ)` — variables outside L are emptied. */
final case class CProj(inner: Cel, keep: Set[String]) extends Cel

object Cel {
  /** `a1 ; a2 ; ... ; an` convenience builder. */
  def seq(parts: Cel*): Cel = parts.reduceLeft(CSeq(_, _))
  /** Sequence of plain event types (the benchmark pattern `A1;...;An`). */
  def seqOfTypes(types: String*): Cel = seq(types.map(CAtom(_)): _*)
}
