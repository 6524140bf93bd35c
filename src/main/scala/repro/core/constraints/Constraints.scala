package repro.core.constraints

import repro.core.db.{AttrRef, RelSpec}
import repro.core.logic.{Const, Literal, Term}

/** Matching dependency (paper Sec. 2.2), in the normal form
  * `R1[A_1..n] ≈ R2[B_1..n] → R1[C] ⇌ R2[D]`.
  *
  * For identification MDs (all MDs in the paper's evaluation and ours), the
  * unified pair (C, D) coincides with an LHS pair, so we carry only the LHS
  * attribute pairs: each pair drives a similarity search during bottom-clause
  * construction (the paper's `ψ_{B_j ≈ M}(R_2)`), and a matched pair of values
  * yields a similarity literal whose repaired semantics is unification
  * (DESIGN.md §7.1).
  */
final case class MD(pairs: Vector[(AttrRef, AttrRef)]) extends Serializable {
  require(pairs.nonEmpty, "MD needs at least one attribute pair")
}

object MD {
  /** Convenience constructor for single-attribute identification MDs. */
  def apply(a: AttrRef, b: AttrRef): MD = MD(Vector((a, b)))
}

/** Conditional functional dependency `(X → A, tp)` over a single relation
  * (paper Sec. 2.3), normalized to a single right-hand-side attribute.
  *
  * @param lhsPattern per-LHS-attribute pattern: `None` is the unnamed
  *                   variable `-`; `Some(c)` a constant.
  * @param rhsPattern pattern for the RHS attribute.
  */
final case class CFD(
    rel: String,
    lhs: Vector[String],
    rhs: String,
    lhsPattern: Vector[Option[String]],
    rhsPattern: Option[String],
) extends Serializable {
  require(lhsPattern.length == lhs.length, "one pattern entry per LHS attribute")

  def lhsIdx(spec: RelSpec): Vector[Int] = lhs.map(spec.attrIdx)
  def rhsIdx(spec: RelSpec): Int         = spec.attrIdx(rhs)

  /** The `≍` predicate between a value and a pattern cell. */
  def cellMatches(value: String, pat: Option[String]): Boolean =
    value != null && pat.forall(_ == value)

  /** Do tuples t1, t2 (arrays in `spec` column order) violate this CFD? */
  def violates(spec: RelSpec, t1: Array[String], t2: Array[String]): Boolean = {
    val li = lhsIdx(spec)
    val sameLhs = li.indices.forall { k =>
      val i = li(k)
      t1(i) != null && t1(i) == t2(i) && cellMatches(t1(i), lhsPattern(k))
    }
    if (!sameLhs) false
    else {
      val r = rhsIdx(spec)
      !(t1(r) != null && t1(r) == t2(r) && cellMatches(t1(r), rhsPattern))
    }
  }

  /** Violation test lifted to clause literals of this relation. Terms are
    * "equal" when syntactically identical; a constant matches a constant
    * pattern by value; a variable can only be asserted to match the wildcard
    * pattern (conservative: unknown values are not reported as violations).
    */
  def violatesLits(spec: RelSpec, l1: Literal, l2: Literal): Boolean = {
    if (l1.pred != rel || l2.pred != rel || l1 == l2) return false
    val li = lhsIdx(spec)
    def termMatches(t: Term, pat: Option[String]): Boolean = (t, pat) match {
      case (_, None)                => true
      case (Const(v), Some(c))      => v == c
      case _                        => false // variable vs constant pattern: unknown
    }
    val sameLhs = li.indices.forall { k =>
      val i = li(k)
      l1.args(i) == l2.args(i) && termMatches(l1.args(i), lhsPattern(k))
    }
    if (!sameLhs) false
    else {
      val r = rhsIdx(spec)
      !(l1.args(r) == l2.args(r) && termMatches(l1.args(r), rhsPattern))
    }
  }
}

object CFD {
  /** Plain FD `X → A` as a CFD with an all-wildcard pattern tuple. */
  def fd(rel: String, lhs: Vector[String], rhs: String): CFD =
    CFD(rel, lhs, rhs, lhs.map(_ => None), None)

  /** Naive pairwise inconsistency test for constant-pattern CFDs — detects
    * the textbook case `(A→B, a1||b1)` vs `(B→A, b1||a2)` (paper Sec. 2.3):
    * the first forces B=b1 whenever A=a1, the second forces A=a2≠a1 whenever
    * B=b1. Full consistency checking is out of scope (the paper delegates to
    * [Bohannon et al. 2007]); learning assumes a consistent set.
    */
  def inconsistentPair(c1: CFD, c2: CFD): Boolean = {
    if (c1.rel != c2.rel) return false
    (for {
      (a1, p1) <- c1.lhs.zip(c1.lhsPattern)
      if c1.rhsPattern.isDefined && p1.isDefined
      (a2, p2) <- c2.lhs.zip(c2.lhsPattern)
      if c2.rhsPattern.isDefined && p2.isDefined
    } yield {
      // c1: a1=p1 forces c1.rhs=c1.rhsPattern; c2: a2=p2 forces c2.rhs=...
      a2 == c1.rhs && p2 == c1.rhsPattern &&
      c2.rhs == a1 && c2.rhsPattern != p1
    }).exists(identity)
  }
}
