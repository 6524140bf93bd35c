package repro.core.learn

import repro.core.constraints.CFD
import repro.core.db.{Example, Schema}
import repro.core.logic.Clause

/** A training/test example with its ground bottom-clause and the indexed
  * repaired versions of that ground clause.
  *
  * @param raw        index of the un-repaired ground bottom-clause (ARMG target)
  * @param expansions indexes of the CFD-repaired versions (coverage targets)
  * @param union      index over the union of all expansion bodies — since
  *                   every expansion's body is a subset of it, failing to
  *                   subsume the union refutes all expansions with a single
  *                   test (the dominant case: negatives that are not covered)
  */
final case class GroundEx(ex: Example, raw: GIndex, expansions: Vector[GIndex], union: GIndex)

/** Coverage testing under the paper's dirty-data semantics (Sec. 4.3):
  *
  *  - positive (Def. 3.4): **every** repaired version of the clause must
  *    θ-subsume **some** repaired version of the ground bottom-clause;
  *  - negative (Def. 3.6): **some** repaired version of the clause θ-subsumes
  *    **some** repaired version of the ground bottom-clause.
  *
  * MD repair literals need no expansion (Theorem 4.9: θ-subsumption is sound
  * and complete for MD-only repairs), so similarity literals are matched
  * directly; only CFD repairs are enumerated.
  */
final class Coverage(cfds: Vector[CFD], schema: Schema, params: LearnParams) extends Serializable {

  /** Ground an example: build its ground bottom-clause and repaired versions. */
  def ground(builder: BottomBuilder, e: Example): GroundEx =
    groundFrom(e, builder.build(e, variabilize = false))

  /** Assemble a [[GroundEx]] from an already-built ground clause. */
  def groundFrom(e: Example, g: Clause): GroundEx = {
    val exp = Expand.repairs(g, cfds, schema, params.maxExpansions, params.maxExpandDepth)
    val union =
      if (exp.lengthCompare(1) <= 0) g.copy(groups = Vector.empty)
      else Clause(g.head, (g.body ++ exp.flatMap(_.body)).distinct, Vector.empty)
    GroundEx(e, new GIndex(g), exp.map(new GIndex(_)), new GIndex(union))
  }

  def groundAll(builder: BottomBuilder, es: Seq[Example]): Vector[GroundEx] =
    Par.map(es)(ground(builder, _))

  /** The repaired versions of a candidate clause, computed once per clause. */
  def expand(c: Clause): Vector[Clause] =
    Expand.repairs(c, cfds, schema, params.maxExpansions, params.maxExpandDepth)

  /** ∃-over-expansions with the union quick-reject. */
  private def someExpansion(ci: Clause, g: GroundEx): Boolean =
    g.expansions match {
      case Vector(only) => Subsume.subsumes(ci, only, params.nodeCap)
      case exps =>
        Subsume.subsumes(ci, g.union, params.nodeCap) &&
        exps.exists(gi => Subsume.subsumes(ci, gi, params.nodeCap))
    }

  /** Positive-coverage semantics (Def. 3.4). */
  def coversPos(cExp: Vector[Clause], g: GroundEx): Boolean =
    cExp.forall(ci => someExpansion(ci, g))

  /** Negative-coverage semantics (Def. 3.6). */
  def coversNeg(cExp: Vector[Clause], g: GroundEx): Boolean =
    cExp.exists(ci => someExpansion(ci, g))

  /** Which of `pos` are covered (positive semantics), in parallel. */
  def coveredPos(c: Clause, pos: Seq[GroundEx]): Vector[Boolean] = {
    val cExp = expand(c)
    Par.map(pos)(coversPos(cExp, _))
  }

  /** Count (positives covered, negatives covered) for scoring. */
  def counts(c: Clause, pos: Seq[GroundEx], neg: Seq[GroundEx]): (Int, Int) = {
    val cExp = expand(c)
    val p    = Par.count(pos)(coversPos(cExp, _))
    val n    = Par.count(neg)(coversNeg(cExp, _))
    (p, n)
  }
}
