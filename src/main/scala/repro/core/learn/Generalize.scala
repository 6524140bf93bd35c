package repro.core.learn

import repro.core.logic.{Clause, Literal}

/** ProGolem-style asymmetric relative minimal generalization (ARMG), paper
  * Sec. 4.2: scan the (ordered) body of a clause, maintaining the frontier of
  * substitutions into the target example's ground bottom-clause; a literal
  * that empties the frontier is a *blocking literal* and is removed. The
  * result θ-subsumes the input (literal dropping only) and covers the target
  * example by construction; head-connectivity is restored afterwards, and
  * repair groups whose literals were dropped disappear (the repaired versions
  * of the result generalize the repaired versions of the input —
  * Theorem 4.12).
  */
object Generalize {

  def armg(c: Clause, g: GIndex, maxFrontier: Int = 256): Clause = {
    Subsume.unifyArgs(c.head.args, g.clause.head.args, Map.empty) match {
      case None => c // heads incompatible — cannot generalize toward this example
      case Some(th0) =>
        var frontier: Vector[Subsume.Theta] = Vector(th0)
        val kept = Vector.newBuilder[Literal]
        for (lit <- c.body) {
          val ext = frontier.iterator
            .flatMap(th => Subsume.extensions(lit, th, g))
            .distinct
            .take(maxFrontier)
            .toVector
          if (ext.isEmpty) {
            // blocking literal: drop it, keep the current frontier
          } else {
            kept += lit
            frontier = ext
          }
        }
        Clause(c.head, kept.result(), c.groups).normalized.pruneGroups
    }
  }
}
