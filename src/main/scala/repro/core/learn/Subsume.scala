package repro.core.learn

import scala.collection.mutable

import repro.core.logic._

/** Indexed view of a (ground) clause used as the target of θ-subsumption
  * tests and ARMG. Built once per ground bottom-clause and reused across all
  * candidate clauses.
  */
final class GIndex(val clause: Clause) extends Serializable {
  /** pred → body literals. Similarity literals are stored in both
    * orientations (the similarity operator is symmetric).
    */
  val byPred: Map[String, Vector[Literal]] = {
    val m = mutable.LinkedHashMap.empty[String, Vector[Literal]]
    def add(l: Literal): Unit = m.update(l.pred, m.getOrElse(l.pred, Vector.empty) :+ l)
    clause.body.foreach { l =>
      add(l)
      if (l.isSim) add(Literal.sim(l.args(1), l.args(0)))
    }
    m.toMap
  }

  /** (pred, arg position, term) → literals with that term at that position. */
  val byPredPosTerm: Map[(String, Int, Term), Vector[Literal]] = {
    val m = mutable.HashMap.empty[(String, Int, Term), Vector[Literal]]
    for ((pred, lits) <- byPred; l <- lits; (t, i) <- l.args.zipWithIndex) {
      val k = (pred, i, t)
      m.update(k, m.getOrElse(k, Vector.empty) :+ l)
    }
    m.toMap
  }

  def candidates(pred: String): Vector[Literal] = byPred.getOrElse(pred, Vector.empty)
  def candidates(pred: String, pos: Int, t: Term): Vector[Literal] =
    byPredPosTerm.getOrElse((pred, pos, t), Vector.empty)
}

/** θ-subsumption `C ⊑θ G` by backtracking search, with most-constrained-first
  * literal selection. `G` is typically a ground bottom-clause; the test is
  * exactly conjunctive-query evaluation over `G`'s canonical instance.
  *
  * Equality literals are satisfied when both sides resolve to the same term
  * (binding an unbound side when possible); similarity literals map onto
  * `G`'s similarity facts in either orientation, or are reflexively satisfied
  * when both sides resolve to the same term (exactly equal values are
  * trivially similar).
  */
object Subsume {

  type Theta = Map[Var, Term]

  /** Unify candidate-literal arguments against target arguments. Constants
    * must match syntactically; variables bind consistently.
    */
  def unifyArgs(cArgs: Vector[Term], gArgs: Vector[Term], theta: Theta): Option[Theta] = {
    if (cArgs.length != gArgs.length) return None
    var th = theta
    var i  = 0
    while (i < cArgs.length) {
      cArgs(i) match {
        case v: Var =>
          th.get(v) match {
            case Some(bound) => if (bound != gArgs(i)) return None
            case None        => th = th.updated(v, gArgs(i))
          }
        case c: Const => if (c != gArgs(i)) return None
      }
      i += 1
    }
    Some(th)
  }

  private def resolve(t: Term, theta: Theta): Term = t match {
    case v: Var => theta.getOrElse(v, v)
    case c      => c
  }

  /** An unbound candidate-clause variable (as opposed to a resolved target
    * term).
    */
  private def isUnbound(t: Term, theta: Theta): Boolean = t match {
    case v: Var => !theta.contains(v)
    case _      => false
  }

  /** All extensions of `theta` that satisfy literal `lit` against `g`.
    * Returns a lazy iterator; used both by the subsumption search and by the
    * ARMG substitution frontier.
    */
  def extensions(lit: Literal, theta: Theta, g: GIndex): Iterator[Theta] = {
    if (lit.isEq) {
      val a = resolve(lit.args(0), theta)
      val b = resolve(lit.args(1), theta)
      if (a == b) Iterator.single(theta)
      else if (isUnbound(a, theta) && !isUnbound(b, theta))
        Iterator.single(theta.updated(a.asInstanceOf[Var], b))
      else if (isUnbound(b, theta) && !isUnbound(a, theta))
        Iterator.single(theta.updated(b.asInstanceOf[Var], a))
      else Iterator.empty // both unbound is deferred (see branchEstimate)
    } else if (lit.isSim) {
      val a = resolve(lit.args(0), theta)
      val b = resolve(lit.args(1), theta)
      // Reflexive satisfaction: x ≈ x holds — exactly equal values are
      // trivially similar. Never bind a clause variable to another clause
      // variable; both-unbound similarity is deferred.
      val reflexive: Iterator[Theta] =
        if (a == b) Iterator.single(theta)
        else if (isUnbound(a, theta) && !isUnbound(b, theta))
          Iterator.single(theta.updated(a.asInstanceOf[Var], b))
        else if (isUnbound(b, theta) && !isUnbound(a, theta))
          Iterator.single(theta.updated(b.asInstanceOf[Var], a))
        else Iterator.empty
      val mapped = candidateLits(lit, theta, g).iterator.flatMap(gl => unifyArgs(lit.args, gl.args, theta))
      mapped ++ reflexive
    } else {
      candidateLits(lit, theta, g).iterator.flatMap(gl => unifyArgs(lit.args, gl.args, theta))
    }
  }

  /** Candidate target literals for `lit` under `theta`, narrowed by the first
    * argument position already resolved to a ground/constant term.
    */
  private def candidateLits(lit: Literal, theta: Theta, g: GIndex): Vector[Literal] = {
    var best: Vector[Literal] = null
    var i = 0
    while (i < lit.args.length) {
      resolve(lit.args(i), theta) match {
        case v: Var => () // unbound
        case t =>
          val c = g.candidates(lit.pred, i, t)
          if (best == null || c.length < best.length) best = c
      }
      i += 1
    }
    if (best == null) g.candidates(lit.pred) else best
  }

  /** Rough candidate count used for literal selection. `Int.MaxValue` marks
    * literals that must be deferred until another literal binds one of their
    * sides (doubly-unbound equalities, and factless doubly-unbound
    * similarities).
    */
  private def branchEstimate(lit: Literal, theta: Theta, g: GIndex): Int =
    if (lit.isEq || lit.isSim) {
      val a = resolve(lit.args(0), theta)
      val b = resolve(lit.args(1), theta)
      if (isUnbound(a, theta) && isUnbound(b, theta)) {
        if (lit.isSim && g.candidates(Literal.Sim).nonEmpty) g.candidates(Literal.Sim).length
        else Int.MaxValue
      } else 1
    } else candidateLits(lit, theta, g).length

  /** Does `c` θ-subsume `g.clause`? Head literals are unified first. */
  def subsumes(c: Clause, g: GIndex, nodeCap: Int = 200000): Boolean = {
    unifyArgs(c.head.args, g.clause.head.args, Map.empty) match {
      case None => false
      case Some(th0) =>
        var nodes = 0
        def solve(remaining: List[Literal], theta: Theta): Boolean = {
          if (remaining.isEmpty) return true
          nodes += 1
          if (nodes > nodeCap) return false
          // Most-constrained-first selection.
          var bestLit: Literal = remaining.head
          var bestEst          = branchEstimate(bestLit, theta, g)
          var rest             = remaining.tail
          while (rest.nonEmpty) {
            val est = branchEstimate(rest.head, theta, g)
            if (est < bestEst) { bestEst = est; bestLit = rest.head }
            rest = rest.tail
          }
          if (bestEst == Int.MaxValue) {
            // Only deferred doubly-unbound equality/similarity literals
            // remain: they are satisfiable by aliasing their variables.
            return true
          }
          val next = remaining.filterNot(_ eq bestLit)
          val it   = extensions(bestLit, theta, g)
          while (it.hasNext) {
            if (solve(next, it.next())) return true
          }
          false
        }
        solve(c.body.toList, th0)
    }
  }
}
