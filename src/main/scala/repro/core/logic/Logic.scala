package repro.core.logic

/** First-order logic core for DLearn: terms, literals, Horn clauses.
  *
  * Everything is an immutable, serializable case class so clauses can cross
  * Spark/thread-pool boundaries. Predicate names of relation literals are the
  * relation names of the schema; two built-in predicates exist: similarity
  * (`Literal.Sim`, from MD matches) and equality (`Literal.Eq`).
  */
sealed trait Term extends Serializable {
  /** Rendering used in clause pretty-printing. */
  def render: String
}

/** A logical variable. Names are globally unique within a clause. */
final case class Var(name: String) extends Term {
  override def render: String = name
}

/** A constant (all values are strings at this layer, like the paper's VoltDB
  * backend, which compares attribute values as domain values).
  */
final case class Const(value: String) extends Term {
  override def render: String = "\"" + value + "\""
}

/** A literal: predicate applied to terms.
  *
  * @param pred  relation name, or one of [[Literal.Sim]] / [[Literal.Eq]]
  * @param args  argument terms, arity = relation arity (2 for sim/eq)
  */
final case class Literal(pred: String, args: Vector[Term]) extends Serializable {
  def isSim: Boolean = pred == Literal.Sim
  def isEq: Boolean  = pred == Literal.Eq
  /** True for literals over schema relations (not built-ins). */
  def isRel: Boolean = !isSim && !isEq

  def vars: Set[Var] = args.collect { case v: Var => v }.toSet

  /** Apply a substitution; unmapped variables stay as-is. */
  def subst(theta: Map[Var, Term]): Literal =
    copy(args = args.map {
      case v: Var => theta.getOrElse(v, v)
      case c      => c
    })

  /** Replace one term by another everywhere in this literal. */
  def replaceTerm(from: Term, to: Term): Literal =
    copy(args = args.map(a => if (a == from) to else a))

  def render: String = pred + "(" + args.map(_.render).mkString(", ") + ")"
}

object Literal {
  /** Similarity built-in predicate `x ≈ y` (symmetric). */
  val Sim = "≈"
  /** Equality built-in predicate `x = y`. */
  val Eq = "="

  def sim(a: Term, b: Term): Literal = Literal(Sim, Vector(a, b))
  def eq(a: Term, b: Term): Literal  = Literal(Eq, Vector(a, b))
}

/** A CFD-violation repair group attached to a clause: the compact stand-in for
  * the paper's CFD repair literals (Sec. 3.2). `l1` and `l2` are the two body
  * literals of relation `cfd.relation` that jointly violate `cfd`. The group
  * is *live* only while both literals remain in the body; generalization that
  * drops either literal also removes the violation (and the group).
  *
  * @param cfdId index of the CFD in the dataset's CFD list (kept as an id so
  *              groups stay small and serializable)
  */
final case class CfdGroup(cfdId: Int, l1: Literal, l2: Literal) extends Serializable

/** A Horn clause `head :- body`, with CFD repair groups.
  *
  * Body order matters: bottom-clause construction emits literals in BFS
  * discovery order and ARMG scans them in that order (the paper's "total
  * order ... in each clause in the hypothesis space").
  */
final case class Clause(head: Literal, body: Vector[Literal], groups: Vector[CfdGroup])
    extends Serializable {

  def vars: Set[Var] = head.vars ++ body.flatMap(_.vars)

  /** Groups whose both literals are still present in the body. */
  def liveGroups: Vector[CfdGroup] = {
    val bs = body.toSet
    groups.filter(g => bs.contains(g.l1) && bs.contains(g.l2))
  }

  def withBody(newBody: Vector[Literal]): Clause =
    Clause(head, newBody, groups).pruneGroups

  /** Drop groups referring to removed literals. */
  def pruneGroups: Clause = copy(groups = liveGroups)

  /** All head variables appear in some body literal — required for a clause
    * to be a valid (range-restricted) definition.
    */
  def headConnected: Boolean = {
    val bodyVars: Set[Var] = body.flatMap(_.vars).toSet
    head.vars.subsetOf(bodyVars)
  }

  /** Keep only body literals transitively connected to the head through
    * shared variables (the paper's head-connectedness). Built-in literals
    * (sim/eq) act as connectors but cannot be the sole reason a relation
    * literal is retained unless they link it to the connected component.
    */
  def headConnectedBody: Clause = {
    var reached: Set[Var] = head.vars
    var keep    = Vector.empty[Literal]
    var pending = body
    var changed = true
    while (changed) {
      changed = false
      val (in, out) = pending.partition(l => l.vars.exists(reached.contains) || l.vars.isEmpty)
      if (in.nonEmpty) {
        keep ++= in
        reached ++= in.flatMap(_.vars)
        pending = out
        changed = true
      }
    }
    // Preserve original body order.
    val keepSet = keep.toSet
    withBody(body.filter(keepSet.contains))
  }

  /** Drop sim/eq literals that no longer touch any relation literal's
    * variable (the paper removes restriction literals whose variables vanish
    * from all schema-relation literals).
    */
  def dropDanglingBuiltins: Clause = {
    val relVars: Set[Var] = body.filter(_.isRel).flatMap(_.vars).toSet ++ head.vars
    withBody(body.filter(l => l.isRel || l.vars.forall(relVars.contains)))
  }

  /** Fixpoint of head-connectivity pruning and dangling-builtin removal:
    * removing a similarity/equality literal can disconnect a relation
    * literal and vice versa, so iterate until stable.
    */
  def normalized: Clause = {
    var cur  = this
    var prev: Clause = null
    while (cur != prev) {
      prev = cur
      cur = cur.headConnectedBody.dropDanglingBuiltins
    }
    cur
  }

  def render: String =
    head.render + " :- " + body.map(_.render).mkString(", ") +
      (if (groups.nonEmpty) s"  [${groups.size} cfd group(s)]" else "")
}

/** A learned definition: a set of clauses with the same head predicate. */
final case class Definition(clauses: Vector[Clause]) extends Serializable {
  def isEmpty: Boolean = clauses.isEmpty
  def render: String   = clauses.map(_.render).mkString("\n")
}
