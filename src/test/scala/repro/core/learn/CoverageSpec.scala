package repro.core.learn

import org.scalatest.funsuite.AnyFunSuite
import repro.core.constraints.CFD
import repro.core.db.{Example, RelSpec, Schema}
import repro.core.logic._

/** Coverage semantics over dirty ground clauses (Defs. 3.4 / 3.6). */
class CoverageSpec extends AnyFunSuite {
  private val x = Var("x")
  private def C(v: String): Const = Const(v)

  private val schema = Schema(Vector(RelSpec("rating", Vector("id", "rating"), Set("rating"))))
  private val cfds   = Vector(CFD.fd("rating", Vector("id"), "rating"))
  private val cov    = new Coverage(cfds, schema, LearnParams())

  /** Clause: t(x) :- rating(x, R). */
  private val cR = Clause(Literal("t", Vector(x)), Vector(Literal("rating", Vector(x, C("R")))), Vector.empty)

  private def groundEx(key: String, ratings: String*): GroundEx = {
    val lits = ratings.map(r => Literal("rating", Vector(C(key), C(r)))).toVector
    val g = Clause(Literal("t", Vector(C(key))), lits, Expand.detectGroups(lits, cfds, schema))
    cov.groundFrom(Example("t", Vector(key), positive = true), g)
  }

  test("clean ground clause: positive and negative semantics agree") {
    val g = groundEx("e", "R")
    val e = cov.expand(cR)
    assert(cov.coversPos(e, g))
    assert(cov.coversNeg(e, g))
  }

  test("clean ground clause without the value is not covered") {
    val g = groundEx("e", "PG")
    val e = cov.expand(cR)
    assert(!cov.coversPos(e, g))
    assert(!cov.coversNeg(e, g))
  }

  test("dirty positive stays covered: some repair keeps R (Def 3.4)") {
    val g = groundEx("e", "R", "PG")
    assert(g.expansions.size >= 2, "conflicting ratings must yield multiple repairs")
    assert(cov.coversPos(cov.expand(cR), g))
  }

  test("dirty negative with spurious R is covered (Def 3.6)") {
    // true rating PG, injected spurious R: ∃ repair keeping R → covered.
    val g = groundEx("e", "PG", "R")
    assert(cov.coversNeg(cov.expand(cR), g))
  }

  test("a contradictory candidate clause covers no clean positive (∀ side of Def 3.4)") {
    val both = Vector(
      Literal("rating", Vector(x, C("R"))),
      Literal("rating", Vector(x, C("PG"))),
    )
    val cBoth = Clause(Literal("t", Vector(x)), both, Expand.detectGroups(both, cfds, schema))
    val exp   = cov.expand(cBoth)
    assert(exp.size >= 2)
    // Clean positive rated R: the PG-repair of the clause cannot subsume it.
    assert(!cov.coversPos(exp, groundEx("e", "R")))
    // But as a negative test (∃ semantics) it is covered.
    assert(cov.coversNeg(exp, groundEx("e", "R")))
  }

  test("contradictory clause covers a positive whose ground clause has both repairs") {
    val both = Vector(
      Literal("rating", Vector(x, C("R"))),
      Literal("rating", Vector(x, C("PG"))),
    )
    val cBoth = Clause(Literal("t", Vector(x)), both, Expand.detectGroups(both, cfds, schema))
    // Ground clause also dirty with both values: each clause-repair finds its
    // ground-repair (R→R, PG→PG).
    assert(cov.coversPos(cov.expand(cBoth), groundEx("e", "R", "PG")))
  }

  test("expand caches nothing but is deterministic") {
    assert(cov.expand(cR) == cov.expand(cR))
  }

  test("counts tallies positive and negative coverage in parallel") {
    val pos = Vector(groundEx("p1", "R"), groundEx("p2", "R", "PG"), groundEx("p3", "G"))
    val neg = Vector(groundEx("n1", "PG"), groundEx("n2", "PG", "R"))
    val (p, n) = cov.counts(cR, pos, neg)
    assert(p == 2) // p1 clean, p2 dirty-covered; p3 not
    assert(n == 1) // n2 via spurious R
  }

  test("coveredPos returns per-example flags in order") {
    val pos = Vector(groundEx("p1", "R"), groundEx("p2", "G"))
    assert(cov.coveredPos(cR, pos) == Vector(true, false))
  }

  test("Par.map preserves order and arity") {
    val xs = (1 to 100).toVector
    assert(Par.map(xs)(_ * 2) == xs.map(_ * 2))
    assert(Par.count(xs)(_ % 2 == 0) == 50)
  }

  test("Par.map on empty and singleton inputs") {
    assert(Par.map(Vector.empty[Int])(_ * 2).isEmpty)
    assert(Par.map(Vector(3))(_ * 2) == Vector(6))
  }
}
