package repro.core.learn

import org.scalatest.funsuite.AnyFunSuite
import repro.core.logic._

class SubsumeSpec extends AnyFunSuite {
  private val x = Var("x"); private val y = Var("y"); private val z = Var("z")
  private def c(head: Literal, body: Literal*): Clause = Clause(head, body.toVector, Vector.empty)
  private def gi(cl: Clause): GIndex                   = new GIndex(cl)
  private def C(v: String): Const                      = Const(v)

  test("unifyArgs binds variables consistently") {
    val th = Subsume.unifyArgs(Vector(x, y, x), Vector(C("a"), C("b"), C("a")), Map.empty)
    assert(th.contains(Map(x -> C("a"), y -> C("b"))))
  }

  test("unifyArgs rejects inconsistent bindings") {
    assert(Subsume.unifyArgs(Vector(x, x), Vector(C("a"), C("b")), Map.empty).isEmpty)
  }

  test("unifyArgs rejects constant mismatch") {
    assert(Subsume.unifyArgs(Vector(C("a")), Vector(C("b")), Map.empty).isEmpty)
  }

  test("unifyArgs rejects arity mismatch") {
    assert(Subsume.unifyArgs(Vector(x), Vector(C("a"), C("b")), Map.empty).isEmpty)
  }

  test("unifyArgs extends an existing substitution") {
    val th = Subsume.unifyArgs(Vector(y), Vector(C("b")), Map(x -> C("a")))
    assert(th.contains(Map(x -> C("a"), y -> C("b"))))
  }

  // Paper Sec. 4.2: C1: hg(x) :- movies(x,y,z) θ-subsumes
  // C2: hg(a) :- movies(a,b,c), mov2genres(b,'comedy').
  test("paper example: shorter clause subsumes the longer one") {
    val c1 = c(Literal("hg", Vector(x)), Literal("movies", Vector(x, y, z)))
    val c2 = c(
      Literal("hg", Vector(C("a"))),
      Literal("movies", Vector(C("a"), C("b"), C("c"))),
      Literal("mov2genres", Vector(C("b"), C("comedy"))),
    )
    assert(Subsume.subsumes(c1, gi(c2)))
    assert(!Subsume.subsumes(c2, c1 match { case cl => gi(cl) }))
  }

  test("head predicate or constant mismatch fails") {
    val c1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"))))
    val g1 = c(Literal("t", Vector(C("b"))), Literal("r", Vector(C("b"))))
    assert(!Subsume.subsumes(c1, gi(g1)))
  }

  test("head variables map to ground head constants") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x)))
    val g1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"))))
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("body literal with no counterpart fails") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x)), Literal("s", Vector(x)))
    val g1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"))))
    assert(!Subsume.subsumes(c1, gi(g1)))
  }

  test("join across two body literals requires a shared constant") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal("s", Vector(y)))
    val gOk = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("b"))),
      Literal("s", Vector(C("b"))),
    )
    val gBad = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("b"))),
      Literal("s", Vector(C("c"))),
    )
    assert(Subsume.subsumes(c1, gi(gOk)))
    assert(!Subsume.subsumes(c1, gi(gBad)))
  }

  test("two clause variables may map to the same constant (no inequality)") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal("r", Vector(x, z)))
    val g1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"), C("b"))))
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("backtracking explores multiple candidates") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal("s", Vector(y, C("hit"))))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("b1"))),
      Literal("r", Vector(C("a"), C("b2"))),
      Literal("s", Vector(C("b2"), C("hit"))),
    )
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("sim literal maps onto a ground sim fact") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal.sim(y, z), Literal("s", Vector(z)))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("u"))),
      Literal.sim(C("u"), C("v")),
      Literal("s", Vector(C("v"))),
    )
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("sim literal matches in reverse orientation (symmetry)") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal.sim(z, y), Literal("s", Vector(z)))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("u"))),
      Literal.sim(C("u"), C("v")),
      Literal("s", Vector(C("v"))),
    )
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("sim literal is reflexively satisfied when both sides are equal") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal.sim(y, z), Literal("s", Vector(z)))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("u"))),
      Literal("s", Vector(C("u"))), // no sim fact: u ≈ u holds reflexively
    )
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("sim literal fails without a fact or equality") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal.sim(y, z), Literal("s", Vector(z)))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("u"))),
      Literal("s", Vector(C("w"))),
    )
    assert(!Subsume.subsumes(c1, gi(g1)))
  }

  test("equality literal binds an unbound side") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal.eq(y, z), Literal("s", Vector(z)))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("u"))),
      Literal("s", Vector(C("u"))),
    )
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("equality literal fails on distinct bound values") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)), Literal("s", Vector(z)), Literal.eq(y, z))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("u"))),
      Literal("s", Vector(C("w"))),
    )
    assert(!Subsume.subsumes(c1, gi(g1)))
  }

  test("doubly-unbound equality is not a blocker") {
    val u = Var("u"); val w = Var("w")
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x)), Literal.eq(u, w))
    val g1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"))))
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("constants in body literals must match exactly") {
    val c1 = c(Literal("t", Vector(x)), Literal("g", Vector(x, C("Drama"))))
    val gOk  = c(Literal("t", Vector(C("a"))), Literal("g", Vector(C("a"), C("Drama"))))
    val gBad = c(Literal("t", Vector(C("a"))), Literal("g", Vector(C("a"), C("Comedy"))))
    assert(Subsume.subsumes(c1, gi(gOk)))
    assert(!Subsume.subsumes(c1, gi(gBad)))
  }

  test("empty body subsumes anything with a matching head") {
    val c1 = c(Literal("t", Vector(x)))
    val g1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"))))
    assert(Subsume.subsumes(c1, gi(g1)))
  }

  test("nodeCap aborts pathological searches (returns false, never hangs)") {
    // 12 mutually-joined body literals over a ground clause with 6 candidates
    // each but no solution.
    val vars = Vector.tabulate(12)(i => Var(s"w$i"))
    val body = vars.sliding(2).map(p => Literal("e", Vector(p(0), p(1)))).toVector :+
      Literal("q", Vector(vars.last))
    val c1 = Clause(Literal("t", Vector(vars.head)), body, Vector.empty)
    val gBody = (for { i <- 0 until 6; j <- 0 until 6 } yield
      Literal("e", Vector(C(s"n$i"), C(s"n$j")))).toVector
    val g1 = Clause(Literal("t", Vector(C("n0"))), gBody, Vector.empty)
    assert(!Subsume.subsumes(c1, gi(g1), nodeCap = 500))
  }

  test("GIndex candidates narrow by position and term") {
    val g1 = gi(c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("b"))),
      Literal("r", Vector(C("a"), C("c"))),
    ))
    assert(g1.candidates("r").size == 2)
    assert(g1.candidates("r", 1, C("b")).size == 1)
    assert(g1.candidates("zzz").isEmpty)
  }

  test("GIndex stores sim facts in both orientations") {
    val g1 = gi(c(Literal("t", Vector(C("a"))), Literal.sim(C("u"), C("v"))))
    assert(g1.candidates(Literal.Sim).size == 2)
  }

  test("subsumption is reflexive on ground clauses") {
    val g1 = c(Literal("t", Vector(C("a"))), Literal("r", Vector(C("a"), C("b"))))
    assert(Subsume.subsumes(g1, gi(g1)))
  }

  test("subsumption tolerates extra literals in the target") {
    val c1 = c(Literal("t", Vector(x)), Literal("r", Vector(x, y)))
    val g1 = c(
      Literal("t", Vector(C("a"))),
      Literal("r", Vector(C("a"), C("b"))),
      Literal("s", Vector(C("b"))),
      Literal("q", Vector(C("zzz"))),
    )
    assert(Subsume.subsumes(c1, gi(g1)))
  }
}
