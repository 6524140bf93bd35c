package repro.core.constraints

import org.scalatest.funsuite.AnyFunSuite
import repro.core.db.{AttrRef, RelSpec}
import repro.core.logic.{Const, Literal, Var}

class ConstraintsSpec extends AnyFunSuite {
  private val loc = RelSpec("mov2locale", Vector("title", "language", "country"), Set("language", "country"))
  // The paper's φ1: (title, language → country, (-, English || -)).
  private val phi1 = CFD("mov2locale", Vector("title", "language"), "country",
    Vector(None, Some("English")), None)

  test("MD requires at least one pair") {
    intercept[IllegalArgumentException](MD(Vector.empty))
  }

  test("single-pair MD convenience constructor") {
    val md = MD(AttrRef("a", "x"), AttrRef("b", "y"))
    assert(md.pairs == Vector((AttrRef("a", "x"), AttrRef("b", "y"))))
  }

  test("fd factory builds an all-wildcard pattern") {
    val fd = CFD.fd("r", Vector("a"), "b")
    assert(fd.lhsPattern == Vector(None))
    assert(fd.rhsPattern.isEmpty)
  }

  test("lhsIdx and rhsIdx resolve attribute positions") {
    assert(phi1.lhsIdx(loc) == Vector(0, 1))
    assert(phi1.rhsIdx(loc) == 2)
  }

  test("lhsIdx on unknown attribute throws") {
    val bad = CFD.fd("mov2locale", Vector("nope"), "country")
    intercept[IllegalArgumentException](bad.lhsIdx(loc))
  }

  test("cellMatches: wildcard accepts any non-null value") {
    assert(phi1.cellMatches("x", None))
    assert(!phi1.cellMatches(null, None))
  }

  test("cellMatches: constant pattern requires equality") {
    assert(phi1.cellMatches("English", Some("English")))
    assert(!phi1.cellMatches("French", Some("English")))
  }

  test("violates: the paper's Bait example violates φ1") {
    val r1 = Array("Bait", "English", "USA")
    val r2 = Array("Bait", "English", "Ireland")
    assert(phi1.violates(loc, r1, r2))
  }

  test("violates: different language pattern does not trigger φ1") {
    val r1 = Array("Bait", "French", "USA")
    val r2 = Array("Bait", "French", "Ireland")
    assert(!phi1.violates(loc, r1, r2))
  }

  test("violates: same country satisfies φ1") {
    val r1 = Array("Bait", "English", "USA")
    val r2 = Array("Bait", "English", "USA")
    assert(!phi1.violates(loc, r1, r2))
  }

  test("violates: different titles never violate") {
    val r1 = Array("Bait", "English", "USA")
    val r2 = Array("Hook", "English", "Ireland")
    assert(!phi1.violates(loc, r1, r2))
  }

  test("violates: null LHS never violates") {
    val r1 = Array(null, "English", "USA")
    val r2 = Array(null, "English", "Ireland")
    assert(!phi1.violates(loc, r1, r2))
  }

  test("violates with constant RHS pattern") {
    val c  = CFD("mov2locale", Vector("title"), "country", Vector(None), Some("USA"))
    val r1 = Array("Bait", "English", "UK")
    val r2 = Array("Bait", "English", "UK")
    // equal but not matching the RHS constant → violation
    assert(c.violates(loc, r1, r2))
    assert(!c.violates(loc, Array("Bait", "e", "USA"), Array("Bait", "e", "USA")))
  }

  test("violatesLits: equal LHS vars with different RHS constants violate") {
    val x  = Var("x")
    val fd = CFD.fd("mov2locale", Vector("title", "language"), "country")
    val l1 = Literal("mov2locale", Vector(x, Const("English"), Const("USA")))
    val l2 = Literal("mov2locale", Vector(x, Const("English"), Const("Ireland")))
    assert(fd.violatesLits(loc, l1, l2))
  }

  test("violatesLits: identical literals do not violate a wildcard CFD") {
    val x  = Var("x")
    val fd = CFD.fd("mov2locale", Vector("title"), "country")
    val l1 = Literal("mov2locale", Vector(x, Const("English"), Const("USA")))
    assert(!fd.violatesLits(loc, l1, l1))
  }

  test("violatesLits: different LHS vars do not violate") {
    val fd = CFD.fd("mov2locale", Vector("title"), "country")
    val l1 = Literal("mov2locale", Vector(Var("x"), Const("e"), Const("USA")))
    val l2 = Literal("mov2locale", Vector(Var("y"), Const("e"), Const("Ireland")))
    assert(!fd.violatesLits(loc, l1, l2))
  }

  test("violatesLits: variable cannot match a constant pattern (conservative)") {
    val l1 = Literal("mov2locale", Vector(Var("x"), Var("l"), Const("USA")))
    val l2 = Literal("mov2locale", Vector(Var("x"), Var("l"), Const("Ireland")))
    assert(!phi1.violatesLits(loc, l1, l2)) // language var vs 'English' pattern
  }

  test("violatesLits: RHS as distinct variables counts as a violation") {
    val fd = CFD.fd("mov2locale", Vector("title"), "country")
    val l1 = Literal("mov2locale", Vector(Var("x"), Const("e"), Var("c1")))
    val l2 = Literal("mov2locale", Vector(Var("x"), Const("e"), Var("c2")))
    assert(fd.violatesLits(loc, l1, l2))
  }

  test("violatesLits: wrong relation name never violates") {
    val fd = CFD.fd("other", Vector("title"), "country")
    val l1 = Literal("mov2locale", Vector(Var("x"), Const("e"), Const("USA")))
    val l2 = Literal("mov2locale", Vector(Var("x"), Const("e"), Const("Ireland")))
    assert(!fd.violatesLits(loc, l1, l2))
  }

  test("inconsistentPair detects the textbook inconsistent CFDs") {
    // (A→B, a1||b1) and (B→A, b1||a2) over R(A,B) — paper Sec. 2.3.
    val c1 = CFD("r", Vector("a"), "b", Vector(Some("a1")), Some("b1"))
    val c2 = CFD("r", Vector("b"), "a", Vector(Some("b1")), Some("a2"))
    assert(CFD.inconsistentPair(c1, c2))
  }

  test("inconsistentPair accepts compatible constant CFDs") {
    val c1 = CFD("r", Vector("a"), "b", Vector(Some("a1")), Some("b1"))
    val c2 = CFD("r", Vector("b"), "a", Vector(Some("b1")), Some("a1"))
    assert(!CFD.inconsistentPair(c1, c2))
  }

  test("inconsistentPair: different relations are never inconsistent") {
    val c1 = CFD("r", Vector("a"), "b", Vector(Some("a1")), Some("b1"))
    val c2 = CFD("s", Vector("b"), "a", Vector(Some("b1")), Some("a2"))
    assert(!CFD.inconsistentPair(c1, c2))
  }

  test("pattern arity mismatch is rejected") {
    intercept[IllegalArgumentException](CFD("r", Vector("a", "b"), "c", Vector(None), None))
  }
}
