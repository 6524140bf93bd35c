package repro.core.learn

import org.scalacheck.{Gen, Prop}
import org.scalatest.funsuite.AnyFunSuite
import repro.Props
import repro.core.logic._

/** Property-based soundness checks of the θ-subsumption engine. */
class SubsumePropSpec extends AnyFunSuite {

  private val constGen: Gen[Const] = Gen.oneOf("a", "b", "c", "d", "e").map(Const(_))
  private val predGen: Gen[String] = Gen.oneOf("p", "q", "r")

  private val groundClauseGen: Gen[Clause] = for {
    n     <- Gen.choose(1, 8)
    preds <- Gen.listOfN(n, predGen)
    argss <- Gen.listOfN(n, Gen.listOfN(2, constGen))
    headC <- constGen
  } yield Clause(
    Literal("t", Vector(headC)),
    preds.zip(argss).map { case (p, as) => Literal(p, as.toVector) }.toVector,
    Vector.empty,
  )

  test("a clause always subsumes itself (ground reflexivity)") {
    Props.check(Prop.forAll(groundClauseGen) { g =>
      Subsume.subsumes(g, new GIndex(g))
    })
  }

  test("dropping body literals preserves subsumption (generalization soundness)") {
    Props.check(Prop.forAll(groundClauseGen, Gen.choose(0, 7)) { (g, k) =>
      val dropped = Clause(g.head, g.body.patch(k % math.max(1, g.body.size), Nil, 1), Vector.empty)
      Subsume.subsumes(dropped, new GIndex(g))
    })
  }

  test("consistent variabilization of a ground clause subsumes the original") {
    Props.check(Prop.forAll(groundClauseGen) { g =>
      // Replace each distinct constant with a distinct variable everywhere.
      val consts = (g.head.args ++ g.body.flatMap(_.args)).collect { case c: Const => c }.distinct
      val theta: Map[Term, Term] = consts.zipWithIndex.map { case (c, i) => (c: Term) -> (Var(s"x$i"): Term) }.toMap
      def lift(l: Literal) = l.copy(args = l.args.map(a => theta.getOrElse(a, a)))
      val c = Clause(lift(g.head), g.body.map(lift), Vector.empty)
      Subsume.subsumes(c, new GIndex(g))
    })
  }

  test("subsumption implies subsumption after adding literals to the target") {
    Props.check(Prop.forAll(groundClauseGen, groundClauseGen) { (g, extra) =>
      val bigger = Clause(g.head, g.body ++ extra.body, Vector.empty)
      !Subsume.subsumes(g, new GIndex(g)) || Subsume.subsumes(g, new GIndex(bigger))
    })
  }

  test("a fresh predicate in the candidate always blocks subsumption") {
    Props.check(Prop.forAll(groundClauseGen) { g =>
      val c = Clause(g.head, g.body :+ Literal("zzz", Vector(Const("a"))), Vector.empty)
      !Subsume.subsumes(c, new GIndex(g))
    })
  }

  test("ARMG toward a ground clause always yields a clause that subsumes it") {
    Props.check(Prop.forAll(groundClauseGen, groundClauseGen) { (c0, g) =>
      // variabilize c0's head constant so heads can unify
      val hv = Var("h")
      val c  = Clause(Literal("t", Vector(hv)),
        c0.body.map(_.replaceTerm(c0.head.args.head, hv)), Vector.empty)
      val r = Generalize.armg(c, new GIndex(g))
      Subsume.subsumes(r, new GIndex(g))
    })
  }
}
