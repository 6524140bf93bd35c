package repro.core.learn

import org.scalatest.funsuite.AnyFunSuite

class EvalSpec extends AnyFunSuite {

  test("metrics: precision, recall, f1") {
    val m = Metrics(tp = 8, fp = 2, fn = 2)
    assert(m.precision == 0.8)
    assert(m.recall == 0.8)
    assert(math.abs(m.f1 - 0.8) < 1e-9)
  }

  test("metrics: zero predictions give zero precision and f1") {
    val m = Metrics(tp = 0, fp = 0, fn = 10)
    assert(m.precision == 0.0)
    assert(m.recall == 0.0)
    assert(m.f1 == 0.0)
  }

  test("metrics: perfect classifier") {
    val m = Metrics(tp = 10, fp = 0, fn = 0)
    assert(m.f1 == 1.0)
  }

  test("metrics: all-false-positives") {
    val m = Metrics(tp = 0, fp = 5, fn = 5)
    assert(m.f1 == 0.0)
  }

  test("folds partition the input") {
    val xs    = (1 to 23).toVector
    val folds = Eval.folds(xs, 5, seed = 1)
    assert(folds.size == 5)
    for ((train, test) <- folds) {
      assert((train ++ test).sorted == xs)
      assert(train.toSet.intersect(test.toSet).isEmpty)
    }
  }

  test("folds test sets are disjoint and cover everything") {
    val xs    = (1 to 20).toVector
    val tests = Eval.folds(xs, 4, seed = 2).map(_._2)
    assert(tests.flatten.sorted == xs)
    assert(tests.map(_.size).forall(_ == 5))
  }

  test("folds are deterministic in the seed") {
    val xs = (1 to 10).toVector
    assert(Eval.folds(xs, 3, 7) == Eval.folds(xs, 3, 7))
    assert(Eval.folds(xs, 3, 7) != Eval.folds(xs, 3, 8))
  }

  test("CvResult converts ms to minutes") {
    assert(CvResult(0.5, 0.5, 0.5, 90000, "").timeMin == 1.5)
  }
}
