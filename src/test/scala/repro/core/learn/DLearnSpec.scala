package repro.core.learn

import repro.SparkSpec
import repro.core.constraints.{CFD, MD}
import repro.core.db._
import repro.core.logic._
import repro.spark.{SimIndex, SimMatch}

/** Covering-loop learner on a small controlled two-database world:
  * entity i is positive iff tag(i) == "red" (db1) AND tag2(i) == "blue" (db2);
  * db2 is reachable only through a name MD. Names differ across databases by
  * a suffix; the sim index links them.
  */
class DLearnSpec extends SparkSpec {
  import spark.implicits._

  private val n = 60
  private def name(i: Int)  = s"entity number $i"
  private def name2(i: Int) = s"entity number $i x"
  private def red(i: Int)   = i % 2 == 0
  private def blue(i: Int)  = i % 3 == 0
  private def pos(i: Int)   = red(i) && blue(i)

  private val schema = Schema(Vector(
    RelSpec("r1", Vector("id", "name"), Set.empty),
    RelSpec("r1b", Vector("id", "tag"), Set("tag")),
    RelSpec("r2", Vector("id2", "name2"), Set.empty),
    RelSpec("r2b", Vector("id2", "tag2"), Set("tag2")),
  ))
  private val spec = DatasetSpec(
    name = "toy",
    schema = schema,
    target = TargetSpec("t", Vector("id"), Vector(Set(AttrRef("r1", "id")))),
    joinPairs = Vector(
      (AttrRef("r1", "id"), AttrRef("r1b", "id")),
      (AttrRef("r2", "id2"), AttrRef("r2b", "id2")),
    ),
    mds = Vector(MD(AttrRef("r1", "name"), AttrRef("r2", "name2"))),
    cfds = Vector(CFD.fd("r2b", Vector("id2"), "tag2")),
  )

  private def db = Database.fromFrames(schema, Map(
    "r1"  -> (0 until n).map(i => (s"e$i", name(i))).toDF("id", "name"),
    "r1b" -> (0 until n).map(i => (s"e$i", if (red(i)) "red" else "grey")).toDF("id", "tag"),
    "r2"  -> (0 until n).map(i => (s"f$i", name2(i))).toDF("id2", "name2"),
    "r2b" -> (0 until n).map(i => (s"f$i", if (blue(i)) "blue" else "pink")).toDF("id2", "tag2"),
  ))

  private val simIndex = SimIndex(Map(
    SimIndex.dirKey(AttrRef("r1", "name"), AttrRef("r2", "name2")) ->
      (0 until n).map(i => name(i) -> Vector(SimMatch(name2(i), 0.9))).toMap,
    SimIndex.dirKey(AttrRef("r2", "name2"), AttrRef("r1", "name")) ->
      (0 until n).map(i => name2(i) -> Vector(SimMatch(name(i), 0.9))).toMap,
  ))

  private val examples: Vector[Example] =
    (0 until n).map(i => Example("t", Vector(s"e$i"), positive = pos(i))).toVector
  private val posEx = examples.filter(_.positive)
  private val negEx = examples.filterNot(_.positive)

  private val params = LearnParams(d = 3, minPrecision = 0.7, minPosCovered = 2, candidateSample = 6)

  test("DLearn learns the cross-database conjunction exactly") {
    val learner = new DLearn(db, spec, simIndex, params)
    val (defn, stats) = learner.learn(posEx, negEx)
    assert(defn.clauses.nonEmpty)
    val posG = learner.coverage.groundAll(learner.builder, posEx)
    val negG = learner.coverage.groundAll(learner.builder, negEx)
    val m    = Eval.evaluate(learner, defn, posG, negG)
    assert(m.f1 == 1.0, s"expected perfect train F1, got $m\n${defn.render}")
    assert(stats.clauses == defn.clauses.size)
  }

  test("the learned clause uses both databases") {
    val learner  = new DLearn(db, spec, simIndex, params)
    val (defn, _) = learner.learn(posEx, negEx)
    val preds = defn.clauses.flatMap(_.body.map(_.pred)).toSet
    assert(preds.contains("r1b"), "needs the db1 tag")
    assert(preds.contains("r2b"), "needs the db2 tag")
  }

  test("without MDs the learner cannot reach db2 and precision collapses") {
    val p       = params.copy(mdMode = MdMode.NoMd)
    val learner = new DLearn(db, spec, SimIndex.empty, p)
    val (defn, _) = learner.learn(posEx, negEx)
    // The only db1 signal is tag=red with precision 1/3 < 0.7 → empty.
    assert(defn.isEmpty, defn.render)
  }

  test("maxClauses caps the definition size") {
    val p       = params.copy(maxClauses = 1)
    val learner = new DLearn(db, spec, simIndex, p)
    val (defn, _) = learner.learn(posEx, negEx)
    assert(defn.clauses.size <= 1)
  }

  test("learn is deterministic for a fixed seed") {
    val l1 = new DLearn(db, spec, simIndex, params)
    val l2 = new DLearn(db, spec, simIndex, params)
    assert(l1.learn(posEx, negEx)._1 == l2.learn(posEx, negEx)._1)
  }

  test("predicts matches evaluate semantics") {
    val learner   = new DLearn(db, spec, simIndex, params)
    val (defn, _) = learner.learn(posEx, negEx)
    val g  = learner.coverage.ground(learner.builder, posEx.head)
    val gN = learner.coverage.ground(learner.builder, negEx.head)
    assert(learner.predicts(defn, g))
    assert(!learner.predicts(defn, gN))
  }

  test("pre-grounded learning matches self-grounded learning") {
    val learner = new DLearn(db, spec, simIndex, params)
    val posG = learner.coverage.groundAll(learner.builder, posEx)
    val negG = learner.coverage.groundAll(learner.builder, negEx)
    val (d1, _) = learner.learn(posEx, negEx)
    val (d2, _) = learner.learn(posEx, negEx, preGround = Some((posG, negG)))
    assert(d1 == d2)
  }

  test("learning with zero positives returns an empty definition") {
    val learner = new DLearn(db, spec, simIndex, params)
    val (defn, stats) = learner.learn(Vector.empty, negEx)
    assert(defn.isEmpty)
    assert(stats.clauses == 0)
  }
}
