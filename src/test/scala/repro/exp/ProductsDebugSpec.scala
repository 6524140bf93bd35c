package repro.exp

import repro.SparkSpec
import repro.core.db.Database
import repro.core.learn._
import repro.spark.SimJoin

/** Diagnostic harness for the products task (temporary aid kept as an
  * integration test at tiny scale).
  */
class ProductsDebugSpec extends SparkSpec {

  test("products task: ground clause reaches amazon_category and DLearn learns it") {
    val task = Tables.productsTask(spark, ExpScale.tiny, p = 0.0)
    val db   = Database.fromFrames(task.spec.schema, task.frames)
    val t0   = System.nanoTime()
    val idx  = SimJoin.buildIndex(spark, db, task.spec.mds, km = 2)
    info(f"simIndex build: ${(System.nanoTime() - t0) / 1e9}%.1fs")
    val params  = Tables.baseParams.copy(mdMode = MdMode.SimMd, d = task.d)
    val learner = new DLearn(db, task.spec, idx, params)

    val g = learner.builder.build(task.pos.head, variabilize = false)
    info(s"ground clause for ${task.pos.head.args.head} (${g.body.size} literals):")
    g.body.groupBy(_.pred).foreach { case (p, ls) => info(f"  $p%-18s x${ls.size}") }
    val catLits = g.body.filter(_.pred == "amazon_category")
    info("  categories: " + catLits.map(_.render).mkString(", "))
    assert(catLits.nonEmpty, "positive example must reach amazon_category")

    val t1 = System.nanoTime()
    val (defn, stats) = learner.learn(task.pos, task.neg)
    info(f"learn: ${(System.nanoTime() - t1) / 1e9}%.1fs stats=$stats")
    info("definition:\n" + defn.render)
    val posG = learner.coverage.groundAll(learner.builder, task.pos)
    val negG = learner.coverage.groundAll(learner.builder, task.neg)
    val m    = Eval.evaluate(learner, defn, posG, negG)
    info(f"train P=${m.precision}%.2f R=${m.recall}%.2f F1=${m.f1}%.2f")
    assert(m.f1 > 0.5, s"train F1 ${m.f1}")
  }
}
