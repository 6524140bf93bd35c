package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.constraints.MD
import repro.core.db.{AttrRef, Database, RelSpec, Schema}
import repro.core.sim.Similarity

class SimJoinSpec extends SparkSpec {
  import spark.implicits._

  test("blockKeys lowercases and tokenizes") {
    assert(SimJoin.blockKeys("Star Wars (1977)") == Seq("star", "wars", "1977"))
  }

  test("blockKeys dedupes and handles null/empty") {
    assert(SimJoin.blockKeys("aaa aaa bbb") == Seq("aaa", "bbb"))
    assert(SimJoin.blockKeys(null).isEmpty)
    assert(SimJoin.blockKeys("!!!").isEmpty)
  }

  test("default threshold exceeds the 0.5 floor of the averaged operator") {
    assert(SimJoin.DefaultThreshold > 0.5)
  }

  test("simPairs finds pairs sharing a block and clearing the threshold") {
    val left  = Seq("tavo rizel maku", "bodu fema").toDF("a")
    val right = Seq("tavo rizel maku (1994)", "zzz qqq").toDF("b")
    val got   = SimJoin.simPairs(left, right, 0.5).collect()
    assert(got.length == 1)
    assert(got.head.getString(0) == "tavo rizel maku")
  }

  test("simPairs never compares values without a shared token") {
    val left   = Seq("aaaa xx").toDF("a")
    val right  = Seq("aaaa yy").toDF("b") // shared token "aaaa" → compared
    val right2 = Seq("aaab yy").toDF("b") // no shared token
    assert(SimJoin.simPairs(left, right, 0.0).count() == 1)
    assert(SimJoin.simPairs(left, right2, 0.0).count() == 0)
  }

  test("simPairs scores agree with the Similarity operator") {
    val left  = Seq("tavo rizel").toDF("a")
    val right = Seq("tavo rizel maku").toDF("b")
    val row   = SimJoin.simPairs(left, right, 0.0).collect().head
    assert(math.abs(row.getDouble(2) - Similarity.sim("tavo rizel", "tavo rizel maku")) < 1e-9)
  }

  test("topK keeps the k best per partition — oracle-checked against DuckDB") {
    // Feed fixed scores so the window ranking itself is what's verified.
    val pairs = Seq(
      ("a1", "b1", 0.9), ("a1", "b2", 0.8), ("a1", "b3", 0.7),
      ("a2", "b1", 0.6), ("a2", "b2", 0.95),
    ).toDF("a", "b", "score")
    val got = SimJoin.topK(pairs, "a", "b", 2).select("a", "b", "score")
    Oracle.assertEquivalent(
      got,
      """SELECT a, b, CAST(score AS DOUBLE) score FROM (
        |  SELECT a, b, score,
        |         row_number() OVER (PARTITION BY a ORDER BY CAST(score AS DOUBLE) DESC, b) rk
        |  FROM pairs) WHERE rk <= 2""".stripMargin,
      "pairs" -> pairs,
    )
  }

  test("topK tie-breaks deterministically by the other column") {
    val pairs = Seq(("a1", "b2", 0.5), ("a1", "b1", 0.5)).toDF("a", "b", "score")
    val got   = SimJoin.topK(pairs, "a", "b", 1).collect()
    assert(got.length == 1 && got.head.getString(1) == "b1")
  }

  private val schema = Schema(Vector(
    RelSpec("r1", Vector("id", "name"), Set.empty),
    RelSpec("r2", Vector("id", "name"), Set.empty),
  ))
  private val md = MD(AttrRef("r1", "name"), AttrRef("r2", "name"))

  private def mkDb(names1: Seq[String], names2: Seq[String]): Database =
    Database.fromFrames(schema, Map(
      "r1" -> names1.zipWithIndex.map { case (n, i) => (s"a$i", n) }.toDF("id", "name"),
      "r2" -> names2.zipWithIndex.map { case (n, i) => (s"b$i", n) }.toDF("id", "name"),
    ))

  test("buildIndex produces both directions") {
    val db  = mkDb(Seq("tavo rizel maku"), Seq("tavo rizel maku (1994)"))
    val idx = SimJoin.buildIndex(spark, db, Vector(md), km = 5)
    assert(idx.directionCount == 2)
    val fwd = idx.matches(AttrRef("r1", "name"), AttrRef("r2", "name"), "tavo rizel maku")
    val bwd = idx.matches(AttrRef("r2", "name"), AttrRef("r1", "name"), "tavo rizel maku (1994)")
    assert(fwd.map(_.value) == Vector("tavo rizel maku (1994)"))
    assert(bwd.map(_.value) == Vector("tavo rizel maku"))
  }

  test("buildIndex truncates to k_m and sorts by score") {
    val sibs = (2 to 5).map(i => s"tavo rizel maku part $i") :+ "tavo rizel maku"
    val db   = mkDb(Seq("tavo rizel maku"), sibs)
    val km2  = SimJoin.buildIndex(spark, db, Vector(md), km = 2)
    val km5  = SimJoin.buildIndex(spark, db, Vector(md), km = 5)
    val m2   = km2.matches(AttrRef("r1", "name"), AttrRef("r2", "name"), "tavo rizel maku")
    val m5   = km5.matches(AttrRef("r1", "name"), AttrRef("r2", "name"), "tavo rizel maku")
    assert(m2.size == 2 && m5.size == 5)
    assert(m2.head.value == "tavo rizel maku", "the exact match must rank first")
    assert(m5.map(_.score) == m5.map(_.score).sorted.reverse)
  }

  test("buildIndex respects the similarity threshold") {
    val db  = mkDb(Seq("tavo rizel maku"), Seq("takk zzz unrelated"))
    val idx = SimJoin.buildIndex(spark, db, Vector(md), km = 5, threshold = 0.8)
    assert(idx.matches(AttrRef("r1", "name"), AttrRef("r2", "name"), "tavo rizel maku").isEmpty)
  }

  test("empty SimIndex returns no matches") {
    assert(SimIndex.empty.matches(AttrRef("r1", "name"), AttrRef("r2", "name"), "x").isEmpty)
    assert(SimIndex.empty.directionCount == 0)
  }
}
