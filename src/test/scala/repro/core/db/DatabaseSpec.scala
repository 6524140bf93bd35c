package repro.core.db

import repro.SparkSpec
import repro.core.constraints.{CFD, MD}

class DatabaseSpec extends SparkSpec {
  import spark.implicits._

  private val schema = Schema(Vector(
    RelSpec("r", Vector("id", "v"), Set("v")),
    RelSpec("s", Vector("id", "w"), Set.empty),
  ))

  private def db = Database.fromFrames(
    schema,
    Map(
      "r" -> Seq(("1", "a"), ("2", "b"), ("2", "c")).toDF("id", "v"),
      "s" -> Seq(("1", "x"), ("3", "y")).toDF("id", "w"),
    ),
  )

  test("fromFrames collects tuples per relation") {
    assert(db.tuples("r").length == 3)
    assert(db.tuples("s").length == 2)
    assert(db.tupleCount == 5)
  }

  test("fromFrames respects schema column order") {
    // Frame with swapped column order must still land in schema order.
    val d = Database.fromFrames(
      schema,
      Map(
        "r" -> Seq(("a", "1")).toDF("v", "id"),
        "s" -> Seq(("1", "x")).toDF("id", "w"),
      ),
    )
    assert(d.tuples("r").head.toSeq == Seq("1", "a"))
  }

  test("fromFrames fails on a missing relation") {
    intercept[IllegalArgumentException](
      Database.fromFrames(schema, Map("r" -> Seq(("1", "a")).toDF("id", "v")))
    )
  }

  test("lookup finds tuples by attribute value") {
    val hits = db.lookup("r", 0, "2")
    assert(hits.length == 2)
    assert(db.lookup("r", 1, "a").length == 1)
  }

  test("lookup misses return empty") {
    assert(db.lookup("r", 0, "99").isEmpty)
    assert(db.lookup("s", 1, "zzz").isEmpty)
  }

  test("domain lists distinct attribute values") {
    assert(db.domain(AttrRef("r", "v")).toSet == Set("a", "b", "c"))
    assert(db.domain(AttrRef("s", "id")).toSet == Set("1", "3"))
  }

  test("nulls are preserved but never indexed") {
    val d = Database.fromFrames(
      schema,
      Map(
        "r" -> Seq(("1", null.asInstanceOf[String])).toDF("id", "v"),
        "s" -> Seq(("1", "x")).toDF("id", "w"),
      ),
    )
    assert(d.tuples("r").head(1) == null)
    assert(d.lookup("r", 1, "null").isEmpty)
  }

  test("RelSpec attrIdx resolves and rejects unknown attributes") {
    val r = schema("r")
    assert(r.attrIdx("id") == 0)
    assert(r.attrIdx("v") == 1)
    intercept[IllegalArgumentException](r.attrIdx("nope"))
  }

  test("RelSpec constAttrs must be a subset of attrs") {
    intercept[IllegalArgumentException](RelSpec("r", Vector("a"), Set("zzz")))
  }

  test("RelSpec isConstAttr by index") {
    val r = schema("r")
    assert(!r.isConstAttr(0))
    assert(r.isConstAttr(1))
  }

  test("Schema lookup by name and contains") {
    assert(schema.contains("r"))
    assert(!schema.contains("zzz"))
    intercept[NoSuchElementException](schema("zzz"))
  }

  private val spec = DatasetSpec(
    name = "toy",
    schema = schema,
    target = TargetSpec("t", Vector("id"), Vector(Set(AttrRef("r", "id")))),
    joinPairs = Vector((AttrRef("r", "id"), AttrRef("s", "id"))),
    mds = Vector(MD(AttrRef("r", "v"), AttrRef("s", "w"))),
    cfds = Vector(CFD.fd("r", Vector("id"), "v")),
  )

  test("joinGraph is symmetric") {
    assert(spec.joinGraph(AttrRef("r", "id")) == Vector(AttrRef("s", "id")))
    assert(spec.joinGraph(AttrRef("s", "id")) == Vector(AttrRef("r", "id")))
  }

  test("joinGraph default is empty") {
    assert(spec.joinGraph(AttrRef("r", "v")).isEmpty)
  }

  test("withExactMdJoins adds MD pairs to the join graph") {
    val g = spec.withExactMdJoins.joinGraph
    assert(g(AttrRef("r", "v")) == Vector(AttrRef("s", "w")))
    assert(g(AttrRef("s", "w")) == Vector(AttrRef("r", "v")))
  }

  test("Example key concatenates arguments") {
    assert(Example("t", Vector("a", "b"), positive = true).key == "a|b")
  }

  test("TargetSpec arity") {
    assert(spec.target.arity == 1)
  }
}
