package repro.dirty

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.constraints.{CFD, MD}
import repro.core.db._

/** One hidden paper entity and its DBLP / Google Scholar renderings. */
final case class PaperRow(
    id: Long,
    dId: String,
    gsId: String,
    titleD: String,
    titleS: String,
    venueD: String,
    venueS: String,
    year: Int,
    authorsD: Seq[String],
    authorsS: Seq[String],
)

/** Synthetic DBLP+Google Scholar analog (DESIGN.md §3). Target:
  * `gsPaperYear(gsId, year)` — arity 2; the publication year exists *only* on
  * the DBLP side, so without the title/venue MDs the head's `year` variable
  * can never be usefully bound (paper: Castor-NoMD F1 = 0). Scholar author
  * names are always abbreviated, so authors give no exact cross-database
  * join. Two MDs: titles and venues.
  */
object Papers {

  final case class Config(
      n: Int = 1800,
      familyFrac: Double = 0.45,
      identicalTitleFrac: Double = 0.25,
      seed: Long = 777,
  )

  val venueNames: Vector[String] = Vector.tabulate(25)(i => Words.word(4000 + i))
  val paperVariants              = Vector("revisited", "extended", "part two", "demo")

  def row(cfg: Config)(id: Long): PaperRow = {
    val s       = cfg.seed
    val groupId = id / 3
    val inFam   = Rnd.double(s, groupId, 1) < cfg.familyFrac
    val baseKey = if (inFam) groupId else 3000000L + id
    val w       = Vector.tabulate(4)(k => Words.titleWord(baseKey * 4 + k, s))
    val base    = w.mkString(" ")
    val titleD0 = if (inFam) base + " " + paperVariants((id % 3).toInt) else base

    val c = Rnd.double(s, id, 2)
    val titleS0 =
      if (c < cfg.identicalTitleFrac) titleD0
      else if (c < cfg.identicalTitleFrac + 0.15) s"$titleD0 abstract"
      else if (c < cfg.identicalTitleFrac + 0.45) {
        // Version marker dropped: ambiguous with the paper's other versions.
        if (inFam) base else w.take(3).mkString(" ")
      } else if (c < cfg.identicalTitleFrac + 0.60)
        (Vector(w(1), w(0), w(2), w(3)) ++ (if (inFam) Vector(paperVariants((id % 3).toInt)) else Vector.empty)).mkString(" ")
      else Words.typo(titleD0, Rnd.hash(s, id, 4))

    val venue  = venueNames(Rnd.int(venueNames.length, s, id, 5))
    val vs     = Rnd.double(s, id, 6)
    val venueS =
      if (vs < 0.40) venue
      else if (vs < 0.70) s"proc of $venue"
      else s"$venue conf"

    val year    = 1995 + Rnd.int(25, s, id, 7)
    val nAuth   = math.max(4, (cfg.n * 1.2).toInt)
    val authors = Vector.tabulate(2 + Rnd.int(2, s, id, 8))(j => Words.person(200000 + Rnd.int(nAuth, s, id, 20 + j), s))

    PaperRow(
      id = id,
      dId = s"d$id",
      gsId = s"gs$id",
      titleD = titleD0,
      titleS = titleS0,
      venueD = venue,
      venueS = venueS,
      year = year,
      authorsD = authors,
      authorsS = authors.map(Words.abbrevFirst), // Scholar always abbreviates
    )
  }

  def rows(spark: SparkSession, cfg: Config): Dataset[PaperRow] = {
    import spark.implicits._
    val c = cfg
    spark.range(c.n.toLong).map(id => row(c)(id))
  }

  def frames(rows: Dataset[PaperRow]): Map[String, DataFrame] = Map(
    "dblp_paper"      -> rows.select(col("dId").as("id"), col("titleD").as("title"), col("venueD").as("venue"), col("year").cast("string")),
    "dblp_authors"    -> rows.select(col("dId").as("id"), explode(col("authorsD")).as("author")),
    "scholar_paper"   -> rows.select(col("gsId").as("id"), col("titleS").as("title"), col("venueS").as("venue")),
    "scholar_authors" -> rows.select(col("gsId").as("id"), explode(col("authorsS")).as("author")),
  )

  val schema: Schema = Schema(Vector(
    RelSpec("dblp_paper", Vector("id", "title", "venue", "year"), Set.empty),
    RelSpec("dblp_authors", Vector("id", "author"), Set.empty),
    RelSpec("scholar_paper", Vector("id", "title", "venue"), Set.empty),
    RelSpec("scholar_authors", Vector("id", "author"), Set.empty),
  ))

  val mds: Vector[MD] = Vector(
    MD(AttrRef("dblp_paper", "title"), AttrRef("scholar_paper", "title")),
    MD(AttrRef("dblp_paper", "venue"), AttrRef("scholar_paper", "venue")),
  )

  /** 2 CFDs (paper Sec. 6.1.2: "id determines title in Google Scholar"). */
  val cfds: Vector[CFD] = Vector(
    CFD.fd("scholar_paper", Vector("id"), "title"),
    CFD.fd("dblp_paper", Vector("id"), "year"),
  )

  val spec: DatasetSpec = DatasetSpec(
    name = "papers",
    schema = schema,
    target = TargetSpec(
      "gsPaperYear",
      Vector("gsId", "year"),
      Vector(
        Set(AttrRef("scholar_paper", "id"), AttrRef("scholar_authors", "id")),
        Set.empty, // year is output-only: bound through the body, never searched
      ),
    ),
    joinPairs = Vector(
      (AttrRef("dblp_paper", "id"), AttrRef("dblp_authors", "id")),
      (AttrRef("scholar_paper", "id"), AttrRef("scholar_authors", "id")),
    ),
    mds = mds,
    cfds = cfds,
  )

  /** Positives: (gsId, true year). Negatives: (gsId, wrong year) with the
    * wrong year drawn near the true one (and inside the year domain), so an
    * unlinked `dblp_paper(_,_,_,y)` clause covers them.
    */
  def examples(rows: Seq[PaperRow], nPos: Int, nNeg: Int, seed: Long): (Vector[Example], Vector[Example]) = {
    val byHash = rows.sortBy(r => Rnd.hash(seed, r.id, 99))
    val pos    = byHash.take(nPos)
    val negEx = byHash.take(math.max(nPos, nNeg)).flatMap { r =>
      Seq(1, 2, 3).map { k =>
        val delta   = 1 + Rnd.int(4, seed, r.id, 100L + k)
        val wrong   = if (Rnd.double(seed, r.id, 200L + k) < 0.5) r.year - delta else r.year + delta
        val clamped = math.max(1995, math.min(2019, wrong))
        val fixed   = if (clamped == r.year) (if (r.year < 2019) r.year + 1 else r.year - 1) else clamped
        Example("gsPaperYear", Vector(r.gsId, fixed.toString), positive = false)
      }
    }.distinct.take(nNeg)
    (
      pos.map(r => Example("gsPaperYear", Vector(r.gsId, r.year.toString), positive = true)).toVector,
      negEx.toVector,
    )
  }

  def injected(frames: Map[String, DataFrame], p: Double, seed: Long): Map[String, DataFrame] = {
    if (p <= 0) return frames
    frames
      .updated("scholar_paper", Inject.violations(frames("scholar_paper"), "title", p, seed, Inject.scramble))
      .updated("dblp_paper", Inject.violations(frames("dblp_paper"), "year", p, seed + 1, Inject.bumpInt(3)))
  }
}
