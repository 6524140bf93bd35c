package repro.dirty

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

import repro.core.constraints.{CFD, MD}
import repro.core.db._

/** One hidden movie entity and its two database renderings. */
final case class MovieRow(
    id: Long,
    imdbId: String,
    omdbId: String,
    titleImdb: String,
    titleOmdb: String,
    year: Int,
    yearO: Int,
    genre: String,
    rating: String,
    country: String,
    cast: Seq[String],
    castO: Seq[String],
    writers: Seq[String],
    writersO: Seq[String],
    label: Boolean,
)

/** Synthetic IMDB+OMDB analog (DESIGN.md §3). Target:
  * `dramaRestricted(imdbId)` — genre Drama (IMDB side) ∧ rating R (OMDB side
  * only). Titles are re-rendered per database; movies come in families of
  * sequels whose titles collide after perturbation (the paper's Star Wars
  * example); cast/writer names match exactly across databases most of the
  * time (the paper's "many exact matches" MDs).
  */
object Movies {

  final case class Config(
      n: Int = 2000,
      familyFrac: Double = 0.45,
      identicalTitleFrac: Double = 0.30,
      exactNameFrac: Double = 0.55,
      yearMismatchFrac: Double = 0.10,
      usaFrac: Double = 0.5,
      pRUsa: Double = 0.42,
      pROther: Double = 0.15,
      seed: Long = 42,
  )

  val genres    = Vector("Drama", "Comedy", "Action", "Horror", "SciFi")
  val ratings   = Vector("G", "PG", "PG13", "R")
  val countries = Vector("usa", "uk", "france", "spain", "japan", "india")

  def row(cfg: Config)(id: Long): MovieRow = {
    val s       = cfg.seed
    val groupId = id / 3
    val inFam   = Rnd.double(s, groupId, 1) < cfg.familyFrac
    val baseKey = if (inFam) groupId else 1000000L + id
    val w       = Vector.tabulate(3)(k => Words.titleWord(baseKey * 3 + k, s))
    val base    = w.mkString(" ")
    val year    = 1980 + Rnd.int(40, s, id, 3)
    val titleI  = if (inFam) base + " " + Words.variant((id % 3).toInt) else base

    val c = Rnd.double(s, id, 2)
    val titleO =
      if (c < cfg.identicalTitleFrac) titleI
      else if (c < cfg.identicalTitleFrac + 0.15) s"$titleI ($year)"
      else if (c < cfg.identicalTitleFrac + 0.40) {
        // Variant / last word dropped: ambiguous with every sibling — the
        // paper's "Star Wars" phenomenon (top-1 resolution goes wrong here).
        if (inFam) base else w.take(2).mkString(" ")
      } else if (c < cfg.identicalTitleFrac + 0.55) {
        (Vector(w(1), w(0), w(2)) ++ (if (inFam) Vector(Words.variant((id % 3).toInt)) else Vector.empty))
          .mkString(" ")
      } else Words.typo(titleI, Rnd.hash(s, id, 4))

    val country = if (Rnd.double(s, id, 5) < cfg.usaFrac) "usa" else countries(1 + Rnd.int(countries.length - 1, s, id, 6))
    val g       = Rnd.double(s, id, 7)
    val genre =
      if (g < 0.30) "Drama" else if (g < 0.55) "Comedy" else if (g < 0.75) "Action"
      else if (g < 0.90) "Horror" else "SciFi"
    val pR     = if (country == "usa") cfg.pRUsa else cfg.pROther
    val rating = if (Rnd.double(s, id, 8) < pR) "R" else ratings(Rnd.int(3, s, id, 9))

    val nCast    = math.max(4, cfg.n.toInt)
    val nWriters = math.max(4, (cfg.n * 0.8).toInt)
    val cast     = Vector.tabulate(2)(j => Words.person(Rnd.int(nCast, s, id, 40 + j), s))
    val writers  = Vector.tabulate(2)(j => Words.person(100000 + Rnd.int(nWriters, s, id, 50 + j), s))
    val yearO    = if (Rnd.double(s, id, 12) < cfg.yearMismatchFrac) year + 1 else year
    def render(names: Seq[String], salt: Int): Seq[String] =
      names.zipWithIndex.map { case (nm, j) =>
        if (Rnd.double(s, id, salt + j, nm.length.toLong) < cfg.exactNameFrac) nm else Words.abbrevFirst(nm)
      }

    MovieRow(
      id = id,
      imdbId = s"im$id",
      omdbId = s"om$id",
      titleImdb = titleI,
      titleOmdb = titleO,
      year = year,
      yearO = yearO,
      genre = genre,
      rating = rating,
      country = country,
      cast = cast,
      castO = render(cast, 60),
      writers = writers,
      writersO = render(writers, 70),
      label = genre == "Drama" && rating == "R",
    )
  }

  def rows(spark: SparkSession, cfg: Config): Dataset[MovieRow] = {
    import spark.implicits._
    val c = cfg
    spark.range(c.n.toLong).map(id => row(c)(id))
  }

  /** The ten relation DataFrames (5 IMDB + 5 OMDB). */
  def frames(rows: Dataset[MovieRow]): Map[String, DataFrame] = Map(
    "imdb_movies"       -> rows.select(col("imdbId").as("id"), col("titleImdb").as("title"), col("year").cast("string")),
    "imdb_mov2genres"   -> rows.select(col("imdbId").as("id"), col("genre")),
    "imdb_mov2countries" -> rows.select(col("imdbId").as("id"), col("country")),
    "imdb_mov2cast"     -> rows.select(col("imdbId").as("id"), explode(col("cast")).as("name")),
    "imdb_mov2writers"  -> rows.select(col("imdbId").as("id"), explode(col("writers")).as("name")),
    "omdb_movies"       -> rows.select(col("omdbId").as("id"), col("titleOmdb").as("title"), col("yearO").cast("string").as("year")),
    "omdb_mov2genres"   -> rows.select(col("omdbId").as("id"), col("genre")),
    "omdb_mov2rating"   -> rows.select(col("omdbId").as("id"), col("rating")),
    "omdb_mov2cast"     -> rows.select(col("omdbId").as("id"), explode(col("castO")).as("name")),
    "omdb_mov2writers"  -> rows.select(col("omdbId").as("id"), explode(col("writersO")).as("name")),
  )

  // year is a join attribute (variable-mode): a constant inside the key
  // literal would block literal-dropping generalization of the whole literal.
  val schema: Schema = Schema(Vector(
    RelSpec("imdb_movies", Vector("id", "title", "year"), Set.empty),
    RelSpec("imdb_mov2genres", Vector("id", "genre"), Set("genre")),
    RelSpec("imdb_mov2countries", Vector("id", "country"), Set("country")),
    RelSpec("imdb_mov2cast", Vector("id", "name"), Set.empty),
    RelSpec("imdb_mov2writers", Vector("id", "name"), Set.empty),
    RelSpec("omdb_movies", Vector("id", "title", "year"), Set.empty),
    RelSpec("omdb_mov2genres", Vector("id", "genre"), Set("genre")),
    RelSpec("omdb_mov2rating", Vector("id", "rating"), Set("rating")),
    RelSpec("omdb_mov2cast", Vector("id", "name"), Set.empty),
    RelSpec("omdb_mov2writers", Vector("id", "name"), Set.empty),
  ))

  private def allPairs(refs: Seq[AttrRef]): Vector[(AttrRef, AttrRef)] =
    (for { i <- refs.indices; j <- (i + 1) until refs.length } yield (refs(i), refs(j))).toVector

  private val imdbIds =
    Seq("imdb_movies", "imdb_mov2genres", "imdb_mov2countries", "imdb_mov2cast", "imdb_mov2writers")
      .map(AttrRef(_, "id"))
  private val omdbIds =
    Seq("omdb_movies", "omdb_mov2genres", "omdb_mov2rating", "omdb_mov2cast", "omdb_mov2writers")
      .map(AttrRef(_, "id"))

  /** MDs: titles (always); plus cast and writer names in the 3-MD config. */
  def mds(nMds: Int): Vector[MD] = {
    val title  = MD(AttrRef("imdb_movies", "title"), AttrRef("omdb_movies", "title"))
    val cast   = MD(AttrRef("imdb_mov2cast", "name"), AttrRef("omdb_mov2cast", "name"))
    val writer = MD(AttrRef("imdb_mov2writers", "name"), AttrRef("omdb_mov2writers", "name"))
    if (nMds >= 3) Vector(title, cast, writer) else Vector(title)
  }

  /** 4 CFDs (paper Sec. 6.1.2): key → rating, key → title, key → year,
    * key → country.
    */
  val cfds: Vector[CFD] = Vector(
    CFD.fd("omdb_mov2rating", Vector("id"), "rating"),
    CFD.fd("omdb_movies", Vector("id"), "title"),
    CFD.fd("imdb_movies", Vector("id"), "year"),
    CFD.fd("imdb_mov2countries", Vector("id"), "country"),
  )

  def spec(nMds: Int): DatasetSpec = DatasetSpec(
    name = s"movies-${nMds}md",
    schema = schema,
    target = TargetSpec("dramaRestricted", Vector("id"), Vector(Set(AttrRef("imdb_movies", "id")))),
    joinPairs = allPairs(imdbIds) ++ allPairs(omdbIds),
    mds = mds(nMds),
    cfds = cfds,
  )

  /** Stratified examples: positives are Drama∧R movies; negatives are half
    * Drama-but-not-R (hard negatives for a genre-only clause), half
    * non-Drama.
    */
  def examples(rows: Seq[MovieRow], nPos: Int, nNeg: Int, seed: Long): (Vector[Example], Vector[Example]) = {
    def byHash(xs: Seq[MovieRow]): Seq[MovieRow] = xs.sortBy(r => Rnd.hash(seed, r.id, 99))
    val pos      = byHash(rows.filter(_.label)).take(nPos)
    val dramaNeg = byHash(rows.filter(r => r.genre == "Drama" && !r.label)).take(nNeg / 2)
    val otherNeg = byHash(rows.filter(r => r.genre != "Drama")).take(nNeg - dramaNeg.length)
    (
      pos.map(r => Example("dramaRestricted", Vector(r.imdbId), positive = true)).toVector,
      (dramaNeg ++ otherNeg).map(r => Example("dramaRestricted", Vector(r.imdbId), positive = false)).toVector,
    )
  }

  /** Inject CFD violations at rate `p` (paper Sec. 6.1.2). */
  def injected(frames: Map[String, DataFrame], p: Double, seed: Long): Map[String, DataFrame] = {
    if (p <= 0) return frames
    frames
      .updated("omdb_mov2rating", Inject.violations(frames("omdb_mov2rating"), "rating", p, seed, Inject.rotate(ratings)))
      .updated("omdb_movies", Inject.violations(frames("omdb_movies"), "title", p, seed + 1, Inject.scramble))
      .updated("imdb_movies", Inject.violations(frames("imdb_movies"), "year", p, seed + 2, Inject.bumpInt(3)))
      .updated("imdb_mov2countries", Inject.violations(frames("imdb_mov2countries"), "country", p, seed + 3, Inject.rotate(countries)))
  }
}
