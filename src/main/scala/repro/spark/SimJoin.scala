package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.constraints.MD
import repro.core.db.{AttrRef, Database}
import repro.core.sim.Similarity

/** A single similarity match: a value of the paired attribute plus its
  * similarity score.
  */
final case class SimMatch(value: String, score: Double) extends Serializable

/** Precomputed top-k_m similarity matches for every MD attribute pair, in
  * both directions (the paper precomputes "the pairs of similar values",
  * Sec. 5; `k_m` is the "number of top similar matches" of Table 4).
  */
final class SimIndex(private val map: Map[String, Map[String, Vector[SimMatch]]])
    extends Serializable {

  def matches(from: AttrRef, to: AttrRef, value: String): Vector[SimMatch] =
    map.get(SimIndex.dirKey(from, to)).flatMap(_.get(value)).getOrElse(Vector.empty)

  def directionCount: Int = map.size

  /** The same index truncated to a smaller k_m (entries are score-sorted, so
    * a prefix is exactly the top-k index) — lets one expensive similarity
    * join serve a whole k_m sweep.
    */
  def truncated(km: Int): SimIndex =
    new SimIndex(map.view.mapValues(_.view.mapValues(_.take(km)).toMap).toMap)
}

object SimIndex {
  def dirKey(from: AttrRef, to: AttrRef): String = s"${from.key}>${to.key}"
  val empty                                      = new SimIndex(Map.empty)
  def apply(map: Map[String, Map[String, Vector[SimMatch]]]): SimIndex = new SimIndex(map)
}

/** Spark DataFrame pipeline computing similar value pairs with token-prefix
  * blocking, then ranking to the top-k_m per source value.
  */
object SimJoin {

  /** Blocking keys of a string: its alphanumeric tokens (lowercased). Values
    * sharing no token are never compared — standard token blocking for
    * similarity joins. The generators' perturbations alter at most one token,
    * so true counterparts always share a block.
    */
  def blockKeys(s: String): Seq[String] =
    if (s == null) Seq.empty
    else s.toLowerCase.split("[^a-z0-9]+").filter(_.nonEmpty).distinct.toSeq

  /** All pairs (a, b) with similarity ≥ threshold, via blocked join.
    * Inputs are single-column DataFrames named `a` and `b`.
    */
  def simPairs(left: DataFrame, right: DataFrame, threshold: Double): DataFrame = {
    val keysUdf = udf((s: String) => blockKeys(s))
    val simUdf  = udf((a: String, b: String) => Similarity.sim(a, b))
    val la = left.select(col("a")).distinct().withColumn("k", explode(keysUdf(col("a"))))
    val rb = right.select(col("b")).distinct().withColumn("k", explode(keysUdf(col("b"))))
    la.join(rb, "k")
      .select("a", "b")
      .distinct()
      .withColumn("score", simUdf(col("a"), col("b")))
      .filter(col("score") >= threshold)
  }

  /** Keep the top-k rows per `partCol` by descending score (ties broken by
    * the other value for determinism).
    */
  def topK(pairs: DataFrame, partCol: String, otherCol: String, k: Int): DataFrame = {
    val w = Window.partitionBy(col(partCol)).orderBy(col("score").desc, col(otherCol))
    pairs.withColumn("rk", row_number().over(w)).filter(col("rk") <= k).drop("rk")
  }

  /** Build the bidirectional top-k_m similarity index for all MD attribute
    * pairs of a database.
    */
  /** Default similarity threshold. Must exceed 0.5: the operator averages
    * SWG with Length similarity, so two unrelated equal-length strings
    * already score 0.5.
    */
  val DefaultThreshold = 0.6

  def buildIndex(
      spark: SparkSession,
      db: Database,
      mds: Vector[MD],
      km: Int,
      threshold: Double = DefaultThreshold,
  ): SimIndex = {
    import spark.implicits._
    val dirs = scala.collection.mutable.Map[String, Map[String, Vector[SimMatch]]]()
    for (md <- mds; (refA, refB) <- md.pairs) {
      val left  = db.domain(refA).toSeq.toDF("a")
      val right = db.domain(refB).toSeq.toDF("b")
      val pairs = simPairs(left, right, threshold).cache()
      try {
        val ab = topK(pairs, "a", "b", km)
          .collect()
          .groupBy(_.getString(0))
          .map { case (a, rows) =>
            a -> rows.map(r => SimMatch(r.getString(1), r.getDouble(2))).sortBy(-_.score).toVector
          }
        val ba = topK(pairs, "b", "a", km)
          .collect()
          .groupBy(_.getString(1))
          .map { case (b, rows) =>
            b -> rows.map(r => SimMatch(r.getString(0), r.getDouble(2))).sortBy(-_.score).toVector
          }
        dirs(SimIndex.dirKey(refA, refB)) = ab
        dirs(SimIndex.dirKey(refB, refA)) = ba
      } finally pairs.unpersist()
    }
    SimIndex(dirs.toMap)
  }
}
