package repro.social

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Synthetic directed social network with power-law degree skew — the
  * stand-in for the paper's real social networks (Pokec, Yelp, Douban,
  * Gowalla friendships).
  *
  * Determinism: node draws use `xxhash64` of the row id (stable across
  * partitionings and machines), not `rand` (partition-seeded).
  */
object SocialGen {

  /** Uniform [0,1) from a hashed column, stable across partitionings. */
  private def u01(c: org.apache.spark.sql.Column, salt: Long) = {
    val big = 1000000007L
    pmod(xxhash64(c, lit(salt)), lit(big)).cast("double") / lit(big.toDouble)
  }

  /** Power-law node draw: node = floor(n * u^k); larger k concentrates mass
    * on low ids (the "celebrities").
    */
  private def plDraw(c: org.apache.spark.sql.Column, n: Int, k: Double, salt: Long) =
    least(lit(n - 1).cast("long"), floor(pow(u01(c, salt), k) * n).cast("long"))

  /** Directed edge DataFrame `(src, dst)`; self-loops and duplicates are
    * removed, so the result has at most `nEdges` rows.
    */
  def edges(spark: SparkSession, nUsers: Int, nEdges: Int, seed: Long = 11L): DataFrame = {
    require(nUsers >= 2, "need at least two users")
    spark
      .range(nEdges.toLong)
      .select(
        plDraw(col("id"), nUsers, 2.0, seed).as("src"),
        plDraw(col("id"), nUsers, 2.0, seed + 1).as("dst"))
      .filter(col("src") =!= col("dst"))
      .distinct()
  }

  /** Collect to (src, dst) int pairs for the driver-local instance. */
  def collectEdges(df: DataFrame): Vector[(Int, Int)] =
    df.select("src", "dst").collect().iterator.map(r => (r.getLong(0).toInt, r.getLong(1).toInt)).toVector
}
