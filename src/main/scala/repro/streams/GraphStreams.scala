package repro.streams

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._
import repro.core.Model.Sge

/** Synthetic streaming-graph generators substituting the paper's
  * datasets (documented in DESIGN.md §Datasets):
  *
  * - [[soSim]] replaces the **StackOverflow** temporal graph [64]: one
  *   vertex type, 3 edge labels, heavily skewed endpoints ⇒ dense and
  *   cyclic — the stress case for PATH operators (many alternative paths
  *   between vertex pairs).
  * - [[ldbcSim]] replaces the **LDBC SNB** update stream [26]: persons
  *   and posts with `knows`, `likes`, `hasCreator` and *tree-shaped*
  *   `replyOf` edges — at most one path between post pairs, the case
  *   where S-PATH's coalescing optimizations do not apply (paper
  *   §7.2.2).
  *
  * Both are deterministic in (sizes, seed); generation runs through
  * Spark and the ordered stream is collected to the driver for the
  * tuple-at-a-time engines.
  */
object GraphStreams {

  val SecondsPerDay: Long = 86400L

  /** Skewed vertex pick in [0, n): `⌊n · rand^skew⌋`; higher skew ⇒
    * denser core ⇒ more cycles.
    */
  private def skewed(n: Long, skew: Double, seed: Long) =
    least(lit(n - 1), floor(pow(rand(seed), skew) * n)).cast(LongType)

  /** Collect a `(src, trg, label, ts)` DataFrame as a ts-ordered stream. */
  def collectStream(df: DataFrame): Vector[Sge] =
    df.select(col("src").cast(LongType), col("trg").cast(LongType),
              col("label").cast(StringType), col("ts").cast(LongType))
      .collect()
      .map(r => Sge(r.getLong(0), r.getLong(1), r.getString(2), r.getLong(3)))
      .sortBy(_.ts)
      .toVector

  /** StackOverflow-like stream: labels `ans` (answer), `cmt` (comment on
    * question), `c2a` (comment on answer), all user→user.
    */
  def soSim(spark: SparkSession,
            nUsers: Long = 300,
            nEdges: Long = 20000,
            spanDays: Long = 120,
            skew: Double = 2.0,
            trgSkew: Double = 1.3,
            seed: Long = 7): Vector[Sge] = {
    val secs = spanDays * SecondsPerDay
    // Source skew drives the dense cyclic core; target skew is milder so
    // co-target self-joins (Q8) stay quadratic in degree, not in N.
    val df = spark.range(nEdges).select(
      skewed(nUsers, skew, seed) as "src",
      skewed(nUsers, trgSkew, seed + 1) as "trg",
      element_at(array(lit("ans"), lit("cmt"), lit("c2a")),
                 (rand(seed + 2) * 3 + 1).cast(IntegerType)) as "label",
      (col("id") * secs / nEdges).cast(LongType) as "ts")
    collectStream(df)
  }

  /** LDBC-SNB-like stream. Vertex ids: persons `0 until nPersons`, posts
    * `nPersons until nPersons + nPosts`. Post `i` arrives at an evenly
    * spaced creation time emitting `hasCreator(post, person)` and, with
    * probability `replyProb`, `replyOf(post, earlier post)` — each post
    * replies to at most one earlier post, so `replyOf` is a forest.
    */
  def ldbcSim(spark: SparkSession,
              nPersons: Long = 200,
              nPosts: Long = 4000,
              nKnows: Long = 2000,
              nLikes: Long = 10000,
              spanDays: Long = 120,
              replyProb: Double = 0.8,
              skew: Double = 2.0,
              seed: Long = 11): Vector[Sge] = {
    val secs = spanDays * SecondsPerDay
    val postV = (id: org.apache.spark.sql.Column) => id + nPersons

    val creators = spark.range(nPosts).select(
      postV(col("id")) as "src",
      skewed(nPersons, skew, seed) as "trg",
      lit("hasCreator") as "label",
      (col("id") * secs / nPosts).cast(LongType) as "ts")

    val replies = spark.range(1, nPosts)
      .filter(rand(seed + 1) < replyProb)
      .select(
        postV(col("id")) as "src",
        postV(floor(rand(seed + 2) * col("id")).cast(LongType)) as "trg",
        lit("replyOf") as "label",
        (col("id") * secs / nPosts).cast(LongType) as "ts")

    val knows = spark.range(nKnows).select(
      skewed(nPersons, skew, seed + 3) as "src",
      skewed(nPersons, skew, seed + 4) as "trg",
      lit("knows") as "label",
      (col("id") * secs / nKnows).cast(LongType) as "ts")

    // A like at time ts targets a uniformly random post that exists by ts.
    val likes = spark.range(nLikes)
      .select((col("id") * secs / nLikes).cast(LongType) as "ts",
              skewed(nPersons, skew, seed + 5) as "src",
              rand(seed + 6) as "r")
      .select(
        col("src"),
        postV(floor(col("r") * greatest(lit(1L), col("ts") * nPosts / secs)).cast(LongType)) as "trg",
        lit("likes") as "label",
        col("ts"))

    collectStream(creators.unionByName(replies).unionByName(knows).unionByName(likes))
  }
}
