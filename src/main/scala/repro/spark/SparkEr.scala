package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{CleanCleanEr, ProfileCollection}

/** Bridges between the in-memory profile model and the DataFrame world.
  *
  * The canonical relational encoding of a profile collection is the tall
  * table `(profile_id, source, attr, value)` — schema-agnostic by
  * construction (attribute names are data, not columns).
  */
object SparkEr {

  /** Profiles as a tall DataFrame: one row per attribute name–value pair. */
  def profilesDF(spark: SparkSession, pc: ProfileCollection): DataFrame = {
    import spark.implicits._
    pc.profiles
      .flatMap(p => p.attrs.map { case (a, v) => (p.id, p.source, a, v) })
      .toDF("profile_id", "source", "attr", "value")
  }

  /** The schema-agnostic blocking-key relation `(profile_id, source, token)`:
    * distinct lowercase alphanumeric tokens of every attribute value —
    * Tokenizer.profileKeys as a Catalyst pipeline.
    */
  def tokenIndex(profiles: DataFrame): DataFrame =
    profiles
      .select(
        col("profile_id"),
        col("source"),
        explode(split(lower(col("value")), "[^a-z0-9]+")).as("token"))
      .filter(length(col("token")) > 0)
      .select("profile_id", "source", "token")
      .distinct()

  /** Is this collection Clean-clean? (drives pair validity in joins) */
  def isCleanClean(pc: ProfileCollection): Boolean = pc.erType == CleanCleanEr
}
