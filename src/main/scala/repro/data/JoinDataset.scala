package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.Transformation

/** A pair of joinable columns plus the gold matching and (when the generator
  * knows them) the gold transformations — the common shape consumed by the
  * row matcher, discovery, the Auto-Join baseline and the benches.
  */
final case class JoinDataset(
    name: String,
    source: Vector[String],
    target: Vector[String],
    goldPairs: Set[(Int, Int)],
    goldTransformations: Vector[Transformation] = Vector.empty,
) {
  def avgSourceLen: Double =
    if (source.isEmpty) 0.0 else source.map(_.length).sum.toDouble / source.size

  /** Gold pairs materialized as (source string, target string). */
  def goldPairStrings: Vector[(String, String)] =
    goldPairs.toVector.sortBy(identity).map { case (i, j) => (source(i), target(j)) }

  /** Index pairs materialized as strings (for discovery over matched pairs). */
  def materialize(pairs: Iterable[(Int, Int)]): Vector[(String, String)] =
    pairs.toVector.sortBy(identity).map { case (i, j) => (source(i), target(j)) }

  /** The two columns as single-column DataFrames with stable row ids, for the
    * distributed pipeline.
    */
  def sourceDf(spark: SparkSession): DataFrame = {
    import spark.implicits._
    source.zipWithIndex.map { case (s, i) => (i.toLong, s) }.toDF("src_id", "src_val")
  }
  def targetDf(spark: SparkSession): DataFrame = {
    import spark.implicits._
    target.zipWithIndex.map { case (s, i) => (i.toLong, s) }.toDF("tgt_id", "tgt_val")
  }
}
