package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Confusion counts of a matcher's decisions. */
final case class Confusion(tp: Long, fp: Long, tn: Long, fn: Long) {
  def total: Long = tp + fp + tn + fn
  def +(o: Confusion): Confusion = Confusion(tp + o.tp, fp + o.fp, tn + o.tn, fn + o.fn)
}

/** The auditing lens (§3.2.2): single — a pair is legitimate for group g if
  * either record belongs to g; pairwise — legitimate for the unordered group
  * pair {g, g'} if one record belongs to g and the other to g'.
  */
sealed trait Lens
object Lens {
  case object Single extends Lens
  case object Pairwise extends Lens
}

/** Per-group confusion-count aggregation over scored pairs, as DataFrame
  * aggregations (Appendix B semantics: a pair's result is counted for the
  * group(s) of BOTH records).
  *
  * Input schema: `g1 array<string>`, `g2 array<string>`, `label int`,
  * `score double`. Thresholding (`score >= tau` => match) happens here, so
  * that threshold sweeps (Table 7) share a single scored DataFrame.
  */
object ConfusionCounts {

  private def predOutcomes(tau: Double) = Seq(
    sum(when(col("pred") === 1 && col("label") === 1, 1L).otherwise(0L)) as "tp",
    sum(when(col("pred") === 1 && col("label") === 0, 1L).otherwise(0L)) as "fp",
    sum(when(col("pred") === 0 && col("label") === 0, 1L).otherwise(0L)) as "tn",
    sum(when(col("pred") === 0 && col("label") === 1, 1L).otherwise(0L)) as "fn",
  )

  private def withPred(scored: DataFrame, tau: Double): DataFrame =
    scored.withColumn("pred", when(col("score") >= tau, 1).otherwise(0))

  /** Overall confusion over all pairs (group-independent reference of Eq 1). */
  def overall(scored: DataFrame, tau: Double): Confusion = {
    val r = withPred(scored, tau).agg(predOutcomes(tau).head, predOutcomes(tau).tail: _*).head()
    Confusion(r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))
  }

  /** Per-group confusion under the single lens: one row per level-1 group; a
    * pair contributes once to every group either of its records belongs to.
    */
  def single(scored: DataFrame, tau: Double): Map[String, Confusion] =
    collect(
      withPred(scored, tau)
        .withColumn("group", explode(array_distinct(concat(col("g1"), col("g2")))))
    )

  /** Per-group-pair confusion under the pairwise lens: key "g|g'" with
    * g <= g' lexicographically; a pair contributes once per unordered
    * combination of a left-record group with a right-record group.
    */
  def pairwise(scored: DataFrame, tau: Double): Map[String, Confusion] =
    collect(
      withPred(scored, tau)
        .withColumn("ga", explode(col("g1")))
        .withColumn("gb", explode(col("g2")))
        .withColumn("group",
          concat_ws("|", least(col("ga"), col("gb")), greatest(col("ga"), col("gb"))))
        // count a pair once per unordered group pair even when both
        // directions produce the same key
        .dropDuplicates("id1", "id2", "group")
    )

  private def collect(exploded: DataFrame): Map[String, Confusion] = {
    exploded
      .groupBy("group")
      .agg(predOutcomes(0).head, predOutcomes(0).tail: _*)
      .collect()
      .map(r => r.getString(0) -> Confusion(r.getLong(1), r.getLong(2), r.getLong(3), r.getLong(4)))
      .toMap
  }

  /** Confusion for a specific subgroup (any level) under the single lens. */
  def forSubgroup(scored: DataFrame, tau: Double, sg: GroupEncoding.Subgroup): Confusion = {
    val member = udf((g: Seq[String]) => sg.contains(g))
    val legit  = withPred(scored, tau).filter(member(col("g1")) || member(col("g2")))
    val r = legit.agg(predOutcomes(tau).head, predOutcomes(tau).tail: _*).head()
    if (r.isNullAt(0)) Confusion(0, 0, 0, 0)
    else Confusion(r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))
  }
}
