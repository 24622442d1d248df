package repro.matchers

import org.apache.spark.ml.classification.LogisticRegression
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.functions.vector_to_array
import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core._

/** Dedupe (Gregg & Eder): regularized logistic regression whose pairwise
  * decisions feed agglomerative clustering of records (Table 3). Modeled as
  * an elastic-net LR over generated features, followed by a transitive
  * closure over confident pairs — same-cluster pairs are promoted to matches.
  *
  * Mirrors §5.1.4's scalability note: Dedupe refuses datasets that are
  * textual (a single long free-text attribute gives its field model nothing
  * to cluster on) or whose pair count exceeds ``maxPairs`` — the paper's
  * "did not scale for FacultyMatch, NoFlyCompas, Shoes and Cameras".
  */
final class DedupeMatcher(maxPairs: Long = 20000) extends Matcher {
  val name = "Dedupe"
  val kind: MatcherKind = MatcherKind.NonNeural

  def fit(ds: EMDataset): FittedMatcher = {
    if (ds.attrs.size == 1 && ds.attrs.head.kind == AttrKind.LongText)
      throw new MatcherNotScalable(s"Dedupe does not handle textual dataset ${ds.name}")
    val nPairs = ds.train.count() + ds.test.count()
    if (nPairs > maxPairs)
      throw new MatcherNotScalable(s"Dedupe does not scale to ${ds.name} ($nPairs pairs)")

    val attrs  = ds.attrs
    val fnames = FeatureGen.featureNames(attrs)
    val asm    = new VectorAssembler().setInputCols(fnames.toArray).setOutputCol("features")
    def prep(df: DataFrame): DataFrame = asm.transform(FeatureGen.addFeatures(df, attrs))

    val model = new LogisticRegression()
      .setLabelCol("label").setFeaturesCol("features")
      .setRegParam(0.01).setElasticNetParam(0.5).setMaxIter(100)
      .fit(prep(ds.train))

    new FittedMatcher {
      def scores(pairs: DataFrame): DataFrame = {
        val scored = model.transform(prep(pairs))
          .withColumn("score", vector_to_array(col("probability"))(1))
          .drop((fnames ++ Seq("features", "rawPrediction", "probability", "prediction")): _*)
          .cache()

        // Agglomerative step: union confident pairs, then promote every pair
        // whose two records land in the same cluster. Left/right id spaces
        // are distinct nodes (a left record never IS a right record).
        val edges = scored.filter(col("score") >= 0.5)
          .select("id1", "id2").collect().map(r => (r.getLong(0), r.getLong(1)))
        val parent = scala.collection.mutable.Map[(Char, Long), (Char, Long)]()
        def find(x: (Char, Long)): (Char, Long) = {
          var r = x
          while (parent.getOrElse(r, r) != r) r = parent(r)
          r
        }
        def union(a: (Char, Long), b: (Char, Long)): Unit = parent(find(a)) = find(b)
        edges.foreach { case (l, r) => union(('L', l), ('R', r)) }
        val cluster = udf((side: String, id: Long) => {
          val root = find((side.head, id))
          s"${root._1}${root._2}"
        })
        scored
          .withColumn("score",
            when(cluster(lit("L"), col("id1")) === cluster(lit("R"), col("id2")),
              greatest(col("score"), lit(0.85)))
            .otherwise(col("score")))
      }
    }
  }
}
