package repro.matchers.neural

import org.apache.spark.ml.classification.{LogisticRegression, MultilayerPerceptronClassifier}
import org.apache.spark.ml.feature.VectorAssembler
import org.apache.spark.ml.functions.vector_to_array
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.core._

/** The five neural matchers (§4.2.2, Table 3), reduced to their inductive
  * biases over the [[TextEncoder]] "pretrained" embedding space (see
  * DESIGN.md for the substitution argument):
  *
  *  - DittoSim: serializes the whole record into one text block — loses the
  *    attribute structure, like Ditto's single-sequence LM input;
  *  - DeepMatcherSim: per-attribute embedding composition + a small MLP
  *    (the hybrid RNN+attention model's smooth nonlinear boundary);
  *  - HierMatcherSim: per-attribute token alignment (cross-attribute token
  *    alignment with attribute-aware attention);
  *  - McanSim: multiple attention contexts (per-attribute, global, token);
  *  - GnemSim: pairwise scores refined one-to-set over candidates that share
  *    a left record (graph propagation).
  */
abstract class NeuralMatcherBase extends Matcher {
  val kind: MatcherKind = MatcherKind.Neural

  import NeuralMatcherBase._

  /** Feature columns (name -> expression) over a pair frame. */
  protected def features(attrs: Seq[AttrSpec]): Seq[(String, Column)]

  /** Balanced class weights: neural EM trainers sample balanced mini-batches
    * under EM's O(n) class imbalance; the weight column is the MLlib
    * equivalent. Weight of a positive = nNeg/nPos (capped).
    */
  protected def withBalancedWeight(df: DataFrame): DataFrame = {
    val nPos = math.max(1L, df.filter("label = 1").count())
    val nNeg = math.max(1L, df.filter("label = 0").count())
    // sqrt damping: full balance makes every matcher FP-happy at τ=0.5;
    // the square root mirrors the partial rebalancing of mini-batch training.
    val w = math.min(12.0, math.sqrt(nNeg.toDouble / nPos))
    df.withColumn("w", when(col("label") === 1, w).otherwise(1.0))
  }

  /** L2 strength of the default LR head; MCAN overrides it. */
  protected val regParam: Double = 0.001

  /** Trains the downstream classifier on an assembled frame. */
  protected def train(assembled: DataFrame, nFeatures: Int): DataFrame => DataFrame =
    probScorer(new LogisticRegression()
      .setLabelCol("label").setFeaturesCol("features").setWeightCol("w").setMaxIter(40)
      .setRegParam(regParam)
      .fit(withBalancedWeight(assembled)))

  def fit(ds: EMDataset): FittedMatcher = {
    val fs  = features(ds.attrs)
    val asm = new VectorAssembler().setInputCols(fs.map(_._1).toArray).setOutputCol("features")
    def prep(df: DataFrame): DataFrame =
      asm.transform(fs.foldLeft(df) { case (d, (n, c)) => d.withColumn(n, c) })

    val trainDf = prep(ds.train).cache()
    val labels = trainDf.select("label").distinct().collect().map(_.getInt(0)).toSet
    val scorer: DataFrame => DataFrame =
      if (labels.size < 2) { val c = if (labels.contains(1)) 1.0 else 0.0; df => df.withColumn("score", lit(c)) }
      else train(trainDf, fs.size)
    trainDf.unpersist()

    new FittedMatcher {
      def scores(pairs: DataFrame): DataFrame =
        postProcess(scorer(prep(pairs)).drop((fs.map(_._1) :+ "features"): _*))
    }
  }

  /** Hook for one-to-set refinement (GnemSim). */
  protected def postProcess(scored: DataFrame): DataFrame = scored
}

object NeuralMatcherBase {
  val embCosUdf  = udf(TextEncoder.textCos _)
  val alignUdf   = udf(TextEncoder.align _)
  val njacUdf    = udf(TextEncoder.normJaccard _)

  def probScorer(model: org.apache.spark.ml.Model[_] with org.apache.spark.ml.Transformer)
      : DataFrame => DataFrame =
    df => model.transform(df)
      .withColumn("score", vector_to_array(col("probability"))(1))
      .drop("rawPrediction", "probability", "prediction")

  /** The Ditto-style serialization: all attribute values as one text block. */
  def serialized(attrs: Seq[AttrSpec], side: String): Column =
    concat_ws(" ", attrs.map(a => col(s"${side}_${a.name}")): _*)

  /** Whole-record (structure-blind) features. */
  def globalFeatures(attrs: Seq[AttrSpec]): Seq[(String, Column)] = {
    val l = serialized(attrs, "l"); val r = serialized(attrs, "r")
    Seq("nf_g_cos" -> embCosUdf(l, r), "nf_g_align" -> alignUdf(l, r), "nf_g_jac" -> njacUdf(l, r))
  }

  def perAttr(attrs: Seq[AttrSpec], fn: String, u: org.apache.spark.sql.expressions.UserDefinedFunction)
      : Seq[(String, Column)] =
    attrs.map(a => s"nf_${fn}_${a.name}" -> u(col(s"l_${a.name}"), col(s"r_${a.name}")))
}

/** Ditto: pre-trained LM over a serialized record pair (structure-blind). */
final class DittoSim extends NeuralMatcherBase {
  val name = "Ditto"
  protected def features(attrs: Seq[AttrSpec]): Seq[(String, Column)] =
    NeuralMatcherBase.globalFeatures(attrs)
}

/** DeepMatcher (hybrid): per-attribute embedding composition plus the
  * serialized-record summary (the hybrid model attends across attribute
  * boundaries), fed to a small MLP.
  */
final class DeepMatcherSim extends NeuralMatcherBase {
  val name = "DeepMatcher"
  import NeuralMatcherBase._
  protected def features(attrs: Seq[AttrSpec]): Seq[(String, Column)] =
    perAttr(attrs, "cos", embCosUdf) ++ perAttr(attrs, "align", alignUdf) ++ globalFeatures(attrs)
  override protected def train(assembled: DataFrame, nFeatures: Int): DataFrame => DataFrame = {
    // MultilayerPerceptronClassifier has no weight column: emulate balanced
    // mini-batches by oversampling the positive class.
    val nPos = math.max(1L, assembled.filter("label = 1").count())
    val nNeg = assembled.filter("label = 0").count()
    val k = math.min(12L, math.max(1L, math.sqrt(nNeg.toDouble / nPos).round)).toInt
    val balanced = assembled
      .withColumn("dup",
        explode(array_repeat(lit(1), when(col("label") === 1, k).otherwise(1))))
      .drop("dup")
    // A narrow hidden layer: enough to bend the boundary, not enough to
    // memorize the dense hard-negative clusters of the majority group.
    probScorer(new MultilayerPerceptronClassifier()
      .setLabelCol("label").setFeaturesCol("features")
      .setLayers(Array(nFeatures, 4, 2)).setMaxIter(60).setSeed(3)
      .fit(balanced))
  }
}

/** HierMatcher: attribute-aware token alignment. */
final class HierMatcherSim extends NeuralMatcherBase {
  val name = "HierMatcher"
  import NeuralMatcherBase._
  protected def features(attrs: Seq[AttrSpec]): Seq[(String, Column)] =
    perAttr(attrs, "align", alignUdf) :+ ("nf_g_align" -> alignUdf(serialized(attrs, "l"), serialized(attrs, "r")))
}

/** MCAN: multi-context attention — per-attribute, global, and token contexts
  * gated by the downstream classifier.
  */
final class McanSim extends NeuralMatcherBase {
  val name = "MCAN"
  import NeuralMatcherBase._
  protected def features(attrs: Seq[AttrSpec]): Seq[(String, Column)] =
    perAttr(attrs, "align", alignUdf) ++ perAttr(attrs, "cos", embCosUdf) ++ globalFeatures(attrs)
  // Heavier L2: the many attention contexts are gated smoothly rather than
  // sharply, which keeps MCAN's boundary curvier (and occasionally FP-prone).
  override protected val regParam: Double = 0.02
}

/** GNEM: one-to-set refinement — each pair competes against the candidate
  * pairs sharing its left record (GCN message passing reduced to
  * within-candidate-set competition): the relative rank ``score / max`` is
  * blended into the absolute score. This lifts the best candidate of every
  * record (high recall on one-to-many candidate sets, e.g. the social
  * datasets, where GNEM leads the neural pack in Tables 5/6) and also
  * over-commits to records whose candidates are all true non-matches —
  * reproducing GNEM's characteristic F-1 collapse on DBLP-ACM (Table 9).
  * Pairs whose left record has a single candidate keep the base score.
  */
final class GnemSim extends NeuralMatcherBase {
  val name = "GNEM"
  protected def features(attrs: Seq[AttrSpec]): Seq[(String, Column)] =
    NeuralMatcherBase.globalFeatures(attrs)
  override protected def postProcess(scored: DataFrame): DataFrame = {
    // Winner-take-most competition within each left record's candidate set:
    // the top-scoring candidate keeps its score, the rest are suppressed.
    // On one-to-many sets whose best candidate is the true match (social
    // datasets) this removes similar-name false positives; when a hard
    // negative outscores the true match (extended versions in DBLP-ACM,
    // same-artist songs in iTunes-Amazon) the match itself is suppressed
    // into a false negative — GNEM's characteristic failure there.
    val w = Window.partitionBy("id1")
    scored.withColumn("score",
      when(count(lit(1)).over(w) > 1 && col("score") < max("score").over(w),
        col("score") * 0.55)
      .otherwise(col("score")))
  }
}

/** Registry of all 13 matchers in Table 3 order. */
object Matchers {
  import repro.matchers._
  def all: Seq[Matcher] = Seq(
    new BooleanRuleMatcher,
    new DedupeMatcher(),
    new DTMatcher, new SVMMatcher, new RFMatcher,
    new LogRegMatcher, new LinRegMatcher, new NBMatcher,
    new DeepMatcherSim, new DittoSim, new GnemSim, new HierMatcherSim, new McanSim)
  def neural: Seq[Matcher] = all.filter(_.kind == MatcherKind.Neural)
  def nonNeural: Seq[Matcher] = all.filter(_.kind == MatcherKind.NonNeural)
}
