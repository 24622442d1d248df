package repro.core

import org.apache.spark.sql.{Column, DataFrame}

/** Magellan-style automatic feature generation (§5.1.4).
  *
  * For each attribute of the record schema, generates similarity features
  * between the left (``l_<attr>``) and right (``r_<attr>``) values, chosen by
  * the attribute's kind — mirroring Magellan's type-aware feature generator:
  *
  *  - ShortStr: exact, normalized Levenshtein, Jaro-Winkler
  *  - LongText: token Jaccard, TF cosine, overlap coefficient, Levenshtein
  *  - Numeric:  exact, relative numeric similarity
  *
  * Feature columns are named ``f_<attr>_<sim>`` so rules ([[MatchRule]]) and
  * model-inspection code can refer to them by name.
  */
object FeatureGen {

  /** Names of the feature columns generated for one attribute. */
  def featureNames(attr: AttrSpec): Seq[String] = attr.kind match {
    case AttrKind.ShortStr => Seq("exact", "lev", "jw").map(s => s"f_${attr.name}_$s")
    case AttrKind.LongText => Seq("jac", "cos", "ovl", "lev").map(s => s"f_${attr.name}_$s")
    case AttrKind.Numeric  => Seq("exact", "num").map(s => s"f_${attr.name}_$s")
  }

  /** All feature column names for a schema, in deterministic order. */
  def featureNames(attrs: Seq[AttrSpec]): Seq[String] = attrs.flatMap(featureNames)

  private def featureCols(attr: AttrSpec, l: Column, r: Column): Seq[(String, Column)] = {
    import Similarity._
    val base = s"f_${attr.name}"
    attr.kind match {
      case AttrKind.ShortStr =>
        Seq(s"${base}_exact" -> exact(l, r), s"${base}_lev" -> levSim(l, r),
            s"${base}_jw" -> jaroWinklerSim(l, r))
      case AttrKind.LongText =>
        Seq(s"${base}_jac" -> jaccardSim(l, r), s"${base}_cos" -> cosineSim(l, r),
            s"${base}_ovl" -> overlapSim(l, r), s"${base}_lev" -> levSim(l, r))
      case AttrKind.Numeric =>
        Seq(s"${base}_exact" -> exact(l, r), s"${base}_num" -> numSim(l, r))
    }
  }

  /** Adds all generated feature columns to a pair DataFrame. */
  def addFeatures(pairs: DataFrame, attrs: Seq[AttrSpec]): DataFrame = {
    val cols = attrs.flatMap { a =>
      featureCols(a, pairs(s"l_${a.name}"), pairs(s"r_${a.name}"))
    }
    cols.foldLeft(pairs) { case (df, (name, col)) => df.withColumn(name, col) }
  }
}
