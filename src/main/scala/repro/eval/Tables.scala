package repro.eval

import org.apache.spark.sql.{DataFrame, SparkSession}

import repro.core._
import repro.data.{EMBench, Social}
import repro.matchers.neural.Matchers

/** Harnesses that recompute the paper's evaluation tables (5, 6, 7, 9 — plus
  * the Table 4 dataset overview) on the synthetic substrate. Each harness
  * returns structured rows and can render the same layout the paper reports;
  * EXPERIMENTS.md records paper-vs-measured side by side.
  */
object Tables {

  /** Default matching threshold (§5.1.4): 0.5 everywhere except Cricket. */
  def thresholdFor(dsName: String): Double = if (dsName == "Cricket") 0.9 else 0.5

  /** Fits and scores; None when the matcher refuses the dataset (Dedupe). */
  def scoredTest(m: Matcher, ds: EMDataset): Option[DataFrame] =
    try Some(m.fit(ds).scores(ds.test))
    catch { case _: MatcherNotScalable => None }

  // ------------------------------------------------------------------
  // Tables 5 & 6: social-dataset audits
  // ------------------------------------------------------------------

  /** One matcher's row in a social table: two per-group probabilities for
    * each of two measures, with signed sub/div disparities vs the reference
    * (advantaged) group — the Tables 5/6 layout.
    */
  final case class SocialRow(
      matcher: String, kind: MatcherKind,
      m1Group: Double, m1Ref: Double, m1Sub: Double, m1Div: Double,
      m2Group: Double, m2Ref: Double, m2Sub: Double, m2Div: Double)

  def socialTable(
      ds: EMDataset,
      auditedGroup: String, referenceGroup: String,
      measure1: Fairness.Measure, measure2: Fairness.Measure,
      matchers: Seq[Matcher] = Matchers.all,
      tau: Double = 0.5): Seq[SocialRow] = {
    matchers.flatMap { m =>
      scoredTest(m, ds).map { scored =>
        val cached = scored.cache()
        val byGroup = ConfusionCounts.single(cached, tau)
        cached.unpersist()
        def v(measure: Fairness.Measure, g: String): Double =
          byGroup.get(g).flatMap(measure.value).getOrElse(Double.NaN)
        val (g1, r1) = (v(measure1, auditedGroup), v(measure1, referenceGroup))
        val (g2, r2) = (v(measure2, auditedGroup), v(measure2, referenceGroup))
        SocialRow(m.name, m.kind,
          g1, r1, Fairness.subVsRef(g1, r1, measure1.direction),
          Fairness.divVsRef(g1, r1, measure1.direction),
          g2, r2, Fairness.subVsRef(g2, r2, measure2.direction),
          Fairness.divVsRef(g2, r2, measure2.direction))
      }
    }
  }

  /** Table 5: NoFlyCompas — TPR and FDR for African-American vs Caucasian. */
  def table5(spark: SparkSession, matchers: Seq[Matcher] = Matchers.all): Seq[SocialRow] =
    socialTable(Social.noFlyCompas(spark), "African-American", "Caucasian",
      Fairness.TPRP, Fairness.FDRP, matchers)

  /** Table 6: FacultyMatch — TPR and PPV for cn vs de. */
  def table6(spark: SparkSession, matchers: Seq[Matcher] = Matchers.all): Seq[SocialRow] =
    socialTable(Social.facultyMatch(spark), "cn", "de",
      Fairness.TPRP, Fairness.PPVP, matchers)

  def renderSocial(title: String, h1: String, h2: String,
                   g: String, ref: String, rows: Seq[SocialRow]): String = {
    val sb = new StringBuilder
    sb ++= f"== $title ==%n"
    sb ++= f"${"Matcher"}%-20s | $h1%4s($g) $h1%4s($ref)   sub    div | $h2%4s($g) $h2%4s($ref)   sub    div%n"
    for (r <- rows)
      sb ++= f"${r.matcher}%-20s | ${r.m1Group}%9.2f ${r.m1Ref}%9.2f ${r.m1Sub}%6.2f ${r.m1Div}%6.2f | ${r.m2Group}%9.2f ${r.m2Ref}%9.2f ${r.m2Sub}%6.2f ${r.m2Div}%6.2f%n"
    sb.toString
  }

  // ------------------------------------------------------------------
  // Table 7: threshold sensitivity
  // ------------------------------------------------------------------

  /** The τ grid of Figure 14 (0.30 … 0.95). */
  val sweepTaus: Seq[Double] = (6 to 19).map(_ * 0.05)

  final case class SensitivityRow(dataset: String, matcher: String,
                                  tprpSens: Double, ppvpSens: Double)

  /** Threshold sensitivity of each matcher on one dataset: ℓ2 distance on the
    * unfair-group counts between adjacent thresholds, for TPRP and PPVP.
    */
  def sensitivity(ds: EMDataset, matchers: Seq[Matcher] = Matchers.all): Seq[SensitivityRow] =
    matchers.flatMap { m =>
      scoredTest(m, ds).map { scored =>
        val results = Audit.sweep(scored, sweepTaus,
          measures = Seq(Fairness.TPRP, Fairness.PPVP))
        SensitivityRow(ds.name, m.name,
          Audit.thresholdSensitivity(results, Fairness.TPRP),
          Audit.thresholdSensitivity(results, Fairness.PPVP))
      }
    }

  /** Table 7 datasets: iTunes-Amazon, Cameras, DBLP-ACM, DBLP-Scholar. */
  def table7Datasets(spark: SparkSession): Seq[EMDataset] = Seq(
    EMBench.iTunesAmazon(spark), EMBench.cameras(spark),
    EMBench.dblpAcm(spark), EMBench.dblpScholar(spark))

  // ------------------------------------------------------------------
  // Table 9: overall correctness
  // ------------------------------------------------------------------

  final case class CorrectnessRow(dataset: String, matcher: String, kind: MatcherKind,
                                  acc: Double, f1: Double)

  def correctness(ds: EMDataset, matchers: Seq[Matcher] = Matchers.all): Seq[CorrectnessRow] = {
    val tau = thresholdFor(ds.name)
    matchers.map { m =>
      scoredTest(m, ds) match {
        case Some(scored) =>
          val c = ConfusionCounts.overall(scored, tau)
          CorrectnessRow(ds.name, m.name, m.kind, Audit.accuracy(c), Audit.f1(c))
        case None => CorrectnessRow(ds.name, m.name, m.kind, Double.NaN, Double.NaN)
      }
    }
  }

  /** All eight datasets in Table 4 order. */
  def allDatasets(spark: SparkSession): Seq[EMDataset] = Seq(
    Social.facultyMatch(spark), Social.noFlyCompas(spark)) ++ EMBench.all(spark)

  // ------------------------------------------------------------------
  // Table 4: dataset overview
  // ------------------------------------------------------------------

  final case class OverviewRow(dataset: String, train: Long, test: Long,
                               posPct: Double, nAttrs: Int, sensAttr: String)

  def overview(ds: EMDataset): OverviewRow = {
    val tr = ds.train.count(); val te = ds.test.count()
    val pos = ds.train.filter("label = 1").count() + ds.test.filter("label = 1").count()
    OverviewRow(ds.name, tr, te, 100.0 * pos / (tr + te), ds.attrs.size, ds.sensitiveAttr)
  }
}
