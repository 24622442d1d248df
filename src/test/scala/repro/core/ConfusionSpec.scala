package repro.core

import repro.{SparkSpec, TestPairs, Oracle}

/** Confusion aggregation under single/pairwise lenses, including the
  * Appendix B worked example and DuckDB oracle cross-checks.
  */
class ConfusionSpec extends SparkSpec {

  private lazy val appB = TestPairs.appendixB(spark)

  test("overall confusion of the Appendix B example") {
    assert(ConfusionCounts.overall(appB, 0.5) == Confusion(1, 1, 1, 1))
  }

  test("Appendix B: confusion matrix of g1 (Figure 15b)") {
    val m = ConfusionCounts.single(appB, 0.5)
    assert(m("g1") == Confusion(1, 1, 1, 1))
  }
  test("Appendix B: confusion matrix of g2 (Figure 15c)") {
    val m = ConfusionCounts.single(appB, 0.5)
    assert(m("g2") == Confusion(0, 0, 1, 1))
  }
  test("single lens counts a pair once even when both records are in the group") {
    // pair (1,2) has g1 on both sides; total over g1 must be 4, not 5
    assert(ConfusionCounts.single(appB, 0.5)("g1").total == 4)
  }
  test("single lens legitimacy: pair counted for either side's group") {
    val m = ConfusionCounts.single(appB, 0.5)
    assert(m("g2").total == 2) // pairs (3,4) and (2,3)
  }

  test("pairwise lens keys are unordered") {
    val m = ConfusionCounts.pairwise(appB, 0.5)
    assert(m.contains("g1|g2") && !m.contains("g2|g1"))
  }
  test("pairwise lens of Appendix B example") {
    val m = ConfusionCounts.pairwise(appB, 0.5)
    assert(m("g1|g1") == Confusion(1, 1, 0, 0)) // pairs (1,2) FP and (1,4) TP
    assert(m("g1|g2") == Confusion(0, 0, 1, 1)) // pairs (3,4) TN and (2,3) FN
  }

  test("thresholding: score >= tau is a match") {
    val df = TestPairs.scored(spark, Seq(
      (1L, 2L, Seq("a"), Seq("a"), 1, 0.5),
      (3L, 4L, Seq("a"), Seq("a"), 1, 0.49)))
    assert(ConfusionCounts.overall(df, 0.5) == Confusion(1, 0, 0, 1))
    assert(ConfusionCounts.overall(df, 0.4) == Confusion(2, 0, 0, 0))
    assert(ConfusionCounts.overall(df, 0.6) == Confusion(0, 0, 0, 2))
  }

  test("setwise groups: a multi-genre record contributes to every genre") {
    val df = TestPairs.scored(spark, Seq(
      (1L, 2L, Seq("Pop", "Rock"), Seq("Jazz"), 1, 1.0)))
    val m = ConfusionCounts.single(df, 0.5)
    assert(m.keySet == Set("Pop", "Rock", "Jazz"))
    assert(m.values.forall(_ == Confusion(1, 0, 0, 0)))
  }
  test("setwise pairwise: all cross combinations, deduplicated") {
    val df = TestPairs.scored(spark, Seq(
      (1L, 2L, Seq("Pop", "Rock"), Seq("Pop"), 0, 1.0)))
    val m = ConfusionCounts.pairwise(df, 0.5)
    assert(m.keySet == Set("Pop|Pop", "Pop|Rock"))
    assert(m("Pop|Rock").fp == 1)
  }

  test("forSubgroup restricts to legitimate pairs of a level-2 subgroup") {
    val df = TestPairs.scored(spark, Seq(
      (1L, 2L, Seq("Pop", "Female"), Seq("Jazz"), 1, 1.0),
      (3L, 4L, Seq("Pop", "Male"), Seq("Jazz"), 1, 1.0)))
    val sg = GroupEncoding.Subgroup(Set("Pop", "Female"))
    assert(ConfusionCounts.forSubgroup(df, 0.5, sg) == Confusion(1, 0, 0, 0))
  }
  test("forSubgroup of an absent subgroup is empty") {
    val df = TestPairs.scored(spark, Seq((1L, 2L, Seq("a"), Seq("b"), 1, 1.0)))
    assert(ConfusionCounts.forSubgroup(df, 0.5, GroupEncoding.Subgroup(Set("zz"))).total == 0)
  }

  // ---- DuckDB oracle cross-checks ----

  test("oracle: single-lens per-group confusion matches DuckDB aggregation") {
    import org.apache.spark.sql.functions._
    val rnd = new scala.util.Random(11)
    val rows = (0 until 300).map { i =>
      val gl = if (rnd.nextBoolean()) "x" else "y"
      val gr = if (rnd.nextBoolean()) "x" else "y"
      (i.toLong, (1000 + i).toLong, Seq(gl), Seq(gr), rnd.nextInt(2), rnd.nextDouble())
    }
    val df = TestPairs.scored(spark, rows)
    val m = ConfusionCounts.single(df, 0.5)
    val sparkRes = spark.createDataFrame(
      m.toSeq.map { case (g, c) => (g, c.tp, c.fp, c.tn, c.fn) }
    ).toDF("grp", "tp", "fp", "tn", "fn")
    // Hand-exploded flat table for DuckDB (singleton groups).
    val flat = df
      .withColumn("pred", when(col("score") >= 0.5, 1).otherwise(0))
      .select(col("g1").getItem(0).as("gl"), col("g2").getItem(0).as("gr"),
              col("pred"), col("label"))
    Oracle.assertEquivalent(
      sparkRes,
      """SELECT g AS grp,
          sum(CASE WHEN pred='1' AND label='1' THEN 1 ELSE 0 END) AS tp,
          sum(CASE WHEN pred='1' AND label='0' THEN 1 ELSE 0 END) AS fp,
          sum(CASE WHEN pred='0' AND label='0' THEN 1 ELSE 0 END) AS tn,
          sum(CASE WHEN pred='0' AND label='1' THEN 1 ELSE 0 END) AS fn
        FROM (
          SELECT gl AS g, pred, label FROM flat
          UNION ALL
          SELECT gr AS g, pred, label FROM flat WHERE gr <> gl
        ) GROUP BY g""",
      "flat" -> flat)
  }

  test("oracle: overall confusion matches DuckDB") {
    import org.apache.spark.sql.functions._
    val rnd = new scala.util.Random(13)
    val rows = (0 until 200).map { i =>
      (i.toLong, (1000 + i).toLong, Seq("g"), Seq("g"), rnd.nextInt(2), rnd.nextDouble())
    }
    val df = TestPairs.scored(spark, rows)
    val c = ConfusionCounts.overall(df, 0.7)
    val sparkRes = spark.createDataFrame(Seq((c.tp, c.fp, c.tn, c.fn))).toDF("tp", "fp", "tn", "fn")
    val flat = df.withColumn("pred", when(col("score") >= 0.7, 1).otherwise(0))
      .select("pred", "label")
    Oracle.assertEquivalent(
      sparkRes,
      """SELECT
          sum(CASE WHEN pred='1' AND label='1' THEN 1 ELSE 0 END) AS tp,
          sum(CASE WHEN pred='1' AND label='0' THEN 1 ELSE 0 END) AS fp,
          sum(CASE WHEN pred='0' AND label='0' THEN 1 ELSE 0 END) AS tn,
          sum(CASE WHEN pred='0' AND label='1' THEN 1 ELSE 0 END) AS fn
        FROM flat""",
      "flat" -> flat)
  }

  test("confusion addition") {
    assert(Confusion(1, 2, 3, 4) + Confusion(10, 20, 30, 40) == Confusion(11, 22, 33, 44))
  }
  test("confusion total") { assert(Confusion(1, 2, 3, 4).total == 10) }
}
