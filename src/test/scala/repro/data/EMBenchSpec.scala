package repro.data

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core.EMDataset

/** Structural properties of the six complementary benchmark generators,
  * checked against the Table 4 characteristics they stand in for.
  */
class EMBenchSpec extends SparkSpec {

  private lazy val itunes  = EMBench.iTunesAmazon(spark)
  private lazy val dblp    = EMBench.dblpAcm(spark)
  private lazy val scholar = EMBench.dblpScholar(spark)
  private lazy val cricket = EMBench.cricket(spark)
  private lazy val shoes   = EMBench.shoes(spark)
  private lazy val cameras = EMBench.cameras(spark)

  private def posFrac(ds: EMDataset): Double = {
    val all = ds.train.union(ds.test)
    all.filter("label = 1").count().toDouble / all.count()
  }

  test("iTunes-Amazon has 8 attributes (Table 4)") { assert(itunes.attrs.size == 8) }
  test("iTunes-Amazon %pos is in the ~25% band") {
    val f = posFrac(itunes); assert(f > 0.12 && f < 0.40, s"pos frac $f")
  }
  test("iTunes-Amazon genre is setwise: some records have multiple genres") {
    assert(itunes.test.filter(size(col("g1")) > 1).count() > 0)
  }
  test("iTunes-Amazon genre families include the country taxonomy overlap") {
    val gs = itunes.train.union(itunes.test)
      .select(explode(col("g1"))).distinct().collect().map(_.getString(0)).toSet
    assert(gs.contains("Country") || gs.contains("Contemporary Country") || gs.contains("Honky Tonk"))
  }
  test("iTunes-Amazon French Pop group exists and has no true matches (SP artifact)") {
    val fp = itunes.train.union(itunes.test)
      .filter(array_contains(col("g1"), "French Pop") || array_contains(col("g2"), "French Pop"))
    assert(fp.count() > 0)
    assert(fp.filter("label = 1").count() == 0)
  }
  test("iTunes-Amazon rap matches are surface-dissimilar (slang orthography)") {
    val rap = itunes.train.union(itunes.test)
      .filter(array_contains(col("g1"), "Rap") && col("label") === 1)
      .select("l_Song_Name", "r_Song_Name").collect()
    assert(rap.nonEmpty)
    val meanJac = rap.map(r => repro.core.Similarity.tokenJaccard(r.getString(0), r.getString(1))).sum / rap.length
    assert(meanJac < 0.5, s"mean rap-match jaccard $meanJac")
  }

  test("DBLP-ACM has title/authors/venue/year (Table 4: 4 attrs)") {
    assert(dblp.attrNames == Seq("title", "authors", "venue", "year"))
  }
  test("DBLP-ACM %pos is in the ~18% band") {
    val f = posFrac(dblp); assert(f > 0.10 && f < 0.30, s"pos frac $f")
  }
  test("DBLP-ACM contains guest-editorial hard negatives in SIGMOD Rec. and VLDBJ") {
    val ed = dblp.train.union(dblp.test).filter(col("l_title") === "guest editorial")
    assert(ed.count() > 0)
    assert(ed.filter("label = 1").count() == 0)
    val venues = ed.select("l_venue").distinct().collect().map(_.getString(0)).toSet
    assert(venues == Set("SIGMOD Rec.", "VLDBJ"))
  }
  test("DBLP-ACM extended-version negatives share authors but differ in venue/year") {
    val ext = dblp.train.union(dblp.test)
      .filter(col("label") === 0 && col("l_venue").isin("SIGMOD", "VLDB")
        && col("r_venue").isin("VLDBJ", "ACM TODS")
        && col("r_year").cast("int") === col("l_year").cast("int") + 1)
    assert(ext.count() > 0)
  }
  test("DBLP-ACM venues cover the six groups") {
    val vs = dblp.train.union(dblp.test).select("l_venue").distinct().collect().map(_.getString(0)).toSet
    assert(vs == EMBench.venues.toSet)
  }

  test("DBLP-Scholar is dirty: right side has missing values") {
    val all = scholar.train.union(scholar.test)
    assert(all.filter(col("r_venue").isNull).count() > 0)
    assert(all.filter(col("r_year").isNull).count() > 0)
  }
  test("DBLP-Scholar left side is clean") {
    val all = scholar.train.union(scholar.test)
    assert(all.filter(col("l_venue").isNull || col("l_year").isNull).count() == 0)
  }
  test("DBLP-Scholar %pos is in the ~19% band") {
    val f = posFrac(scholar); assert(f > 0.10 && f < 0.32, s"pos frac $f")
  }
  test("DBLP-Scholar sensitive attribute is entry type with multiple values") {
    val gs = scholar.train.union(scholar.test)
      .select(explode(col("g1"))).distinct().collect().map(_.getString(0)).toSet
    assert(gs.subsetOf(EMBench.entryTypes.toSet) && gs.size >= 3)
  }

  test("Cricket has 20 attributes (Table 4)") { assert(cricket.attrs.size == 20) }
  test("Cricket is match-heavy (~96.5% positive)") {
    val f = posFrac(cricket); assert(f > 0.90, s"pos frac $f")
  }
  test("Cricket batting style is binary") {
    val gs = cricket.train.union(cricket.test)
      .select(explode(col("g1"))).distinct().collect().map(_.getString(0)).toSet
    assert(gs == Set("Left Handed", "Right Handed"))
  }
  test("Cricket left-handed records are dirtier (coverage gap)") {
    val all = cricket.train.union(cricket.test)
    def missRate(style: String): Double = {
      val rows = all.filter(array_contains(col("g2"), style))
      val n = rows.count().toDouble
      val nulls = cricket.attrNames.map(a => rows.filter(col(s"r_$a").isNull).count()).sum.toDouble
      nulls / (n * cricket.attrs.size)
    }
    assert(missRate("Left Handed") > missRate("Right Handed"))
  }

  test("Shoes/Cameras are textual: a single title attribute") {
    assert(shoes.attrNames == Seq("title") && cameras.attrNames == Seq("title"))
  }
  test("Shoes %pos is in the ~10% band") {
    val f = posFrac(shoes); assert(f > 0.05 && f < 0.20, s"pos frac $f")
  }
  test("Cameras %pos is in the ~17% band") {
    val f = posFrac(cameras); assert(f > 0.10 && f < 0.30, s"pos frac $f")
  }
  test("Cameras sensitive groups are the six brands") {
    val gs = cameras.train.union(cameras.test)
      .select(explode(col("g1"))).distinct().collect().map(_.getString(0)).toSet
    assert(gs.size == 6 && gs.contains("sony"))
  }
  test("Cameras: surface similarity interleaves, dictionary alignment separates") {
    val all = cameras.train.union(cameras.test)
    def mean(df: org.apache.spark.sql.DataFrame, f: (String, String) => Double): Double = {
      val rows = df.select("l_title", "r_title").collect()
      rows.map(r => f(r.getString(0), r.getString(1))).sum / rows.length
    }
    val hard = all.filter(col("label") === 0 && col("g1")(0) === col("g2")(0))
    val pos  = all.filter(col("label") === 1)
    // Surface tokens (what non-neural features see): distributions overlap —
    // the mean gap is small relative to the random-negative contrast.
    val surfaceGap = math.abs(
      mean(pos, repro.core.Similarity.tokenJaccard) -
      mean(hard, repro.core.Similarity.tokenJaccard))
    assert(surfaceGap < 0.25, s"surface gap $surfaceGap")
    // Normalized embedding alignment (what the neural sims see): matches win.
    val alignGap = mean(pos, repro.matchers.neural.TextEncoder.align _) -
      mean(hard, repro.matchers.neural.TextEncoder.align _)
    assert(alignGap > 0.03, s"align gap $alignGap")
  }
  private val dutchWords = Seq("zwart", "zilver", "wit", "prijzen", "kopen",
    "aanbieding", "recensie", "goedkoop", "digitale", "compactcamera")
  private def hasDutch(c: org.apache.spark.sql.Column) =
    dutchWords.map(w => c.contains(w)).reduce(_ || _)

  test("Cameras includes Dutch-language listings") {
    val all = cameras.train.union(cameras.test)
    assert(all.filter(hasDutch(col("l_title")) || hasDutch(col("r_title"))).count() > 0)
  }
  test("nl-heavy brands have more Dutch listings than others") {
    val all = cameras.train.union(cameras.test)
    def nlFrac(brand: String): Double = {
      val rows = all.filter(col("g1")(0) === brand)
      rows.filter(hasDutch(col("l_title"))).count().toDouble / math.max(1, rows.count())
    }
    assert(nlFrac("fujifilm") > nlFrac("sony"))
  }

  test("all generators are deterministic in their seed") {
    val a = EMBench.cameras(spark, seed = 99).test.count()
    val b = EMBench.cameras(spark, seed = 99).test.count()
    assert(a == b)
  }
  test("all six datasets have both classes in train and test") {
    for (ds <- Seq(itunes, dblp, scholar, cricket, shoes, cameras); split <- Seq(ds.train, ds.test)) {
      val labels = split.select("label").distinct().collect().map(_.getInt(0)).toSet
      assert(labels == Set(0, 1), s"${ds.name} split missing a class")
    }
  }
}
