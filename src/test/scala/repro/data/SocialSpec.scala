package repro.data

import org.apache.spark.sql.functions._

import repro.SparkSpec

/** Structural properties of the two social datasets (§5.1.2 recipes). */
class SocialSpec extends SparkSpec {

  private lazy val fm  = Social.facultyMatch(spark, nCn = 60, nDe = 45, seed = 1)
  private lazy val nfc = Social.noFlyCompas(spark, nPassengers = 80, nNoFly = 40, nOverlap = 25, seed = 1)

  // ---- FacultyMatch ----
  test("facultyMatch attrs are fullName and country") {
    assert(fm.attrNames == Seq("fullName", "country"))
    assert(fm.sensitiveAttr == "country")
  }
  test("facultyMatch match count equals entity count (one per scholar id)") {
    val all = fm.train.union(fm.test)
    assert(all.filter("label = 1").count() == 60 + 45)
  }
  test("facultyMatch matches have perturbed right names (edit distance 1)") {
    val m = fm.test.filter("label = 1").select("l_fullName", "r_fullName").collect()
    assert(m.nonEmpty)
    m.foreach { r =>
      val d = repro.core.Similarity.levenshteinDist(r.getString(0), r.getString(1))
      assert(d == 1, s"${r.getString(0)} vs ${r.getString(1)}")
    }
  }
  test("facultyMatch groups are singleton country codes") {
    val gs = fm.test.select(explode(col("g1"))).distinct().collect().map(_.getString(0)).toSet
    assert(gs == Set("cn", "de"))
  }
  test("facultyMatch cn pairs are over-represented (80% of de non-matches dropped)") {
    val all = fm.train.union(fm.test)
    val cnOnly = all.filter(col("l_country") === "cn" && col("r_country") === "cn").count()
    val deInv  = all.filter(col("l_country") === "de" || col("r_country") === "de").count()
    assert(cnOnly > 2 * deInv)
  }
  test("facultyMatch is heavily class-imbalanced (order of Table 4's 0.21%)") {
    val all = fm.train.union(fm.test)
    val pos = all.filter("label = 1").count().toDouble
    assert(pos / all.count() < 0.05)
  }
  test("facultyMatch split is ~20/80") {
    val (tr, te) = (fm.train.count().toDouble, fm.test.count().toDouble)
    val frac = tr / (tr + te)
    assert(frac > 0.12 && frac < 0.28, s"train frac $frac")
  }
  test("facultyMatch is deterministic in the seed") {
    val again = Social.facultyMatch(spark, nCn = 60, nDe = 45, seed = 1)
    assert(again.train.count() == fm.train.count())
    val a = fm.test.orderBy("id1", "id2").select("l_fullName").limit(5).collect().map(_.getString(0)).toSeq
    val b = again.test.orderBy("id1", "id2").select("l_fullName").limit(5).collect().map(_.getString(0)).toSeq
    assert(a == b)
  }
  test("facultyMatch train and test are disjoint") {
    assert(fm.train.select("id1", "id2").intersect(fm.test.select("id1", "id2")).count() == 0)
  }

  // ---- NoFlyCompas ----
  test("noFlyCompas attrs are firstName, lastName, race") {
    assert(nfc.attrNames == Seq("firstName", "lastName", "race"))
    assert(nfc.sensitiveAttr == "race")
  }
  test("noFlyCompas pair count is |passengers| x |noFly|") {
    assert(nfc.train.union(nfc.test).count() == 80L * 40L)
  }
  test("noFlyCompas match count equals overlap size") {
    assert(nfc.train.union(nfc.test).filter("label = 1").count() == 25)
  }
  test("noFlyCompas no-fly list over-represents African-Americans (~52%)") {
    val all = nfc.train.union(nfc.test)
    // right side is the no-fly list; count distinct no-fly records by race
    val byRace = all.select(col("id2"), col("r_race")).distinct()
      .groupBy("r_race").count().collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    val afr = byRace("African-American").toDouble
    val frac = afr / byRace.values.sum
    assert(frac > 0.45 && frac < 0.60, s"no-fly afr frac $frac")
  }
  test("noFlyCompas passenger list is ~20% African-American") {
    val all = nfc.train.union(nfc.test)
    val byRace = all.select(col("id1"), col("l_race")).distinct()
      .groupBy("l_race").count().collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    val frac = byRace("African-American").toDouble / byRace.values.sum
    assert(frac > 0.12 && frac < 0.30, s"passenger afr frac $frac")
  }
  test("noFlyCompas right names are perturbed for matches") {
    val m = nfc.test.filter("label = 1")
      .select("l_firstName", "r_firstName", "l_lastName", "r_lastName").collect()
    assert(m.nonEmpty)
    m.foreach { r =>
      assert(r.getString(0) != r.getString(1) || r.getString(2) != r.getString(3))
    }
  }
  test("noFlyCompas same no-fly record is perturbed consistently across pairs") {
    val v = nfc.train.union(nfc.test).filter(col("id2") === 0)
      .select("r_firstName").distinct().count()
    assert(v == 1)
  }
  test("noFlyCompas race values are the two expected groups") {
    val gs = nfc.test.select(explode(col("g2"))).distinct().collect().map(_.getString(0)).toSet
    assert(gs == Set("African-American", "Caucasian"))
  }
  test("noFlyCompas rejects an overlap larger than either list") {
    intercept[IllegalArgumentException] {
      Social.noFlyCompas(spark, nPassengers = 10, nNoFly = 5, nOverlap = 7)
    }
  }
}
