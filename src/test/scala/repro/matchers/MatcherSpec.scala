package repro.matchers

import org.apache.spark.sql.functions._

import repro.SparkSpec
import repro.core._
import repro.data.GenUtil
import repro.data.GenUtil.PairRow
import repro.matchers.neural._

/** Behavioural unit tests for all 13 matchers on a small controlled dataset:
  * every matcher must learn the trivial separation (identical-ish names
  * match, different names don't), emit scores in [0,1], and respect the
  * Matcher contract.
  */
class MatcherSpec extends SparkSpec {

  /** Toy dataset: matches are near-identical two-token names; negatives are
    * unrelated names. 40 train / 40 test pairs, balanced enough to learn.
    */
  private lazy val toy: EMDataset = {
    val rnd = new scala.util.Random(5)
    val firsts = Vector("alpha", "bravo", "carson", "delta", "echo", "foxtro",
      "golfer", "hotelx", "indigo", "julietx")
    val lasts = Vector("miller", "keaton", "watson", "porter", "nguyen",
      "fischer", "romano", "baxter", "quincy", "zubrin")
    def name(i: Int): String = s"${firsts(i % 10)} ${lasts(i / 10 % 10)}"
    val rows = (0 until 50).map { i =>
      val n = name(i)
      PairRow(i.toLong, (1000 + i).toLong, Seq(n), Seq(n.dropRight(1) + "x"),
        Seq(if (i % 2 == 0) "even" else "odd"), Seq(if (i % 2 == 0) "even" else "odd"), 1)
    } ++ (0 until 50).map { i =>
      val n1 = name(i); val n2 = name((i + 13) % 100)
      PairRow((100 + i).toLong, (1100 + i).toLong, Seq(n1), Seq(n2),
        Seq("even"), Seq("odd"), 0)
    }
    val attrs = Seq(AttrSpec("name", AttrKind.ShortStr))
    val df = GenUtil.pairsDF(spark, Seq("name"), rnd.shuffle(rows))
    val (train, test) = GenUtil.split(df, 0.5, 1)
    EMDataset("toy", attrs, "parity", train, test,
      ruleAttrs = Seq(MatchRule("f_name_lev", 0.5)))
  }

  private def accuracyOf(m: Matcher): Double = {
    val scored = m.fit(toy).scores(toy.test)
    val c = ConfusionCounts.overall(scored, 0.5)
    Audit.accuracy(c)
  }

  private def checkScores(m: Matcher): Unit = {
    val scored = m.fit(toy).scores(toy.test)
    assert(scored.columns.contains("score"))
    val mm = scored.agg(min("score"), max("score")).head()
    assert(mm.getDouble(0) >= 0.0 && mm.getDouble(1) <= 1.0 + 1e-9)
    // scoring must not drop or duplicate pairs
    assert(scored.count() == toy.test.count())
  }

  for (m <- Matchers.all if m.name != "Dedupe") {
    test(s"${m.name}: scores are within [0,1] and row-preserving") { checkScores(m) }
    test(s"${m.name}: learns the toy separation (accuracy > 0.8)") {
      val acc = accuracyOf(m)
      assert(acc > 0.8, s"${m.name} accuracy $acc")
    }
  }

  test("Dedupe: learns the toy separation") {
    val acc = accuracyOf(new DedupeMatcher())
    assert(acc > 0.8, s"Dedupe accuracy $acc")
  }
  test("Dedupe: refuses oversized datasets") {
    intercept[MatcherNotScalable] { new DedupeMatcher(maxPairs = 10).fit(toy) }
  }
  test("Dedupe: refuses textual datasets") {
    val textual = toy.copy(attrs = Seq(AttrSpec("name", AttrKind.LongText)))
    intercept[MatcherNotScalable] { new DedupeMatcher().fit(textual) }
  }

  test("registry has the paper's 13 matchers") {
    assert(Matchers.all.size == 13)
    assert(Matchers.all.map(_.name).distinct.size == 13)
  }
  test("registry kinds: 1 rule-based, 7 non-neural, 5 neural (Table 3)") {
    val byKind = Matchers.all.groupBy(_.kind).view.mapValues(_.size).toMap
    assert(byKind(MatcherKind.RuleBased) == 1)
    assert(byKind(MatcherKind.NonNeural) == 7)
    assert(byKind(MatcherKind.Neural) == 5)
  }

  test("BooleanRuleMatcher produces only binary scores") {
    val scored = new BooleanRuleMatcher().fit(toy).scores(toy.test)
    val vals = scored.select("score").distinct().collect().map(_.getDouble(0)).toSet
    assert(vals.subsetOf(Set(0.0, 1.0)))
  }
  test("BooleanRuleMatcher requires rules") {
    intercept[IllegalArgumentException] {
      new BooleanRuleMatcher().fit(toy.copy(ruleAttrs = Nil))
    }
  }

  test("matchers fall back to constant scores on single-class training data") {
    val oneClass = toy.copy(train = toy.train.filter("label = 0"))
    val scored = new DTMatcher().fit(oneClass).scores(toy.test)
    assert(scored.select("score").distinct().count() == 1)
  }

  test("GNEM suppresses non-best candidates within a left record's set") {
    val rows = Seq(
      PairRow(1, 10, Seq("alpha miller"), Seq("alpha miller"), Seq("g"), Seq("g"), 1),
      PairRow(1, 11, Seq("alpha miller"), Seq("alpha milles"), Seq("g"), Seq("g"), 0))
    val df = GenUtil.pairsDF(spark, Seq("name"), rows)
    val ds = toy.copy(test = df)
    val scored = new GnemSim().fit(ds).scores(df).collect()
      .map(r => r.getAs[Long]("id2") -> r.getAs[Double]("score")).toMap
    // the weaker candidate must be strictly suppressed below the winner
    assert(scored(11) < scored(10))
  }

  test("neural matchers expose Table 3 names") {
    assert(Matchers.neural.map(_.name).toSet ==
      Set("DeepMatcher", "Ditto", "GNEM", "HierMatcher", "MCAN"))
  }
}
