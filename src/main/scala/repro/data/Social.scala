package repro.data

import org.apache.spark.sql.SparkSession
import scala.util.Random

import repro.core._
import GenUtil._

/** The two semi-synthetic social datasets of §5.1.2.
  *
  * Both follow the paper's recipes exactly (Cartesian product of two record
  * lists, right-side name perturbation, match = identical person/scholar id),
  * at a scale that fits a single local Spark session. The two auditable
  * conditions are preserved:
  *  - FacultyMatch: higher intra-group name similarity for cn (small pinyin
  *    pools) + cn pair over-representation (80 % of de-involved non-match
  *    pairs dropped, per §5.2.2);
  *  - NoFlyCompas: over-representation of African-Americans in the no-fly
  *    list (52 %) vs the passenger list (20 %), + a small common-surname pool
  *    for that group.
  */
object Social {

  /** FacultyMatch: fullName + country; match iff same scholar id.
    *
    * @param nCn  number of Chinese faculty (left list = clean, right = perturbed)
    * @param nDe  number of German faculty
    */
  def facultyMatch(spark: SparkSession, nCn: Int = 180, nDe: Int = 140,
                   seed: Long = 42): EMDataset = {
    val rnd = new Random(seed)
    // Faculty entities; ids 0..n-1. Names may collide across ids (that is the
    // point for cn) — matches are defined by id, not by name.
    val faculty: Vector[(Long, String, String)] =
      (0 until nCn).map(i => (i.toLong, Names.cnFullName(rnd), "cn")).toVector ++
        (0 until nDe).map(i => ((nCn + i).toLong, Names.deFullName(rnd), "de")).toVector

    // Right-side copies undergo the §5.1.2 perturbation on fullName.
    val right = faculty.map { case (id, name, c) => (id, Names.perturb(name, rnd), c) }

    // Cartesian product; drop 80 % of non-match pairs with a German member on
    // either side (§5.2.2) so cn pairs dominate.
    val rows = for {
      (id1, n1, c1) <- faculty
      (id2, n2, c2) <- right
      label = if (id1 == id2) 1 else 0
      if label == 1 || c1 == "cn" && c2 == "cn" || keep(id1, id2, seed + 7, 0.2)
    } yield PairRow(id1, id2, Seq(n1, c1), Seq(n2, c2), Seq(c1), Seq(c2), label)

    val attrs = Seq(AttrSpec("fullName", AttrKind.ShortStr), AttrSpec("country", AttrKind.ShortStr))
    val df = pairsDF(spark, attrs.map(_.name), rows)
    val (train, test) = split(df, 0.2, seed) // paper: ~20/80 train/test
    EMDataset("FacultyMatch", attrs, "country", train, test,
      ruleAttrs = Seq(MatchRule("f_fullName_lev", 0.5), MatchRule("f_country_exact", 0.5)))
  }

  /** NoFlyCompas: firstName + lastName + race; match iff same person id.
    *
    * Passenger list: 80 % Caucasian / 20 % African-American (US census-like);
    * no-fly list: 48 % / 52 % (COMPAS-like over-representation). The no-fly
    * (right) records' names are perturbed.
    */
  def noFlyCompas(spark: SparkSession, nPassengers: Int = 400, nNoFly: Int = 170,
                  nOverlap: Int = 130, seed: Long = 7): EMDataset = {
    require(nOverlap <= math.min(nPassengers, nNoFly))
    val rnd = new Random(seed)

    // Distinct persons carry distinct (first, last) names — as in COMPAS,
    // where full-name collisions across individuals are rare. The unfairness
    // signal comes from *similar* names (shared surnames from the small
    // African-American pool), not from exact duplicates.
    val seen = scala.collection.mutable.Set[(String, String)]()
    def person(id: Long, race: String): (Long, String, String, String) = {
      val (firsts, lasts) =
        if (race == "African-American") (Names.afrFirstNames, Names.afrSurnames)
        else (Names.caucFirstNames, Names.caucSurnames)
      var fn = firsts(rnd.nextInt(firsts.size)); var ln = lasts(rnd.nextInt(lasts.size))
      var tries = 0
      while (seen.contains((fn, ln)) && tries < 100) {
        fn = firsts(rnd.nextInt(firsts.size)); ln = lasts(rnd.nextInt(lasts.size))
        tries += 1
      }
      seen += ((fn, ln))
      (id, fn, ln, race)
    }

    // No-fly list composition: 52 % African-American.
    val nflAfr = (nNoFly * 0.52).round.toInt
    val noFlyPersons =
      (0 until nflAfr).map(i => person(i.toLong, "African-American")) ++
        (nflAfr until nNoFly).map(i => person(i.toLong, "Caucasian"))

    // Overlap (the true matches) drawn evenly across the no-fly list.
    val overlap = rnd.shuffle(noFlyPersons.toVector).take(nOverlap)

    // Passenger list: overlap + fresh persons, topped up to 80/20 overall.
    val passAfrTarget = (nPassengers * 0.20).round.toInt
    val overlapAfr    = overlap.count(_._4 == "African-American")
    val freshAfr      = math.max(0, passAfrTarget - overlapAfr)
    val nFresh        = nPassengers - nOverlap
    val fresh = (0 until nFresh).map { i =>
      val race = if (i < freshAfr) "African-American" else "Caucasian"
      person((nNoFly + i).toLong, race)
    }
    val passengers = overlap ++ fresh

    val rows = for {
      (id1, fn1, ln1, r1) <- passengers
      (id2, fn2, ln2, r2) <- noFlyPersons
    } yield {
      // Right (no-fly) side perturbed on both name columns, per §5.1.2.
      val pr = new Random(seed * 31 + id2)
      PairRow(id1, id2,
        Seq(fn1, ln1, r1),
        Seq(Names.perturb(fn2, pr), Names.perturb(ln2, pr), r2),
        Seq(r1), Seq(r2),
        label = if (id1 == id2) 1 else 0)
    }

    val attrs = Seq(
      AttrSpec("firstName", AttrKind.ShortStr),
      AttrSpec("lastName", AttrKind.ShortStr),
      AttrSpec("race", AttrKind.ShortStr))
    val df = pairsDF(spark, attrs.map(_.name), rows.toSeq)
    val (train, test) = split(df, 0.25, seed) // paper: ~21/79 train/test
    // The handpicked rules lean on the surname + race proxy (no first-name
    // condition) — the loose rule set behind the paper's BRM F-1 of 0.14.
    EMDataset("NoFlyCompas", attrs, "race", train, test,
      ruleAttrs = Seq(
        MatchRule("f_lastName_lev", 0.5),
        MatchRule("f_race_exact", 0.5)))
  }
}
