package repro.data

import scala.util.Random

/** Name pools for the semi-synthetic social datasets (§5.1.2).
  *
  * Pool sizes are the load-bearing parameter: the paper attributes social EM
  * unfairness to (i) higher intra-group name similarity and (ii) group
  * over-representation. Smaller pools (cn pinyin syllables, common
  * African-American surnames) yield more same/similar-name collisions within
  * a group, which is exactly condition (i).
  */
object Names {

  // -- CSRankings-like (FacultyMatch) --------------------------------------

  /** Small pinyin pools: Chinese transcribed names collide often. */
  val cnSurnames: Vector[String] =
    Vector("Wang", "Li", "Zhang", "Liu", "Chen", "Yang", "Huang", "Zhao", "Wu", "Zhou")

  val cnGivenSyllables: Vector[String] =
    Vector("Wei", "Lin", "Ming", "Hua", "Qing", "Jun", "Hong", "Xin", "Yan",
           "Jing", "Lei", "Fang", "Ping", "Bo", "Hu")

  /** Larger, more distinctive German pools. */
  val deSurnames: Vector[String] =
    Vector("Mueller", "Schmidt", "Schneider", "Fischer", "Weber", "Meyer", "Wagner",
           "Becker", "Schulz", "Hoffmann", "Koch", "Bauer", "Richter", "Klein", "Wolf",
           "Schroeder", "Neumann", "Schwarz", "Zimmermann", "Braun", "Krueger",
           "Hartmann", "Lange", "Werner", "Krause", "Lehmann", "Koehler", "Herrmann",
           "Koenig", "Walter", "Kaiser", "Fuchs", "Peters", "Scholz", "Jung",
           "Vogel", "Friedrich", "Keller", "Guenther", "Berger")

  val deGivenNames: Vector[String] =
    Vector("Hans", "Peter", "Klaus", "Wolfgang", "Juergen", "Dieter", "Manfred",
           "Uwe", "Stefan", "Thomas", "Andreas", "Matthias", "Frank", "Bernd",
           "Martina", "Sabine", "Petra", "Monika", "Karin", "Ursula", "Heike",
           "Gabriele", "Birgit", "Andrea", "Angelika", "Renate", "Christina",
           "Katrin", "Susanne", "Claudia", "Friedhelm", "Gerhard", "Helmut",
           "Norbert", "Rainer", "Volker", "Winfried", "Lothar", "Detlef", "Eckhard")

  /** A cn full name: one or two given syllables (possibly duplicated or
    * hyphenated, e.g. "Linlin", "Qing-Hu") + a surname from the small pool.
    */
  def cnFullName(rnd: Random): String = {
    val s1 = cnGivenSyllables(rnd.nextInt(cnGivenSyllables.size))
    // Mostly two-syllable given names (collisions rare, similarity high);
    // occasionally a bare syllable — short names make the §5.1.2 perturbation
    // proportionally larger, the root of the cn true-match misses in §5.2.2.
    val given = rnd.nextInt(4) match {
      case 0 => s1 // short: "Bo"
      case 1 => s1 + s1.toLowerCase // reduplication: "Linlin"
      case 2 => s1 + "-" + cnGivenSyllables(rnd.nextInt(cnGivenSyllables.size)) // "Qing-Hu"
      case _ => s1 + cnGivenSyllables(rnd.nextInt(cnGivenSyllables.size)).toLowerCase // "Qingming"
    }
    given + " " + cnSurnames(rnd.nextInt(cnSurnames.size))
  }

  def deFullName(rnd: Random): String =
    deGivenNames(rnd.nextInt(deGivenNames.size)) + " " + deSurnames(rnd.nextInt(deSurnames.size))

  // -- COMPAS-like (NoFlyCompas) -------------------------------------------

  /** Very common surnames in the African-American group — a small pool, per
    * the paper's observation ("Brown, Jackson, Williams, Johnson, etc.").
    */
  val afrSurnames: Vector[String] =
    Vector("Brown", "Jackson", "Williams", "Johnson", "Robinson",
           "Harris", "Washington", "Jones", "Davis", "Thomas")

  /** First names with pairwise edit distance >= 2: far enough apart that a
    * one-char perturbation never makes two persons' names identical (keeping
    * per-attribute features separable, hence non-neural matchers near
    * perfect), yet containing a few distance-2 clusters (Terrell/Tyrell,
    * Rashad/Rasheed, Jermaine/Jamaine) whose members — combined with the
    * small surname pool — produce the whole-record near-collisions that trip
    * embedding-based matchers (the paper's Ditto FP example).
    */
  val afrFirstNames: Vector[String] =
    Vector("James", "Darnell", "Tyrone", "Malik", "Terrell", "Tyrell",
           "Jermaine", "Jamaine", "DeShawn", "Marquis", "Andre", "Latoya",
           "Keisha", "Octavia", "Shanice", "Ebony", "Jasmine", "Imani",
           "Aaliyah", "Samantha", "Reginald", "Demetrius", "Cedric",
           "Monique", "Precious", "Shaquille", "Deonte", "Kenya",
           "Essence", "Rashad", "Rasheed")

  /** Larger Caucasian pools, curated to avoid near-collision clusters (the
    * "-son" surname family, Walker/Baker/Parker, Mary/Mark/Margaret,
    * Susan/Sandra, …): in this group name collisions are rare — the paper's
    * condition (i) asymmetry — so whole-record false positives concentrate
    * in the group with the dense name space.
    */
  val caucSurnames: Vector[String] =
    Vector("Smith", "Miller", "Wilson", "Moore", "Taylor", "White", "Martin",
           "Clark", "Lewis", "Walker", "Hall", "Allen", "Young", "King",
           "Wright", "Scott", "Bennett", "Carter", "Mitchell", "Turner",
           "Phillips", "Campbell", "Sullivan", "Evans", "Edwards", "Collins",
           "Stewart", "Murphy", "Cook", "Foster", "Morgan", "Reed", "Bailey",
           "Fitzgerald", "Galloway", "Whitfield", "Crawford", "Hendricks",
           "Blackburn", "Chandler")

  val caucFirstNames: Vector[String] =
    Vector("John", "Robert", "Michael", "William", "David", "Richard", "Joseph",
           "Charles", "Christopher", "Daniel", "Matthew", "Anthony", "Frank",
           "Steven", "Paul", "Kenneth", "George", "Edward", "Brian", "Gregory",
           "Carol", "Patricia", "Jennifer", "Linda", "Elizabeth", "Barbara",
           "Susan", "Jessica", "Sarah", "Karen", "Nancy", "Lisa", "Margaret",
           "Betty", "Rachel", "Ashley", "Kimberly", "Emily", "Donna", "Deborah")

  // -- Perturbation ---------------------------------------------------------

  private val alphabet = "abcdefghijklmnopqrstuvwxyz"

  /** The §5.1.2 perturbation: randomly add, remove, or replace one random
    * character of the value. Always changes the string (for length > 1).
    */
  def perturb(s: String, rnd: Random): String = {
    if (s == null || s.isEmpty) return s
    val i = rnd.nextInt(s.length)
    rnd.nextInt(3) match {
      case 0 => s.substring(0, i) + alphabet(rnd.nextInt(26)) + s.substring(i) // add
      case 1 if s.length > 1 => s.substring(0, i) + s.substring(i + 1) // remove
      case _ => // replace with a different character
        val c = s.charAt(i)
        var nc = alphabet(rnd.nextInt(26))
        if (nc == Character.toLowerCase(c)) nc = alphabet((alphabet.indexOf(nc) + 1) % 26)
        s.substring(0, i) + nc + s.substring(i + 1)
    }
  }
}
