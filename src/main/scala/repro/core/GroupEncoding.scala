package repro.core

/** Subgroup hierarchy and binary group encoding (§3.2.1, Appendix A).
  *
  * Level-1 groups are the union of the domains of all sensitive attributes;
  * a level-k subgroup is a k-combination of level-1 groups. A record with
  * group set G belongs to subgroup s iff s ⊆ G — which, in the binary
  * encoding of Appendix A, is ``(s AND e) == s``.
  */
object GroupEncoding {

  /** A subgroup: a set of level-1 group values (level = size). */
  final case class Subgroup(groups: Set[String]) {
    def level: Int = groups.size
    /** Membership test: the record's groups must cover the subgroup. */
    def contains(recordGroups: Iterable[String]): Boolean =
      groups.subsetOf(recordGroups.toSet)
    /** Canonical display key, e.g. "Female&Pop". */
    def key: String = groups.toSeq.sorted.mkString("&")
  }

  /** All level-k subgroups over the given level-1 groups (the full hierarchy
    * level of Figure 1, independent of which subgroups occur in the data).
    */
  def level(groups: Seq[String], k: Int): Seq[Subgroup] =
    groups.distinct.sorted.combinations(k).map(c => Subgroup(c.toSet)).toSeq

  /** The whole hierarchy, levels 1..maxLevel. */
  def hierarchy(groups: Seq[String], maxLevel: Int): Seq[Subgroup] =
    (1 to maxLevel).flatMap(level(groups, _))

  /** Binary encoding of a subgroup over an ordered group universe
    * (Appendix A; lexicographic order of the universe).
    */
  def encode(universe: Seq[String], groups: Set[String]): Array[Int] = {
    val ordered = universe.distinct.sorted
    ordered.map(g => if (groups.contains(g)) 1 else 0).toArray
  }

  /** Appendix A membership via the encoding: (s AND e) == s. */
  def encodedContains(subgroup: Array[Int], entity: Array[Int]): Boolean = {
    require(subgroup.length == entity.length, "encoding length mismatch")
    subgroup.indices.forall(i => (subgroup(i) & entity(i)) == subgroup(i))
  }

  /** Subgroups of level k that actually occur (are non-empty) among the given
    * records' group sets — the "valid groups" an audit iterates over.
    */
  def occurring(recordGroups: Seq[Seq[String]], k: Int): Seq[Subgroup] = {
    val universe = recordGroups.flatten.distinct.sorted
    level(universe, k).filter(s => recordGroups.exists(g => s.contains(g)))
  }
}
