package repro.join

import org.apache.spark.sql.DataFrame

/** Section 4.2 / Appendix E: cyclic queries via generalized hypertree
  * decompositions. Each GHD bag (a possibly-cyclic sub-join with fractional
  * edge cover <= fhw) is materialized with DataFrame joins into a single
  * relation of O(N^fhw) tuples; the bags form an acyclic query on which the
  * Section 4.1 algorithms run unchanged.
  */
object GHD {

  /** Join all relations of one bag (worst-case O(N^fhw) output). */
  def materializeBag(name: String, rels: Seq[Relation]): Relation = {
    require(rels.nonEmpty, "empty bag")
    val df = rels.tail.foldLeft(rels.head.df) { (acc, r) =>
      val shared = acc.columns.toSeq.intersect(r.df.columns.toSeq)
      if (shared.nonEmpty) acc.join(r.df, shared) else acc.crossJoin(r.df)
    }
    Relation(name, df)
  }

  /** Materialize every bag and assemble the equivalent acyclic query.
    * Fails if the bag schemas do not form an acyclic hypergraph (i.e. the
    * given decomposition is not a valid GHD skeleton).
    */
  def toAcyclic(bags: Seq[(String, Seq[Relation])]): AcyclicQuery = {
    val rels = bags.map { case (name, rs) => materializeBag(name, rs) }
    GYO.joinTree(rels).getOrElse(
      sys.error("bag schemas are not acyclic — invalid GHD"))
  }

  /** The triangle query R(a,b) ⋈ S(b,c) ⋈ T(c,a) — the canonical cyclic
    * query, fhw = 3/2 — decomposed as a single bag {a,b,c}.
    */
  def triangle(r: DataFrame, s: DataFrame, t: DataFrame): AcyclicQuery =
    toAcyclic(Seq("bag_abc" -> Seq(Relation("R", r), Relation("S", s), Relation("T", t))))
}
