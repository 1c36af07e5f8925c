package repro.core.mine

import repro.core.AttrSet

/** Minimal transversals (minimal hitting sets) of a set family — the
  * hypergraph-transversal substrate of MineMinSeps (paper Sec. 6.1,
  * Thm 6.1). We use Berge's incremental algorithm: the theoretically
  * stronger Fredman–Khachiyan enumerator produces the same family; at the
  * paper's scale (≤ 45 attributes, hundreds of separators) Berge is fast
  * and far simpler.
  */
object Transversals {

  /** All minimal transversals of `edges` drawn from `ground`.
    * Edges are intersected with `ground` first. If any edge has no element
    * in `ground` (in particular the empty edge), there is no transversal.
    * The transversal family of an empty edge list is `{∅}`.
    */
  def minimal(edges: Seq[AttrSet], ground: AttrSet): Vector[AttrSet] =
    edges.foldLeft(Vector(AttrSet.empty)) { (trs, e) => addEdge(trs, e, ground) }

  /** One Berge step: update the minimal-transversal family after adding one
    * edge. MineMinSeps uses this incrementally as separators are discovered.
    */
  def addEdge(trs: Vector[AttrSet], edge: AttrSet, ground: AttrSet): Vector[AttrSet] = {
    val e = edge & ground
    if (e.isEmpty) return Vector.empty
    val (hit, miss) = trs.partition(_.intersects(e))
    val extended = for { t <- miss; x <- e.toSeq } yield t + x
    minimize(hit ++ extended)
  }

  /** Inclusion-minimal members of a family (deduped). */
  def minimize(sets: Seq[AttrSet]): Vector[AttrSet] = {
    val sorted = sets.distinct.sortBy(_.size)
    val kept = Vector.newBuilder[AttrSet]
    var keptSoFar = List.empty[AttrSet]
    for (s <- sorted) {
      if (!keptSoFar.exists(_.subsetOf(s))) {
        kept += s
        keptSoFar ::= s
      }
    }
    kept.result()
  }
}
