package repro.core.schema

import repro.core.Mvd

/** Pairwise MVD compatibility (paper Def. 7.1) — the novel insight enabling
  * the reduction of schema enumeration to maximal-independent-set
  * enumeration. φ1 = X ↠ A1|…|Am and φ2 = Y ↠ B1|…|Bk are compatible iff:
  *
  *  - split-freeness: ∃i with Y ⊆ X∪Ai and ∃j with X ⊆ Y∪Bj, and
  *  - cross-splitting: the side X∪Ai that contains Y is split by φ2
  *    (intersects ≥ 2 of its dependents), and symmetrically the side Y∪Bj
  *    containing X is split by φ1.
  *
  * (In the join-tree reading — proof of Thm 7.2 — the side of φ1 facing φ2's
  * edge always contains φ2's separator and is split by it.)
  */
object Compatibility {

  def compatible(p: Mvd, q: Mvd): Boolean =
    oneWay(p, q) && oneWay(q, p)

  /** ∃i: q.key ⊆ p.key ∪ p.deps(i), with that side intersecting ≥2 deps of q. */
  private def oneWay(p: Mvd, q: Mvd): Boolean =
    p.deps.exists { ai =>
      val side = p.key | ai
      q.key.subsetOf(side) && q.deps.count(_.intersects(side)) >= 2
    }

  /** Incompatibility `φ ♯ ψ` — the edge relation of the ASMiner graph. */
  def incompatible(p: Mvd, q: Mvd): Boolean = !compatible(p, q)
}
