package repro.core.schema

import repro.core.{AttrSet, Mvd, Schema}

/** BuildAcyclicSchema (paper Fig. 9): synthesize an acyclic schema from a
  * set Q of pairwise-compatible ε-MVDs.
  *
  * Start from `S = {Ω}`; process MVDs in ascending key-cardinality order;
  * each MVD `X ↠ C1|…|Cm` splits the (unique) bag Ωi ⊇ X into the bags
  * `X ∪ (Cj ∩ Ωi)`. MVDs that fail to split their bag into ≥ 2 parts are
  * *redundant* and skipped.
  */
object SchemaSynthesis {

  def build(q: Seq[Mvd], omega: AttrSet): Schema = {
    var s = Vector(omega)
    for (phi <- q.sortBy(_.key.size)) {
      val x = phi.key
      val i = s.indexWhere(x.subsetOf(_))
      if (i >= 0) {
        val bag = s(i)
        val parts = phi.deps
          .map(c => (c & bag) | x)
          .filter(_ != x)
          .distinct
        if (parts.size >= 2) s = s.patch(i, parts, 1)
      }
    }
    Schema.of(s)
  }
}
