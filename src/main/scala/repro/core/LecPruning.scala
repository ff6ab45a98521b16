package repro.core

import scala.collection.mutable

/** §IV-C / Alg. 2 — coordinator-side join of LEC features.
  *
  * Enumerates every consistent, crossing-edge-connected combination of LEC
  * features whose LECSigns OR to all-ones (Thm. 4). Features appearing in
  * no complete combination are pruned together with all their LPMs.
  *
  * The paper's DFS over the LECSign-group join graph is realized as a
  * worklist search over feature combinations with global member-set
  * deduplication — each combination is visited exactly once, and extension
  * candidates come from a crossing-edge hash index, so only features
  * sharing a crossing-edge mapping (Def. 9 condition 2) are ever paired.
  * Def. 9's remaining conditions are enforced on each extension:
  * condition 1 (different fragments) is implied — two features from the
  * same fragment sharing a crossing edge would both mark the edge's
  * internal endpoint in their LECSign and fail the sign test; condition 3
  * is checked at vertex granularity (shared crossing-edge endpoints must
  * bind identically, which is what Thm. 3's proof uses); condition 4 is
  * the sign-disjointness test. Multi-way joins only require the new
  * feature to be joinable with the *accumulated* combination (Thm. 4), so
  * two same-fragment features may both participate through a third.
  */
object LecPruning {

  final case class Stats(
      var joinTests: Long = 0,
      var statesExplored: Long = 0,
      var completeCombos: Long = 0,
  )

  /** @param complete  feature-index sets whose signs OR to all-ones
    * @param surviving indices of features participating in some complete set
    */
  final case class Combos(
      complete: Vector[Vector[Int]],
      surviving: Set[Int],
      stats: Stats,
  )

  private final case class State(
      members: Vector[Int], // sorted feature indices
      sign: Long,
      cross: Map[Int, Cross], // query-edge idx -> data crossing edge
      vbind: Map[Int, Long], // query-vertex idx -> data vertex (cross endpoints)
  )

  /** Pairwise Def.-9 joinability (used by tests; the search inlines it). */
  def joinable(q: EncodedQuery, a: LecFeature, b: LecFeature): Boolean = {
    if (a.frag == b.frag) return false
    if ((a.sign & b.sign) != 0) return false
    val ag = a.g.map(c => c.edge -> c).toMap
    var shared = false
    b.g.foreach { c =>
      ag.get(c.edge) match {
        case Some(ac) if ac == c => shared = true
        case Some(_)             => return false
        case None                =>
      }
    }
    if (!shared) return false
    val av = a.crossBindings(q); val bv = b.crossBindings(q)
    av.forall { case (v, d) => bv.get(v).forall(_ == d) }
  }

  def combos(q: EncodedQuery, features: IndexedSeq[LecFeature], maxStates: Long = 20_000_000L): Combos = {
    val stats = Stats()
    val full = q.fullMask

    // crossing-edge hash index: identical Cross -> features containing it
    val crossIdx = mutable.HashMap.empty[Cross, mutable.ArrayBuffer[Int]]
    features.zipWithIndex.foreach { case (f, i) =>
      f.g.foreach(c => crossIdx.getOrElseUpdate(c, mutable.ArrayBuffer.empty) += i)
    }

    val seen = mutable.HashSet.empty[Vector[Int]]
    val complete = Vector.newBuilder[Vector[Int]]
    val surviving = mutable.HashSet.empty[Int]
    val stack = mutable.Stack.empty[State]

    features.zipWithIndex.foreach { case (f, i) =>
      if (f.sign == full) {
        // cannot happen for true LPMs (they have >=1 extended vertex), but
        // keep the engine total for robustness
        complete += Vector(i); surviving += i
      } else if (seen.add(Vector(i))) {
        stack.push(State(Vector(i), f.sign, f.g.map(c => c.edge -> c).toMap, f.crossBindings(q)))
      }
    }

    def tryExtend(st: State, j: Int): Option[State] = {
      stats.joinTests += 1
      val f = features(j)
      if ((st.sign & f.sign) != 0) return None
      // crossing-edge consistency (Def. 9 conditions 2+3)
      f.g.foreach { c =>
        st.cross.get(c.edge) match {
          case Some(sc) if sc != c => return None
          case _                   =>
        }
      }
      val fb = f.crossBindings(q)
      fb.foreach { case (v, d) => if (st.vbind.get(v).exists(_ != d)) return None }
      val members = (st.members :+ j).sorted
      Some(State(members, st.sign | f.sign, st.cross ++ f.g.map(c => c.edge -> c), st.vbind ++ fb))
    }

    while (stack.nonEmpty) {
      val st = stack.pop()
      stats.statesExplored += 1
      if (stats.statesExplored > maxStates)
        throw new IllegalStateException(s"LEC feature join blowup: > $maxStates states")
      // extension candidates: features sharing one of the state's crossing
      // edges (sign-disjointness pre-filtered — it kills most candidates)
      val cands = mutable.HashSet.empty[Int]
      st.cross.valuesIterator.foreach { c =>
        crossIdx.get(c).foreach(_.foreach { j =>
          if ((features(j).sign & st.sign) == 0 && !st.members.contains(j)) cands += j
        })
      }
      cands.foreach { j =>
        tryExtend(st, j).foreach { nx =>
          if (seen.add(nx.members)) {
            if (nx.sign == full) {
              stats.completeCombos += 1
              complete += nx.members
              nx.members.foreach(surviving += _)
            } else stack.push(nx)
          }
        }
      }
    }

    Combos(complete.result(), surviving.toSet, stats)
  }
}
