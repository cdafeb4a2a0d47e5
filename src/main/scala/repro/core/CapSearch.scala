package repro.core

import scala.collection.mutable

/** One sensor inside a component: its evolving-timestamp bitsets.
  *
  * @param plus  bitset of timestamps with a positive evolution
  * @param minus bitset of timestamps with a negative evolution
  */
final case class SensorEvents(id: String, attribute: String, plus: Array[Long], minus: Array[Long])

/** MISCELA step 4: CAP search within one spatially connected component.
  *
  * "We recursively conduct the CAP search with gradually expanding
  * spatially close sensors according to a tree structure" — the tree here
  * is a binary include/exclude enumeration of connected induced subgraphs:
  * every connected sensor set is rooted at its minimum-index member and,
  * along each path, a frontier vertex is either taken into the set or
  * forbidden forever, so each set is visited exactly once. Two
  * anti-monotone properties prune whole subtrees:
  *
  *  - support prune: the co-evolution support of a set only shrinks as the
  *    set grows, so an include-branch whose running bitset intersection
  *    drops below ψ is dead;
  *  - attribute prune: distinct attributes only grow, so an include-branch
  *    already exceeding μ distinct attributes is dead.
  *
  * Support of a set S under SameSign is |∩ plus| + |∩ minus| (all move up
  * together or all move down together); under AnySign it is
  * |∩ (plus ∪ minus)|. Both are intersections, hence anti-monotone.
  *
  * This search runs inside an executor task (one component per task); the
  * distributed axis is the component, see [[Miscela]].
  */
object CapSearch {

  /** Per-set running state: one bitset per "channel" (2 for SameSign —
    * all-plus and all-minus — 1 for AnySign).
    */
  private[core] def channels(s: SensorEvents, policy: SignPolicy): Array[Array[Long]] =
    policy match {
      case SignPolicy.SameSign => Array(s.plus, s.minus)
      case SignPolicy.AnySign =>
        val both = new Array[Long](s.plus.length)
        var i = 0
        while (i < both.length) { both(i) = s.plus(i) | s.minus(i); i += 1 }
        Array(both)
    }

  private[core] def support(state: Array[Array[Long]]): Int = {
    var s = 0
    var i = 0
    while (i < state.length) { s += Bits.cardinality(state(i)); i += 1 }
    s
  }

  /** Support of an explicit sensor set (recomputed from scratch); shared
    * with the naive baseline and with tests.
    */
  def setSupport(members: Seq[SensorEvents], policy: SignPolicy): Int = {
    require(members.nonEmpty, "setSupport of empty set")
    val state = members.map(channels(_, policy)).reduce { (a, b) =>
      a.zip(b).map { case (x, y) => Bits.and(x, y) }
    }
    support(state)
  }

  /** Enumerates all CAPs of one component.
    *
    * @param sensors component members, indexed 0..n-1
    * @param adj     adjacency lists over those indices (η-proximity edges
    *                restricted to the component)
    */
  def enumerate(sensors: Array[SensorEvents], adj: Array[Array[Int]], params: CapParams): Seq[Cap] = {
    val n = sensors.length
    if (n < 2) return Nil
    val out = mutable.ArrayBuffer.empty[Cap]
    val chans = sensors.map(channels(_, params.signPolicy))

    def emit(subIdx: List[Int], state: Array[Array[Long]]): Unit = {
      val attrs = subIdx.map(sensors(_).attribute).distinct.sorted
      if (attrs.size >= 2 || params.allowSingleAttribute)
        out += Cap(attrs, subIdx.map(sensors(_).id).sorted, support(state).toLong)
    }

    /** @param sub       current connected set (indices), non-empty
      * @param frontier  vertices adjacent to `sub`, not in it, not forbidden
      * @param forbidden vertices excluded along this path (incl. all < root)
      */
    def rec(sub: List[Int], state: Array[Array[Long]], frontier: List[Int], forbidden: Set[Int]): Unit = {
      if (sub.size == params.maxSensors || frontier.isEmpty) return
      val w = frontier.head
      val rest = frontier.tail
      // Include branch — pruned by the anti-monotone properties. A set is
      // emitted exactly once: at the moment its last member is included.
      val newState = chans(w).zip(state).map { case (c, s) => Bits.and(c, s) }
      val attrOk = (sub.map(sensors(_).attribute).toSet + sensors(w).attribute).size <= params.mu
      if (support(newState) >= params.psi && attrOk) {
        val withW = w :: sub
        emit(withW, newState)
        val inSub = withW.toSet
        val newcomers = adj(w).iterator
          .filter(u => !forbidden(u) && !inSub(u) && !rest.contains(u))
          .toList
        rec(withW, newState, rest ++ newcomers, forbidden)
      }
      // Exclude branch: w never joins any extension of `sub` on this path.
      rec(sub, state, rest, forbidden + w)
    }

    var root = 0
    while (root < n) {
      val rootState = chans(root)
      // A root below ψ cannot seed anything: intersections only shrink.
      if (support(rootState) >= params.psi) {
        val forbidden = (0 until root).toSet
        val frontier = adj(root).filter(_ > root).toList
        rec(root :: Nil, rootState, frontier, forbidden)
      }
      root += 1
    }
    out.toSeq
  }
}
