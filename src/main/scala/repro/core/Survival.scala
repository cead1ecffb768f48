package repro.core

/** Survival probabilities and per-step probe estimators (§3.3, §3.5).
  *
  * All estimators are *stateless*: given the set of already-evaluated join
  * operators (always a connected subtree containing the driver, node 0) and
  * the next relation `l`, they return the expected number of probes into
  * `l`'s hash table. This is exactly Eq. (1) of the paper, built on the
  * recursive branch-survival probability `m_T`, with an optional
  * bitvector-pruning variant (ε = false-positive probability).
  *
  * Evaluated sets are bitmasks (bit i = relation i evaluated); the paper's
  * trees have ≤ ~20 relations so an Int mask suffices and keeps the
  * exhaustive DP allocation-free.
  */
object Survival {

  @inline def bit(i: Int): Int = 1 << i

  /** `m_T` for the branch rooted at `r` restricted to evaluated nodes
    * (§3.3):
    *
    *   m_T(r) = m_r × (1 − (1 − Π_{c ∈ evalChildren(r)} m_T(c))^{fo_r})
    *
    * With bitvector pruning (`eps = Some(ε)`), every *pending* child — a
    * child of an evaluated node whose own join has not run yet, but whose
    * bitvector has already been applied — contributes a factor (m_c + ε)
    * capped at 1 (§3.5). `exclude` marks one pending node to skip (the
    * relation about to be probed, which is accounted separately).
    */
  def branchSurvival(tree: JoinTree, evalMask: Int, r: Int,
                     eps: Option[Double] = None, exclude: Int = -1): Double = {
    val st = tree.stats(r)
    var x  = 1.0
    var cs = tree.children(r)
    while (cs.nonEmpty) {
      val c = cs.head
      if ((evalMask & bit(c)) != 0) x *= branchSurvival(tree, evalMask, c, eps, exclude)
      else eps.foreach { e => if (c != exclude) x *= math.min(1.0, tree.stats(c).m + e) }
      cs = cs.tail
    }
    if (x >= 1.0) st.m
    else st.m * (1.0 - math.pow(1.0 - x, st.fo))
  }

  /** Survival probability of a *driver* tuple through the whole evaluated
    * tree: the product of the branch survivals of the driver's evaluated
    * children (the driver itself has m = 1).
    */
  def treeSurvival(tree: JoinTree, evalMask: Int, eps: Option[Double] = None): Double = {
    var x  = 1.0
    var cs = tree.children(0)
    while (cs.nonEmpty) {
      val c = cs.head
      if ((evalMask & bit(c)) != 0) x *= branchSurvival(tree, evalMask, c, eps)
      else eps.foreach(e => x *= math.min(1.0, tree.stats(c).m + e))
      cs = cs.tail
    }
    x
  }

  /** Eq. (1): expected number of probes into relation `l`'s hash table given
    * the evaluated set `evalMask` (which must contain `parent(l)` and not
    * `l`). Expansion happens along the path root → parent(l): every path
    * node contributes m·fo; every evaluated branch hanging off the path
    * contributes only its survival probability m_T.
    *
    * With `eps = Some(ε)` this becomes the COM+BVP estimate (§3.5): pending
    * bitvectors hanging off path nodes — including BV(l) itself — each
    * contribute (m + ε), and branch survivals account for pending
    * bitvectors inside the branch.
    */
  def probesCom(tree: JoinTree, evalMask: Int, l: Int, eps: Option[Double] = None): Double = {
    require((evalMask & bit(l)) == 0, s"relation $l already evaluated")
    require(tree.parent(l) == 0 || (evalMask & bit(tree.parent(l))) != 0,
      s"parent of $l not evaluated — order violates precedence")
    val path = tree.pathFromRoot(tree.parent(l)) // root ... parent(l)
    val onPath = path.toSet
    var probes = tree.driverSize
    for (a <- path) {
      if (a != 0) { val st = tree.stats(a); probes *= st.m * st.fo }
      var cs = tree.children(a)
      while (cs.nonEmpty) {
        val c = cs.head
        if (!onPath(c)) {
          if ((evalMask & bit(c)) != 0) probes *= branchSurvival(tree, evalMask, c, eps)
          else eps.foreach { e =>
            // Pending bitvector: applied the moment `a` was joined. This
            // includes BV(l) itself (l is a pending child of parent(l)).
            probes *= math.min(1.0, tree.stats(c).m + e)
          }
        }
        cs = cs.tail
      }
    }
    probes
  }

  /** Expected number of *entries at relation `a`'s level* in the factorized
    * representation immediately after `a`'s hash join completed, i.e. the
    * probe count into `a` times its (conditional) selectivity. Used to cost
    * bitvector applications in COM+BVP and "expected tuples" heuristics.
    *
    * For the driver (a = 0) this is just N filtered by the evaluated
    * branches.
    */
  def entriesAfterJoin(tree: JoinTree, evalMaskAfter: Int, a: Int,
                       eps: Option[Double] = None): Double = {
    if (a == 0) tree.driverSize * treeSurvival(tree, evalMaskAfter, eps)
    else {
      val before = evalMaskAfter & ~bit(a)
      val st     = tree.stats(a)
      val p      = probesCom(tree, before, a, eps)
      eps match {
        case Some(e) =>
          val pass = math.min(1.0, st.m + e)
          // probesCom already charged (m+ε) for BV(a); the join resolves the
          // false positives: conditional match probability m/(m+ε).
          p * (st.m / pass) * st.fo
        case None => p * st.m * st.fo
      }
    }
  }
}
