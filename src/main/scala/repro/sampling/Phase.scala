package repro.sampling

import scala.util.Random

import repro.core.{Hypothesis, LocalGraph, SampledGraph, Sampler}
import SamplerUtil._

/** The hypothesis-awareness machinery shared by PHASE, PHASE_opt and the
  * GraphX PHASE: the two weight functions of §3.2.1, generalized from the
  * transition probability matrices of Figure 3.
  *
  * A walker carries a *match progress* k — how many leading path positions
  * its recent trajectory matches, its current node being position k-1.
  * A candidate neighbor u reached over half-edge `half`:
  *   - extends the match (weight w_h) if the half-edge realizes step k-1's
  *     edge type in the declared direction and u satisfies M_k;
  *   - can start a fresh match (weight w_h) if u satisfies M_0 (x_1 in the
  *     figure);
  *   - otherwise gets w_l.
  * For l=0 this is exactly Fig. 3a, l=1 Fig. 3b, and l=2 the second-order
  * walk of Fig. 3c (the choice depends on current and previous node via k).
  * Overlapping matches after a completed path are not tracked (a completed
  * walker restarts its progress) — see DESIGN.md §5.
  */
final class HypothesisBias(g: LocalGraph, h: Hypothesis, wh: Double, wl: Double) {
  private val path = h.path
  val l: Int = path.length
  val labels: Array[Array[Boolean]] = g.labels(path)
  private val stepEtype: Array[Int] =
    path.steps.map(s => g.etypes.indexOf(s.etype)).toArray

  /** Walker seed weight (the paper's L_w): w_h while on a live match. */
  def seedWeight(progress: Int): Double = if (progress >= 1) wh else wl

  /** Progress of a walker freshly placed on `v`. */
  def initialProgress(v: Int): Int = if (labels(0)(v)) 1 else 0

  private def extendsMatch(k: Int, half: Int, u: Int): Boolean =
    k >= 1 && k <= l && stepEtype(k - 1) >= 0 &&
      g.halfEdgeMatches(half, path.steps(k - 1), stepEtype(k - 1)) &&
      labels(k)(u)

  /** Transition weight (the paper's N_w) for candidate u over `half`. */
  def candidateWeight(k: Int, half: Int, u: Int): Double =
    if (extendsMatch(k, half, u) || labels(0)(u)) wh else wl

  /** Walker progress after actually moving to u over `half`. */
  def nextProgress(k: Int, half: Int, u: Int): Int =
    if (extendsMatch(k, half, u)) {
      val k2 = k + 1
      // Full path matched: restart (possibly overlapping at position 0).
      if (k2 == l + 1) initialProgress(u) else k2
    } else initialProgress(u)
}

/** PHASE (Algorithm 1): an m-dimensional FrontierS-style random walk whose
  * walker choice and transitions are biased by [[HypothesisBias]]. At every
  * step it weighs *all* neighbors of the chosen walker — the O(B·2|E|/|V|)
  * cost that PHASE_opt removes.
  *
  * Budget semantics: one unit per distinct node added to V_S, matching every
  * other sampler in the framework (paper §2.3's unitary cost); S is the
  * induced subgraph on V_S.
  */
final case class PhaseSampler(
    h: Hypothesis,
    m: Int = 50,
    wh: Double = 10.0,
    wl: Double = 0.1) extends Sampler {
  val name = "PHASE"

  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val bias = new HypothesisBias(g, h, wh, wl)
    val b = math.min(budget, g.numNodes)
    val nWalk = math.max(1, math.min(m, b))
    val pos = Array.fill(nWalk)(uniformNode(g, rng))
    val prog = pos.map(bias.initialProgress)
    val lw = prog.map(bias.seedWeight)
    val picked = new NodeBudget(b)
    var steps = 0
    val cap = stepCap(budget)
    while (!picked.isFull && steps < cap) {
      val k = weightedIndex(lw, rng)
      val v = pos(k)
      val d = g.degree(v)
      val off = g.adjOff(v)
      val w = new Array[Double](d)
      var i = 0
      while (i < d) {
        w(i) = bias.candidateWeight(prog(k), off + i, g.adjNbr(off + i))
        i += 1
      }
      val sel = weightedIndex(w, rng)
      val half = off + sel
      val u = g.adjNbr(half)
      picked.add(v)
      picked.add(u)
      prog(k) = bias.nextProgress(prog(k), half, u)
      pos(k) = u
      lw(k) = bias.seedWeight(prog(k))
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}

/** PHASE_opt (Algorithm 2): PHASE with
  *  - Optim 2: already-sampled nodes are removed from the candidate set
  *    (N' = N[v] − V_S — global non-backtracking), and
  *  - Optim 1: at most `n` candidates are drawn from N' before weighting,
  *    bounding per-step work by O(n) instead of O(deg) — the O(B) total
  *    complexity claimed in §3.2.2.
  * A walker whose entire neighborhood is already sampled teleports to a
  * fresh uniform seed so the budget still drains.
  */
final case class PhaseOptSampler(
    h: Hypothesis,
    m: Int = 50,
    n: Int = 30,
    wh: Double = 10.0,
    wl: Double = 0.1) extends Sampler {
  val name = "PHASEopt"

  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val bias = new HypothesisBias(g, h, wh, wl)
    val b = math.min(budget, g.numNodes)
    val nWalk = math.max(1, math.min(m, b))
    val pos = Array.fill(nWalk)(uniformNode(g, rng))
    val prog = pos.map(bias.initialProgress)
    val lw = prog.map(bias.seedWeight)
    val picked = new NodeBudget(b)
    var steps = 0
    val cap = stepCap(budget)
    val candHalf = new Array[Int](n)
    val candW = new Array[Double](n)
    while (!picked.isFull && steps < cap) {
      val k = weightedIndex(lw, rng)
      val v = pos(k)
      val d = g.degree(v)
      val off = g.adjOff(v)
      var nc = 0
      if (d <= n) {
        // Small neighborhoods: scan, applying Optim 2's visited filter.
        var i = 0
        while (i < d) {
          val u = g.adjNbr(off + i)
          if (!picked.contains(u)) { candHalf(nc) = off + i; nc += 1 }
          i += 1
        }
      } else {
        // Hubs: O(n) random probes with rejection of visited nodes — never
        // scans the full neighbor list (this is what wins Table 2).
        var tries = 0
        while (nc < n && tries < 3 * n) {
          val halfE = off + rng.nextInt(d)
          if (!picked.contains(g.adjNbr(halfE))) { candHalf(nc) = halfE; nc += 1 }
          tries += 1
        }
      }
      if (nc == 0) {
        // Neighborhood exhausted: teleport to a fresh seed.
        val s = uniformNode(g, rng)
        pos(k) = s
        prog(k) = bias.initialProgress(s)
        lw(k) = bias.seedWeight(prog(k))
        picked.add(s)
      } else {
        var i = 0
        while (i < nc) {
          candW(i) = bias.candidateWeight(prog(k), candHalf(i), g.adjNbr(candHalf(i)))
          i += 1
        }
        val sel = weightedIndex(java.util.Arrays.copyOfRange(candW, 0, nc), rng)
        val half = candHalf(sel)
        val u = g.adjNbr(half)
        picked.add(v)
        picked.add(u)
        prog(k) = bias.nextProgress(prog(k), half, u)
        pos(k) = u
        lw(k) = bias.seedWeight(prog(k))
      }
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}
