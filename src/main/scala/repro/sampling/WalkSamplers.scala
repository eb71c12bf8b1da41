package repro.sampling

import scala.util.Random

import repro.core.{LocalGraph, SampledGraph, Sampler}
import SamplerUtil._

/** Simple Random Walk (SRW) [Gjoka et al. 2010]: uniform-neighbor walk from a
  * random seed; each newly visited node costs one budget unit; the walk
  * teleports to a fresh uniform node when it stops making progress.
  */
final case class SimpleRandomWalk() extends Sampler {
  val name = "SRW"
  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val picked = new NodeBudget(math.min(budget, g.numNodes))
    var v = uniformNode(g, rng)
    picked.add(v)
    var steps = 0
    val cap = stepCap(budget)
    var sinceProgress = 0
    while (!picked.isFull && steps < cap) {
      v = uniformNeighbor(g, v, rng)
      val before = picked.size
      picked.add(v)
      sinceProgress = if (picked.size > before) 0 else sinceProgress + 1
      if (sinceProgress > 200) { v = uniformNode(g, rng); picked.add(v); sinceProgress = 0 }
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}

/** Non-Backtracking Random Walk (NBRW) [Lee et al. 2012]: like SRW but never
  * returns to the immediately previous node when the current node has any
  * other neighbor.
  */
final case class NonBacktrackingRandomWalk() extends Sampler {
  val name = "NBRW"
  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val picked = new NodeBudget(math.min(budget, g.numNodes))
    var prev = -1
    var v = uniformNode(g, rng)
    picked.add(v)
    var steps = 0
    val cap = stepCap(budget)
    var sinceProgress = 0
    while (!picked.isFull && steps < cap) {
      val d = g.degree(v)
      var u = g.adjNbr(g.adjOff(v) + rng.nextInt(d))
      if (u == prev && d > 1) {
        // Redraw among the d-1 non-backtracking half-edges.
        var tries = 0
        while (u == prev && tries < 16) {
          u = g.adjNbr(g.adjOff(v) + rng.nextInt(d)); tries += 1
        }
      }
      prev = v
      v = u
      val before = picked.size
      picked.add(v)
      sinceProgress = if (picked.size > before) 0 else sinceProgress + 1
      if (sinceProgress > 200) {
        prev = -1; v = uniformNode(g, rng); picked.add(v); sinceProgress = 0
      }
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}

/** Random Walk with Restart (RWR): SRW that jumps back to its seed with
  * probability `restartProb` at every step.
  */
final case class RandomWalkWithRestart(restartProb: Double = 0.15) extends Sampler {
  val name = "RWR"
  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val picked = new NodeBudget(math.min(budget, g.numNodes))
    var seed = uniformNode(g, rng)
    var v = seed
    picked.add(v)
    var steps = 0
    val cap = stepCap(budget)
    var sinceProgress = 0
    while (!picked.isFull && steps < cap) {
      v = if (rng.nextDouble() < restartProb) seed else uniformNeighbor(g, v, rng)
      val before = picked.size
      picked.add(v)
      sinceProgress = if (picked.size > before) 0 else sinceProgress + 1
      if (sinceProgress > 200) {
        // The seed's neighborhood is exhausted; restart somewhere fresh.
        seed = uniformNode(g, rng); v = seed; picked.add(v); sinceProgress = 0
      }
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}

/** Metropolis-Hastings Random Walk (MHRW) [Hübler et al. 2008]: proposes a
  * uniform neighbor u of v and accepts with min(1, deg(v)/deg(u)), making the
  * stationary distribution uniform over nodes.
  */
final case class MetropolisHastingsRandomWalk() extends Sampler {
  val name = "MHRW"
  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val picked = new NodeBudget(math.min(budget, g.numNodes))
    var v = uniformNode(g, rng)
    picked.add(v)
    var steps = 0
    val cap = stepCap(budget)
    var sinceProgress = 0
    while (!picked.isFull && steps < cap) {
      val u = uniformNeighbor(g, v, rng)
      if (rng.nextDouble() < g.degree(v).toDouble / g.degree(u).toDouble) v = u
      val before = picked.size
      picked.add(v)
      sinceProgress = if (picked.size > before) 0 else sinceProgress + 1
      if (sinceProgress > 400) { v = uniformNode(g, rng); picked.add(v); sinceProgress = 0 }
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}

/** Frontier Sampler (FrontierS) [Ribeiro & Towsley 2010]: m dependent walkers;
  * each step picks the walker to advance with probability ∝ its current
  * node's degree, then moves it to a uniform neighbor. PHASE (Algorithm 1)
  * is this sampler plus the two hypothesis-aware weight functions.
  */
final case class FrontierSampler(m: Int = 50) extends Sampler {
  val name = "FrontierS"
  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val b = math.min(budget, g.numNodes)
    val walkers = Array.fill(math.min(m, math.max(1, b)))(uniformNode(g, rng))
    val picked = new NodeBudget(b)
    walkers.foreach(picked.add)
    var steps = 0
    val cap = stepCap(budget)
    val w = new Array[Double](walkers.length)
    while (!picked.isFull && steps < cap) {
      var i = 0
      while (i < walkers.length) { w(i) = g.degree(walkers(i)).toDouble; i += 1 }
      val k = weightedIndex(w, rng)
      val u = uniformNeighbor(g, walkers(k), rng)
      walkers(k) = u
      picked.add(u)
      steps += 1
    }
    SampledGraph(picked.toArray)
  }
}
