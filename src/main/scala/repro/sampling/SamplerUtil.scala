package repro.sampling

import scala.util.Random

import repro.core.LocalGraph

/** Shared helpers for driver-side samplers. */
object SamplerUtil {

  /** Index drawn ∝ weights(i); weights must be non-negative with a positive sum. */
  def weightedIndex(weights: Array[Double], rng: Random): Int = {
    var total = 0.0
    var i = 0
    while (i < weights.length) { total += weights(i); i += 1 }
    require(total > 0, "weighted selection over all-zero weights")
    var u = rng.nextDouble() * total
    i = 0
    while (i < weights.length - 1) {
      u -= weights(i)
      if (u <= 0) return i
      i += 1
    }
    weights.length - 1
  }

  def uniformNode(g: LocalGraph, rng: Random): Int = rng.nextInt(g.numNodes)

  /** Uniform neighbor of `v` (requires degree > 0). */
  def uniformNeighbor(g: LocalGraph, v: Int, rng: Random): Int = {
    val d = g.degree(v)
    g.adjNbr(g.adjOff(v) + rng.nextInt(d))
  }

  /** Collector that accumulates distinct node indices up to a budget. */
  final class NodeBudget(budget: Int) {
    private val seen = new java.util.BitSet()
    private val order = new scala.collection.mutable.ArrayBuffer[Int](budget)
    def add(i: Int): Unit =
      if (!seen.get(i) && order.length < budget) { seen.set(i); order += i }
    def contains(i: Int): Boolean = seen.get(i)
    def isFull: Boolean = order.length >= budget
    def size: Int = order.length
    def toArray: Array[Int] = order.toArray
  }

  /** Cap on total walk steps so trapped walkers cannot loop forever; on hit,
    * samplers return what they have (tests assert budgets are reached on the
    * connected synthetic graphs).
    */
  def stepCap(budget: Int): Int = math.max(10000, 500 * budget)
}
