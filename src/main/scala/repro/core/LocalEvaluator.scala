package repro.core

import scala.collection.mutable.ArrayBuffer

/** Outcome of evaluating a hypothesis on a graph (full G or sampled S).
  *
  * `estimate` is the aggregated value (None when no relevant path carries a
  * usable f value — e.g. the sampler missed every relevant path, which the
  * paper's accuracy metric counts as a miss); `nRelevant` counts relevant
  * path instances; `values` are the per-path f values (the t-test inputs).
  */
final case class EvalResult(
    estimate: Option[Double],
    nRelevant: Long,
    decision: Option[Boolean],
    values: Array[Double])

/** Driver-side hypothesis evaluator: enumerates relevant path instances by
  * typed DFS over the [[LocalGraph]] CSR and aggregates `f_P`.
  *
  * Semantics (verified equal to [[SparkEvaluator]] in tests):
  *  - a path instance binds one node per position; node i must satisfy M_i;
  *  - step j must use an edge of the declared type in the declared direction;
  *  - instances are simple (pairwise-distinct nodes), so a co-authorship
  *    path author→paper→author never degenerates to the same author twice;
  *  - paths whose target attribute is absent/non-numeric are counted as
  *    relevant but contribute no value.
  */
object LocalEvaluator {

  /** All f values over relevant path instances, plus the instance count. */
  def extract(g: LocalGraph, h: Hypothesis, sample: Option[SampledGraph] = None): (Array[Double], Long) = {
    val path = h.path
    val l = path.length
    val lab = g.labels(path)
    val stepType = path.steps.map(s => g.etypes.indexOf(s.etype)).toArray
    // An edge type absent from the graph ⇒ zero relevant paths.
    if (stepType.exists(_ < 0)) return (Array.empty, 0L)

    val nodeOk: Int => Boolean = sample match {
      case Some(s) => i => s.contains(i)
      case None    => _ => true
    }
    val edgeOk: Int => Boolean = sample.flatMap(_.edgeIdx) match {
      case Some(es) =>
        val b = new java.util.BitSet(); es.foreach(b.set); e => b.get(e)
      case None => _ => true
    }

    val values = new ArrayBuffer[Double]()
    var nPaths = 0L
    val chainNodes = new Array[Int](l + 1)
    val chainEdges = new Array[Int](math.max(l, 1))

    def fValue(): Option[Double] = h.target match {
      case NodeAttrTarget(p, attr) => g.nodeAttrs(chainNodes(p)).get(attr).flatMap(Attr.num)
      case EdgeAttrTarget(s, attr) => g.edgeAttrs(chainEdges(s)).get(attr).flatMap(Attr.num)
      case UnitTarget              => Some(1.0)
    }

    def dfs(pos: Int): Unit = {
      if (pos == l) {
        nPaths += 1
        fValue().foreach(values += _)
      } else {
        val v = chainNodes(pos)
        val step = path.steps(pos)
        val et = stepType(pos)
        var half = g.adjOff(v)
        val end = g.adjOff(v + 1)
        while (half < end) {
          if (g.halfEdgeMatches(half, step, et)) {
            val u = g.adjNbr(half)
            val e = g.adjEdge(half)
            if (lab(pos + 1)(u) && nodeOk(u) && edgeOk(e)) {
              var dup = false
              var k = 0
              while (k <= pos && !dup) { if (chainNodes(k) == u) dup = true; k += 1 }
              if (!dup) {
                chainNodes(pos + 1) = u
                chainEdges(pos) = e
                dfs(pos + 1)
              }
            }
          }
          half += 1
        }
      }
    }

    var i = 0
    while (i < g.numNodes) {
      if (lab(0)(i) && nodeOk(i)) {
        chainNodes(0) = i
        dfs(0)
      }
      i += 1
    }
    (values.toArray, nPaths)
  }

  /** Apply the hypothesis aggregate to extracted values. */
  def aggregate(h: Hypothesis, values: Array[Double], nPaths: Long): Option[Double] = h.agg match {
    case Agg.Count => Some(nPaths.toDouble)
    case _ if values.isEmpty => None
    case Agg.Avg => Some(values.sum / values.length)
    case Agg.Sum => Some(values.sum)
    case Agg.Min => Some(values.min)
    case Agg.Max => Some(values.max)
  }

  /** Full evaluation: extraction + aggregation + decision. */
  def evaluate(g: LocalGraph, h: Hypothesis, sample: Option[SampledGraph] = None): EvalResult = {
    val (values, nPaths) = extract(g, h, sample)
    val est = aggregate(h, values, nPaths)
    EvalResult(est, nPaths, est.map(h.decide), values)
  }
}
