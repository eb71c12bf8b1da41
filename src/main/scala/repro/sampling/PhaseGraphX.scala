package repro.sampling

import org.apache.spark.graphx.{Edge, Graph, TripletFields, VertexId}
import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions.col
import scala.util.Random

import repro.core.{AttributedGraph, Hypothesis, LocalGraph, SampledGraph, Sampler}

/** Distributed PHASE as an iterative vertex-program over a partitioned
  * GraphX graph (the `distributed_dataflow` reproduction target).
  *
  * Structure per superstep (one hop for all m walkers — the synchronous
  * adaptation of Algorithm 1, DESIGN.md §5):
  *
  *  1. the driver broadcasts the walker frontier {vertex -> (walkerId,
  *     progress)} — m entries, tiny;
  *  2. `aggregateMessages` runs over every triplet: an edge incident to a
  *     walker-hosting vertex emits, toward that vertex, a candidate record
  *     for each hosted walker containing the neighbor id, its modifier
  *     bitmask and a *race key* `-ln(U)/w` where w is the Figure-3
  *     transition weight and U a per-(walker, edge, direction, superstep)
  *     deterministic uniform draw. Min-key merge inside aggregateMessages
  *     IS the weighted neighbor selection (exponential race), so the
  *     weighted choice itself happens distributed, without materializing
  *     any neighbor list;
  *  3. the driver collects the ≤ m winning candidates, moves walkers,
  *     accumulates V_S, and repeats until the node budget is met.
  *
  * Vertex attribute: an Int bitmask of which path modifiers the node
  * satisfies (computed once, via Catalyst filters on the nodes DataFrame).
  * Edge attribute: the edge-type index.
  *
  * Seed bias: Algorithm 1's per-step walker choice by L_w cannot exist in a
  * synchronous program, so the w_h/w_l seed weighting is applied when
  * drawing the m initial seeds (M_0-satisfying nodes drawn ∝ w_h).
  */
object PhaseGraphX {

  /** splitmix64 → uniform in (0,1), deterministic in the seed tuple. */
  private def unit(parts: Long*): Double = {
    var z = 0x9e3779b97f4a7c15L
    parts.foreach { p =>
      z ^= p + 0x9e3779b97f4a7c15L + (z << 6) + (z >>> 2)
      z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
      z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
      z = z ^ (z >>> 31)
    }
    val u = (z >>> 11).toDouble / (1L << 53).toDouble
    math.min(math.max(u, 1e-15), 1.0 - 1e-15)
  }

  /** Sampled external node ids (order of first visit). */
  def sample(
      spark: SparkSession,
      ag: AttributedGraph,
      h: Hypothesis,
      budget: Int,
      m: Int = 50,
      wh: Double = 10.0,
      wl: Double = 0.1,
      seed: Long = 7,
      maxSupersteps: Int = 2000): Array[Long] = {

    val path = h.path
    val l = path.length
    val stepEtypes: Array[String] = path.steps.map(_.etype).toArray
    val stepReversed: Array[Boolean] = path.steps.map(_.reversed).toArray

    // Vertex bitmask of modifier satisfaction, via Catalyst filters.
    val maskDf = path.modifiers.zipWithIndex
      .foldLeft(ag.nodes.select(col("id"))) { case (df, (mod, i)) =>
        df.join(
          ag.nodes.filter(mod.column).select(col("id"), org.apache.spark.sql.functions.lit(1).as(s"b$i")),
          Seq("id"), "left")
      }
    val maskCols = (0 to l).map(i => col(s"b$i"))
    val vertices = maskDf.select(col("id") +: maskCols: _*).rdd.map { r =>
      var bits = 0
      var i = 0
      while (i <= l) { if (!r.isNullAt(i + 1)) bits |= (1 << i); i += 1 }
      (r.getLong(0), bits)
    }

    val etypeNames = ag.edgeTypes.toArray
    val etypeIdx = etypeNames.zipWithIndex.toMap
    val stepEtypeIdx: Array[Int] = stepEtypes.map(e => etypeIdx.getOrElse(e, -1))
    val edges = ag.edges.select("src", "dst", "etype").rdd.map { r =>
      Edge(r.getLong(0), r.getLong(1), etypeIdx(r.getString(2)))
    }
    val graph: Graph[Int, Int] = Graph(vertices, edges, defaultVertexAttr = 0).cache()
    graph.numVertices // materialize

    // Weighted seed draw (the L_w bias applied at initialization).
    val idBits = vertices.collect()
    val rng = new Random(seed)
    val x1 = idBits.filter(t => (t._2 & 1) != 0).map(_._1)
    val rest = idBits.filter(t => (t._2 & 1) == 0).map(_._1)
    val nWalk = math.max(1, math.min(m, budget))
    val pX1 = if (x1.isEmpty) 0.0
              else wh * x1.length / (wh * x1.length + wl * math.max(1, rest.length))
    val seeds = Array.fill(nWalk) {
      if (rest.isEmpty || (x1.nonEmpty && rng.nextDouble() < pX1))
        x1(rng.nextInt(x1.length))
      else rest(rng.nextInt(rest.length))
    }

    def maskBit(bits: Int, i: Int): Boolean = (bits & (1 << i)) != 0
    def initialProgress(bits: Int): Int = if (maskBit(bits, 0)) 1 else 0
    def extendsMatch(progress: Int, etype: Int, forward: Boolean, candBits: Int): Boolean =
      progress >= 1 && progress <= l && stepEtypeIdx(progress - 1) == etype &&
        (forward != stepReversed(progress - 1)) && maskBit(candBits, progress)
    def weight(progress: Int, etype: Int, forward: Boolean, candBits: Int): Double =
      if (extendsMatch(progress, etype, forward, candBits) || maskBit(candBits, 0)) wh else wl

    // walkerId -> (vertex, progress)
    val pos = new Array[Long](nWalk)
    val prog = new Array[Int](nWalk)
    val seedBits = idBits.toMap
    var i = 0
    while (i < nWalk) {
      pos(i) = seeds(i)
      prog(i) = initialProgress(seedBits.getOrElse(seeds(i), 0))
      i += 1
    }

    val picked = new scala.collection.mutable.LinkedHashSet[Long]
    val sc = spark.sparkContext
    var superstep = 0
    while (picked.size < budget && superstep < maxSupersteps) {
      val frontier: Map[VertexId, Array[(Int, Int)]] =
        (0 until nWalk).groupBy(w => pos(w))
          .map { case (v, ws) => v -> ws.map(w => (w, prog(w))).toArray }
      val bFrontier = sc.broadcast(frontier)
      val stepSeed = seed ^ (superstep.toLong << 17)

      // Candidate message: walkerId -> (raceKey, candidateId, candidateBits,
      // etype, forward). Min-race-key merge = weighted sampling.
      type Msg = Map[Int, (Double, Long, Int, Int, Boolean)]
      val msgs = graph.aggregateMessages[Msg](
        ctx => {
          val f = bFrontier.value
          val srcWalkers = f.get(ctx.srcId)
          if (srcWalkers.isDefined) {
            val mm = srcWalkers.get.map { case (w, p) =>
              val wgt = weight(p, ctx.attr, forward = true, ctx.dstAttr)
              val u = unit(stepSeed, w.toLong, ctx.srcId, ctx.dstId, 1L, ctx.attr.toLong)
              w -> ((-math.log(u) / wgt, ctx.dstId, ctx.dstAttr, ctx.attr, true))
            }.toMap
            ctx.sendToSrc(mm)
          }
          val dstWalkers = f.get(ctx.dstId)
          if (dstWalkers.isDefined) {
            val mm = dstWalkers.get.map { case (w, p) =>
              val wgt = weight(p, ctx.attr, forward = false, ctx.srcAttr)
              val u = unit(stepSeed, w.toLong, ctx.dstId, ctx.srcId, 0L, ctx.attr.toLong)
              w -> ((-math.log(u) / wgt, ctx.srcId, ctx.srcAttr, ctx.attr, false))
            }.toMap
            ctx.sendToDst(mm)
          }
        },
        (a, b) => {
          // Per-walker min race key.
          (a.keySet ++ b.keySet).map { w =>
            (a.get(w), b.get(w)) match {
              case (Some(x), Some(y)) => w -> (if (x._1 <= y._1) x else y)
              case (Some(x), None)    => w -> x
              case (None, Some(y))    => w -> y
              case _                  => throw new IllegalStateException("unreachable")
            }
          }.toMap
        },
        TripletFields.All)

      val winners: Map[Int, (Double, Long, Int, Int, Boolean)] =
        msgs.collect().iterator.flatMap(_._2).toMap
      bFrontier.destroy()

      var w = 0
      while (w < nWalk && picked.size < budget) {
        winners.get(w) match {
          case Some((_, cand, candBits, etype, forward)) =>
            if (picked.size < budget) picked += pos(w)
            if (picked.size < budget) picked += cand
            prog(w) = if (extendsMatch(prog(w), etype, forward, candBits)) {
              val k2 = prog(w) + 1
              if (k2 == l + 1) initialProgress(candBits) else k2
            } else initialProgress(candBits)
            pos(w) = cand
          case None =>
            // Isolated vertex (cannot happen on §2.1-conformant graphs):
            // teleport to a fresh seed.
            val s = idBits(rng.nextInt(idBits.length))
            pos(w) = s._1
            prog(w) = initialProgress(s._2)
        }
        w += 1
      }
      superstep += 1
    }
    graph.unpersist()
    picked.toArray
  }
}

/** Adapter exposing [[PhaseGraphX]] through the uniform [[Sampler]]
  * interface: samples on the distributed graph, then maps the returned
  * external ids onto the local mirror for evaluation.
  */
final case class PhaseGraphXSampler(
    spark: SparkSession,
    ag: AttributedGraph,
    h: Hypothesis,
    m: Int = 50,
    wh: Double = 10.0,
    wl: Double = 0.1) extends Sampler {
  val name = "PHASEgx"
  def sample(g: LocalGraph, budget: Int, rng: Random): SampledGraph = {
    val ids = PhaseGraphX.sample(spark, ag, h, budget, m, wh, wl, seed = rng.nextLong())
    SampledGraph(ids.map(g.indexOf).filter(_ >= 0))
  }
}
