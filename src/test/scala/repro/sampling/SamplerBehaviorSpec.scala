package repro.sampling

import scala.util.Random

import repro.{SparkSpec, TestGraphs}
import repro.core._

/** Distributional / mechanistic properties distinguishing the samplers. */
class SamplerBehaviorSpec extends SparkSpec {

  private lazy val lg = TestGraphs.dblpSmallLocal

  private def meanDegree(s: SampledGraph): Double =
    s.nodeIdx.map(lg.degree).sum.toDouble / s.size

  test("DBS oversamples high-degree nodes relative to RNS") {
    val rnsDeg = (1 to 5).map(i => meanDegree(RandomNodeSampler().sample(lg, 300, new Random(i))))
    val dbsDeg = (1 to 5).map(i => meanDegree(DegreeBasedSampler().sample(lg, 300, new Random(i))))
    assert(dbsDeg.sum / 5 > 1.5 * (rnsDeg.sum / 5),
      s"DBS ${dbsDeg.sum / 5} vs RNS ${rnsDeg.sum / 5}")
  }

  test("SRW oversamples high-degree nodes; MHRW corrects toward uniform") {
    val srwDeg = (1 to 5).map(i => meanDegree(SimpleRandomWalk().sample(lg, 300, new Random(i))))
    val mhDeg = (1 to 5).map(i => meanDegree(MetropolisHastingsRandomWalk().sample(lg, 300, new Random(i))))
    assert(mhDeg.sum / 5 < srwDeg.sum / 5,
      s"MHRW ${mhDeg.sum / 5} should be below SRW ${srwDeg.sum / 5}")
  }

  test("SBS grows connected waves: most sampled nodes touch another sampled node") {
    val s = SnowballSampler().sample(lg, 300, new Random(1))
    val inS = s.nodeSet
    val touching = s.nodeIdx.count { v =>
      (lg.adjOff(v) until lg.adjOff(v + 1)).exists(h => inS.get(lg.adjNbr(h)))
    }
    assert(touching.toDouble / s.size > 0.9)
  }

  test("ShortestPathS samples lie on connected chains") {
    val s = ShortestPathSampler().sample(lg, 300, new Random(1))
    val inS = s.nodeSet
    val touching = s.nodeIdx.count { v =>
      (lg.adjOff(v) until lg.adjOff(v + 1)).exists(h => inS.get(lg.adjNbr(h)))
    }
    assert(touching.toDouble / s.size > 0.8)
  }

  test("FFS burns locally: sampled subgraph has many internal edges") {
    val s = ForestFireSampler().sample(lg, 300, new Random(1))
    val inS = s.nodeSet
    var internal = 0
    for (e <- 0 until lg.numEdges)
      if (inS.get(lg.edgeSrc(e)) && inS.get(lg.edgeDst(e))) internal += 1
    val rns = RandomNodeSampler().sample(lg, 300, new Random(1))
    val inR = rns.nodeSet
    var internalR = 0
    for (e <- 0 until lg.numEdges)
      if (inR.get(lg.edgeSrc(e)) && inR.get(lg.edgeDst(e))) internalR += 1
    assert(internal > 2 * internalR, s"FFS internal=$internal RNS internal=$internalR")
  }

  test("FrontierS with m walkers covers more distinct regions than a single SRW seed") {
    // Weak smoke property: both meet budget; FrontierS has >= as many
    // connected fragments as one walk typically produces.
    val f = FrontierSampler(m = 20).sample(lg, 200, new Random(2))
    assert(f.size == 200)
  }

  test("RWR stays near its seed: sample is concentrated around the seed's neighborhood") {
    val s = RandomWalkWithRestart(0.3).sample(lg, 100, new Random(3))
    val inS = s.nodeSet
    val touching = s.nodeIdx.count { v =>
      (lg.adjOff(v) until lg.adjOff(v + 1)).exists(h => inS.get(lg.adjNbr(h)))
    }
    assert(touching.toDouble / s.size > 0.85)
  }
}
