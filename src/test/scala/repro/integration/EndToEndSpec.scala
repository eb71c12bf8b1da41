package repro.integration

import scala.util.Random

import repro.{SparkSpec, TestGraphs}
import repro.core._
import repro.hypotheses.Catalog
import repro.sampling._

/** Full-pipeline integration: all catalog hypotheses over the three small
  * generated datasets, with both agnostic and hypothesis-aware samplers.
  */
class EndToEndSpec extends SparkSpec {

  private lazy val graphs = Map(
    "MovieLens" -> TestGraphs.mlSmallLocal,
    "DBLP" -> TestGraphs.dblpSmallLocal,
    "Yelp" -> TestGraphs.yelpSmallLocal)

  test("ground truth is defined for every catalog hypothesis at test scale") {
    for ((name, hs) <- Catalog.all; h <- hs.all) {
      val r = Framework.groundTruth(graphs(name), h)
      assert(r.nRelevant > 0, s"${h.name} has no relevant instances at test scale")
      assert(r.decision.isDefined, s"${h.name} decision undefined")
    }
  }

  test("long-path DBLP hypotheses are evaluable at test scale") {
    for (h <- Catalog.dblpLongPaths) {
      val r = Framework.groundTruth(graphs("DBLP"), h)
      assert(r.nRelevant > 0, s"${h.name}")
    }
  }

  test("catalog hypotheses keep their calibrated decisions at bench scale margins") {
    // At small test scale the decision can differ from bench scale; only
    // require the estimate to exist and be positive where it must be.
    for ((name, hs) <- Catalog.all; h <- hs.all) {
      val r = Framework.groundTruth(graphs(name), h)
      assert(r.estimate.exists(e => !e.isNaN), s"${h.name}")
    }
  }

  test("full pipeline: every sampler completes on every hypothesis kind (DBLP)") {
    val lg = graphs("DBLP")
    val budget = 150
    val hyps = Seq(Catalog.dblp.node.head, Catalog.dblp.edge.head, Catalog.dblp.path.head)
    for (h <- hyps) {
      val samplers: Seq[Sampler] = Seq(
        RandomNodeSampler(), DegreeBasedSampler(), RandomEdgeSampler(),
        SimpleRandomWalk(), NonBacktrackingRandomWalk(), RandomWalkWithRestart(),
        MetropolisHastingsRandomWalk(), FrontierSampler(), SnowballSampler(),
        ForestFireSampler(), ShortestPathSampler(),
        PhaseSampler(h), PhaseOptSampler(h))
      for (s <- samplers) {
        val out = Framework.runOnce(lg, h, s, budget, new Random(7))
        assert(out.sampledNodes > 0, s"${s.name} on ${h.name}")
      }
    }
  }

  test("hypothesis-aware beats node/edge samplers on the rare DBLP path hypothesis") {
    val lg = graphs("DBLP")
    val h = Catalog.dblp.path(1) // MSR co-authorship
    val truth = Framework.groundTruth(lg, h)
    val budget = math.max(100, lg.numNodes / 10)
    val runs = 8
    val phase = Framework.accuracy(lg, h, PhaseOptSampler(h), budget, runs, 3, truth)
    val rns = Framework.accuracy(lg, h, RandomNodeSampler(), budget, runs, 3, truth)
    val res = Framework.accuracy(lg, h, RandomEdgeSampler(), budget, runs, 3, truth)
    assert(phase.accuracy >= rns.accuracy, s"PHASEopt ${phase.accuracy} vs RNS ${rns.accuracy}")
    assert(phase.accuracy >= res.accuracy, s"PHASEopt ${phase.accuracy} vs RES ${res.accuracy}")
  }

  test("accuracy grows with the sampling budget for PHASEopt (convergence, O1)") {
    val lg = graphs("DBLP")
    val h = Catalog.dblp.path.head
    val truth = Framework.groundTruth(lg, h)
    val small = Framework.accuracy(lg, h, PhaseOptSampler(h), 40, 6, 5, truth)
    val large = Framework.accuracy(lg, h, PhaseOptSampler(h), lg.numNodes / 2, 6, 5, truth)
    assert(large.accuracy >= small.accuracy)
    assert(large.accuracy >= 0.8, s"large-budget accuracy ${large.accuracy}")
  }

  test("p-values shrink and CIs narrow with budget (Figure 4 machinery)") {
    val lg = graphs("Yelp")
    val h = Catalog.yelp.edge.head // fastfood > 4 — true with margin
    def at(budget: Int): Option[Stats.TTest] =
      Framework.runOnce(lg, h, PhaseOptSampler(h), budget, new Random(11)).ttest
    val smallT = at(300)
    val largeT = at(1000)
    assume(smallT.isDefined && largeT.isDefined && smallT.get.n >= 2)
    assert(largeT.get.n >= smallT.get.n)
    assert((largeT.get.ciHigh - largeT.get.ciLow) <= (smallT.get.ciHigh - smallT.get.ciLow))
  }

  test("MovieLens pipeline end to end with PHASEopt") {
    val lg = graphs("MovieLens")
    val h = Catalog.movieLens.path.head
    val truth = Framework.groundTruth(lg, h)
    val acc = Framework.accuracy(lg, h, PhaseOptSampler(h), lg.numNodes / 4, 5, 2, truth)
    assert(acc.accuracy >= 0.6, s"accuracy ${acc.accuracy}")
  }

  test("Yelp pipeline end to end with PHASEopt") {
    val lg = graphs("Yelp")
    val h = Catalog.yelp.path.head
    val truth = Framework.groundTruth(lg, h)
    val acc = Framework.accuracy(lg, h, PhaseOptSampler(h), lg.numNodes / 4, 5, 2, truth)
    assert(acc.accuracy >= 0.6, s"accuracy ${acc.accuracy}")
  }
}
