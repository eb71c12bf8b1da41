package repro.sampling

import scala.util.Random

import repro.{SparkSpec, TestGraphs}
import repro.core._
import repro.hypotheses.Catalog

/** The distributed (GraphX aggregateMessages) PHASE implementation. */
class PhaseGraphXSpec extends SparkSpec {

  private lazy val ag = TestGraphs.dblpSmall
  private lazy val lg = TestGraphs.dblpSmallLocal

  test("returns valid external node ids up to the budget") {
    val h = Catalog.dblp.path.head
    val ids = PhaseGraphX.sample(spark, ag, h, budget = 80, seed = 1)
    assert(ids.length == 80)
    assert(ids.distinct.length == ids.length)
    assert(ids.forall(id => lg.indexOf(id) >= 0))
  }

  test("deterministic for a fixed seed") {
    val h = Catalog.dblp.node.head
    val a = PhaseGraphX.sample(spark, ag, h, budget = 60, seed = 5)
    val b = PhaseGraphX.sample(spark, ag, h, budget = 60, seed = 5)
    assert(a.toSeq == b.toSeq)
  }

  test("different seeds differ") {
    val h = Catalog.dblp.node.head
    val a = PhaseGraphX.sample(spark, ag, h, budget = 60, seed = 5)
    val b = PhaseGraphX.sample(spark, ag, h, budget = 60, seed = 6)
    assert(a.toSet != b.toSet)
  }

  test("enriches hypothesis-relevant nodes like local PHASE (vs uniform)") {
    val h = Catalog.dblp.path.head // ChineseInst co-authorship
    val lab = lg.labels(h.path)
    def frac(idx: Array[Int]): Double =
      idx.count(i => lab(0)(i)).toDouble / idx.length
    val gx = PhaseGraphX.sample(spark, ag, h, budget = 150, seed = 3)
      .map(lg.indexOf)
    val rns = RandomNodeSampler().sample(lg, 150, new Random(3)).nodeIdx
    assert(frac(gx) > frac(rns) + 0.1,
      s"graphx=${frac(gx)} rns=${frac(rns)}")
  }

  test("estimator from the distributed sample tracks the local PHASE estimator") {
    val h = Catalog.dblp.path.head
    val truth = LocalEvaluator.evaluate(lg, h).estimate.get
    val gxSample = SampledGraph(
      PhaseGraphX.sample(spark, ag, h, budget = 400, seed = 9).map(lg.indexOf).filter(_ >= 0))
    val est = LocalEvaluator.evaluate(lg, h, Some(gxSample)).estimate
    assert(est.isDefined, "distributed sample captured no relevant path")
    assert(math.abs(est.get - truth) / truth < 0.5, s"est=${est.get} truth=$truth")
  }

  test("Sampler adapter plugs into the framework") {
    val h = Catalog.dblp.node.head
    val sampler = PhaseGraphXSampler(spark, ag, h)
    val out = Framework.runOnce(lg, h, sampler, budget = 80, new Random(2))
    assert(out.sampledNodes == 80)
    assert(out.result.nRelevant > 0)
  }

  test("works for node, edge, and path hypotheses") {
    for (h <- Seq(Catalog.dblp.node.head, Catalog.dblp.edge.head, Catalog.dblp.path.head)) {
      val ids = PhaseGraphX.sample(spark, ag, h, budget = 50, seed = 11)
      assert(ids.length == 50, h.name)
    }
  }
}
