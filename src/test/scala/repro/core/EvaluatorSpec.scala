package repro.core

import repro.{SparkSpec, TestGraphs}
import repro.core.CmpOp._

/** Hand-computed hypothesis evaluations on the tiny DBLP-style graph, run
  * through BOTH evaluators (LocalEvaluator here; SparkEvaluator equivalence
  * and the DuckDB oracle live in OracleSpec).
  */
class EvaluatorSpec extends SparkSpec {

  private lazy val lg = TestGraphs.tinyLocal

  private def conf = Modifier("paper", Seq(AttrPred("venue_type", Eq, "conference")))
  private def paper = Modifier("paper")
  private def author(aff: String) = Modifier("author", Seq(AttrPred("affiliation", Eq, aff)))
  private def anyAuthor = Modifier("author")

  private val coauthor = PathSpec(
    Vector(anyAuthor, paper, anyAuthor),
    Vector(PathStep("Authorship", reversed = true), PathStep("Authorship")))

  private def eval(h: Hypothesis, s: Option[SampledGraph] = None) = LocalEvaluator.evaluate(lg, h, s)

  // ------------------------------------------------------- node hypotheses

  test("node: avg citation of conference papers = 75") {
    val h = Hypothesis("n", PathSpec(Vector(conf), Vector.empty), NodeAttrTarget(0, "citation"), Agg.Avg, Gt, 50)
    val r = eval(h)
    assert(r.estimate.contains(75.0) && r.nRelevant == 2 && r.decision.contains(true))
  }
  test("node: journal papers avg = 10") {
    val h = Hypothesis("n", PathSpec(Vector(Modifier("paper", Seq(AttrPred("venue_type", Eq, "journal")))),
      Vector.empty), NodeAttrTarget(0, "citation"), Agg.Avg, Lt, 50)
    assert(eval(h).estimate.contains(10.0))
  }
  test("node: no relevant nodes gives None estimate and decision") {
    val h = Hypothesis("n", PathSpec(Vector(Modifier("paper", Seq(AttrPred("venue_type", Eq, "workshop")))),
      Vector.empty), NodeAttrTarget(0, "citation"), Agg.Avg, Gt, 0)
    val r = eval(h)
    assert(r.estimate.isEmpty && r.decision.isEmpty && r.nRelevant == 0)
  }
  test("node: target attribute absent on relevant nodes counts paths but no values") {
    val h = Hypothesis("n", PathSpec(Vector(anyAuthor), Vector.empty), NodeAttrTarget(0, "citation"), Agg.Avg, Gt, 0)
    val r = eval(h)
    assert(r.nRelevant == 3 && r.estimate.isEmpty)
  }

  // ------------------------------------------------------- edge hypotheses

  test("edge: conference-DM WithDomain weight avg = 0.75") {
    val h = Hypothesis("e",
      PathSpec(Vector(conf, Modifier("fos", Seq(AttrPred("topic", Eq, "DM")))), Vector(PathStep("WithDomain"))),
      EdgeAttrTarget(0, "weight"), Agg.Avg, Gt, 0.5)
    val r = eval(h)
    assert(r.estimate.exists(v => math.abs(v - 0.75) < 1e-9) && r.nRelevant == 2)
  }
  test("edge: all WithDomain edges avg") {
    val h = Hypothesis("e", PathSpec(Vector(paper, Modifier("fos")), Vector(PathStep("WithDomain"))),
      EdgeAttrTarget(0, "weight"), Agg.Avg, Gt, 0.5)
    assert(eval(h).estimate.exists(v => math.abs(v - (0.9 + 0.4 + 0.6) / 3) < 1e-9))
  }
  test("edge: forward Authorship paper->author avg citation = 54") {
    val h = Hypothesis("e", PathSpec(Vector(paper, anyAuthor), Vector(PathStep("Authorship"))),
      NodeAttrTarget(0, "citation"), Agg.Avg, Gt, 0)
    val r = eval(h)
    assert(r.nRelevant == 5 && r.estimate.contains((100.0 + 100 + 10 + 10 + 50) / 5))
  }
  test("edge: wrong direction finds nothing") {
    // Authorship is stored paper->author; author->paper forward must be empty.
    val h = Hypothesis("e", PathSpec(Vector(anyAuthor, paper), Vector(PathStep("Authorship"))),
      NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 0)
    assert(eval(h).nRelevant == 0)
  }
  test("edge: unknown edge type finds nothing") {
    val h = Hypothesis("e", PathSpec(Vector(paper, anyAuthor), Vector(PathStep("Nope"))),
      NodeAttrTarget(0, "citation"), Agg.Avg, Gt, 0)
    assert(eval(h).nRelevant == 0)
  }

  // ------------------------------------------------------- path hypotheses

  test("path: co-authorship avg citation = 55 over 4 ordered pairs") {
    val h = Hypothesis("p", coauthor, NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 50)
    val r = eval(h)
    assert(r.nRelevant == 4)
    assert(r.estimate.contains(55.0))
  }
  test("path: MSR first author restricts to p1") {
    val h = Hypothesis("p",
      PathSpec(Vector(author("MSR"), paper, anyAuthor), coauthor.steps),
      NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 50)
    val r = eval(h)
    assert(r.nRelevant == 1 && r.estimate.contains(100.0))
  }
  test("path: Chinese-Chinese co-authorship does not exist") {
    val h = Hypothesis("p",
      PathSpec(Vector(author("ChineseInst"), paper, author("ChineseInst")), coauthor.steps),
      NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 0)
    assert(eval(h).nRelevant == 0 && eval(h).estimate.isEmpty)
  }
  test("path: simple-path constraint excludes degenerate author-paper-author loops") {
    // Without distinctness p3 (single author a1) would yield a1-p3-a1.
    val h = Hypothesis("p", coauthor, UnitTarget, Agg.Count, Gt, 0)
    assert(eval(h).estimate.contains(4.0))
  }
  test("path: length-3 author-paper-cites-paper-author honors distinctness") {
    val spec = PathSpec(
      Vector(anyAuthor, paper, paper, anyAuthor),
      Vector(PathStep("Authorship", reversed = true), PathStep("Cites"), PathStep("Authorship")))
    val h = Hypothesis("p3", spec, NodeAttrTarget(2, "citation"), Agg.Avg, Gt, 0)
    val r = eval(h)
    // a1-p1-p2-a2, a1-p1-p2-a3, a2-p1-p2-a3 (a2-p1-p2-a2 excluded).
    assert(r.nRelevant == 3)
    assert(r.estimate.contains(10.0))
  }

  // ------------------------------------------------------------ aggregates

  private val coauthorAvg = Hypothesis("p", coauthor, NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 0)

  test("Min aggregate") {
    assert(eval(coauthorAvg.copy(agg = Agg.Min)).estimate.contains(10.0))
  }
  test("Max aggregate") {
    assert(eval(coauthorAvg.copy(agg = Agg.Max)).estimate.contains(100.0))
  }
  test("Sum aggregate") {
    assert(eval(coauthorAvg.copy(agg = Agg.Sum)).estimate.contains(220.0))
  }
  test("Count aggregate counts relevant instances even without values") {
    val h = Hypothesis("cnt", PathSpec(Vector(anyAuthor), Vector.empty), UnitTarget, Agg.Count, Gt, 2)
    val r = eval(h)
    assert(r.estimate.contains(3.0) && r.decision.contains(true))
  }

  // --------------------------------------------------------------- samples

  test("sample restriction: induced subgraph on {a1, a2, p1}") {
    val s = SampledGraph(Array(lg.indexOf(1L), lg.indexOf(2L), lg.indexOf(11L)))
    val r = eval(coauthorAvg, Some(s))
    assert(r.nRelevant == 2 && r.estimate.contains(100.0))
  }
  test("sample restriction: explicit edges (RES semantics) break paths") {
    // Only the p1->a1 authorship edge: no co-author path can use two edges.
    val e = (0 until lg.numEdges).find(i =>
      lg.edgeType(i) == "Authorship" && lg.ids(lg.edgeSrc(i)) == 11L && lg.ids(lg.edgeDst(i)) == 1L).get
    val s = SampledGraph(Array(lg.indexOf(1L), lg.indexOf(11L), lg.indexOf(2L)), Some(Array(e)))
    assert(eval(coauthorAvg, Some(s)).nRelevant == 0)
  }
  test("sample with all nodes equals full evaluation") {
    val s = SampledGraph(Array.range(0, lg.numNodes))
    val (a, b) = (eval(coauthorAvg, Some(s)), eval(coauthorAvg))
    assert(a.estimate == b.estimate && a.nRelevant == b.nRelevant &&
      a.decision == b.decision && a.values.toSeq == b.values.toSeq)
  }
  test("empty sample finds nothing") {
    val s = SampledGraph(Array.empty[Int])
    val r = eval(coauthorAvg, Some(s))
    assert(r.nRelevant == 0 && r.estimate.isEmpty)
  }
}
