package repro.core

import repro.{SparkSpec, TestGraphs}

/** CSR mirror correctness: degrees, half-edge direction/type, labels. */
class LocalGraphSpec extends SparkSpec {

  private lazy val g = TestGraphs.tinyLocal

  test("counts survive the collect") {
    assert(g.numNodes == 10)
    assert(g.numEdges == 12)
  }
  test("indexOf round-trips external ids") {
    for (id <- Seq(1L, 2L, 3L, 11L, 12L, 13L, 21L, 22L, 31L, 32L)) {
      val i = g.indexOf(id)
      assert(i >= 0 && g.ids(i) == id)
    }
    assert(g.indexOf(999L) == -1)
  }
  test("degrees match the DataFrame computation") {
    val dfDeg = TestGraphs.tiny.degrees.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    for (i <- 0 until g.numNodes)
      assert(g.degree(i) == dfDeg(g.ids(i)), s"degree mismatch at node ${g.ids(i)}")
  }
  test("every directed edge appears as one forward and one reverse half-edge") {
    var fwd = 0
    var rev = 0
    for (h <- g.adjNbr.indices) if (g.adjFwd(h)) fwd += 1 else rev += 1
    assert(fwd == g.numEdges && rev == g.numEdges)
  }
  test("half-edges connect the stored endpoints") {
    for (v <- 0 until g.numNodes; h <- g.adjOff(v) until g.adjOff(v + 1)) {
      val e = g.adjEdge(h)
      val u = g.adjNbr(h)
      if (g.adjFwd(h)) assert(g.edgeSrc(e) == v && g.edgeDst(e) == u)
      else assert(g.edgeDst(e) == v && g.edgeSrc(e) == u)
    }
  }
  test("node attributes preserved") {
    val p1 = g.indexOf(11L)
    assert(g.nodeType(p1) == "paper")
    assert(Attr.num(g.nodeAttrs(p1)("citation")).contains(100.0))
    assert(g.nodeAttrs(p1)("venue_type") == "conference")
  }
  test("edge attributes preserved") {
    val withW = (0 until g.numEdges).filter(e => g.edgeType(e) == "WithDomain")
    assert(withW.size == 3)
    val weights = withW.map(e => Attr.num(g.edgeAttrs(e)("weight")).get).sorted
    assert(weights == Seq(0.4, 0.6, 0.9))
  }
  test("absent attributes dropped from maps") {
    val a1 = g.indexOf(1L)
    assert(!g.nodeAttrs(a1).contains("citation"))
  }
  test("matches applies modifiers") {
    val conf = Modifier("paper", Seq(AttrPred("venue_type", CmpOp.Eq, "conference")))
    assert(g.matches(g.indexOf(11L), conf))
    assert(!g.matches(g.indexOf(12L), conf))
    assert(!g.matches(g.indexOf(1L), conf))
  }
  test("labels precomputes one bitmap per path position") {
    val path = PathSpec(
      Vector(Modifier("author"), Modifier("paper"), Modifier("author")),
      Vector(PathStep("Authorship", reversed = true), PathStep("Authorship")))
    val lab = g.labels(path)
    assert(lab.length == 3)
    assert(lab(0).count(identity) == 3) // three authors
    assert(lab(1).count(identity) == 3) // three papers
  }
  test("halfEdgeMatches respects type and direction") {
    val a1 = g.indexOf(1L)
    val auth = g.etypeIndex("Authorship")
    // From a1, Authorship edges are stored paper->author: traversal is reverse.
    for (h <- g.adjOff(a1) until g.adjOff(a1 + 1)) {
      assert(g.halfEdgeMatches(h, PathStep("Authorship", reversed = true), auth))
      assert(!g.halfEdgeMatches(h, PathStep("Authorship", reversed = false), auth))
    }
  }
  test("etypeIndex rejects unknown types") {
    intercept[IllegalArgumentException](g.etypeIndex("Nope"))
  }
  test("generated graph CSR is consistent") {
    val lg = TestGraphs.dblpSmallLocal
    assert(lg.adjOff(lg.numNodes) == 2 * lg.numEdges)
    // Spot-check 100 half-edges.
    val rng = new scala.util.Random(5)
    for (_ <- 1 to 100) {
      val h = rng.nextInt(lg.adjNbr.length)
      val e = lg.adjEdge(h)
      assert(lg.adjNbr(h) == (if (lg.adjFwd(h)) lg.edgeDst(e) else lg.edgeSrc(e)))
    }
  }
  test("SampledGraph membership") {
    val s = SampledGraph(Array(1, 3, 5))
    assert(s.size == 3)
    assert(s.contains(3) && !s.contains(2))
  }
}
