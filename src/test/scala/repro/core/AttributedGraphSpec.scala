package repro.core

import repro.{SparkSpec, TestGraphs}

/** DataFrame-backed attributed graph model. */
class AttributedGraphSpec extends SparkSpec {

  private lazy val g = TestGraphs.tiny

  test("node and edge counts") {
    assert(g.numNodes == 10)
    assert(g.numEdges == 12)
  }
  test("node types enumerated") {
    assert(g.nodeTypes == Seq("author", "fos", "paper", "venue"))
  }
  test("edge types enumerated") {
    assert(g.edgeTypes == Seq("Authorship", "Cites", "PublishedIn", "WithDomain"))
  }
  test("density is |E| / (|V| (|V|-1))") {
    assert(math.abs(g.density - 12.0 / (10 * 9)) < 1e-12)
  }
  test("degrees counts in+out edges") {
    val deg = g.degrees.collect().map(r => r.getLong(0) -> r.getLong(1)).toMap
    assert(deg(11L) == 5) // p1: 2 authorship + venue + fos + cites
    assert(deg(12L) == 5) // p2: 2 authorship + venue + fos + cited
    assert(deg(1L) == 2)  // a1 on p1 and p3
    assert(deg(21L) == 2) // v1 hosts p1, p3
  }
  test("degrees keeps all nodes") {
    assert(g.degrees.count() == 10)
  }
  test("induced subgraph keeps only edges with both endpoints") {
    import spark.implicits._
    val sub = g.inducedSubgraph(Seq(1L, 11L, 2L).toDF("id"))
    assert(sub.numNodes == 3)
    // Only the two Authorship edges p1->a1, p1->a2 survive.
    assert(sub.numEdges == 2)
    assert(sub.edges.select("etype").distinct().collect().map(_.getString(0)).toSeq == Seq("Authorship"))
  }
  test("induced subgraph on all nodes is identity") {
    val sub = g.inducedSubgraph(g.nodes.select("id"))
    assert(sub.numNodes == g.numNodes && sub.numEdges == g.numEdges)
  }
  test("fromTuples types numeric attributes as double") {
    val schema = g.nodes.schema
    assert(schema("citation").dataType.typeName == "double")
    assert(schema("venue_type").dataType.typeName == "string")
  }
  test("fromTuples leaves absent attributes null") {
    val authors = g.nodes.filter(org.apache.spark.sql.functions.col("ntype") === "author")
    assert(authors.filter(org.apache.spark.sql.functions.col("citation").isNotNull).count() == 0)
  }
  test("constructor validates required columns") {
    intercept[IllegalArgumentException] {
      AttributedGraph(g.nodes.drop("ntype"), g.edges)
    }
    intercept[IllegalArgumentException] {
      AttributedGraph(g.nodes, g.edges.drop("etype"))
    }
  }
}
