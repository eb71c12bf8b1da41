package repro

import org.apache.spark.sql.SparkSession

import repro.core.{AttributedGraph, LocalGraph}
import repro.graphgen.GraphGen

/** Shared small graphs, built once per test JVM (suites all reuse the one
  * SparkSession, so these lazily memoize).
  */
object TestGraphs {
  private def spark: SparkSession = SparkSpec.shared

  /** Tiny hand-checkable DBLP-style graph:
    *
    *   authors: a1(MSR) a2(Chinese) a3(Other)
    *   papers:  p1(cit=100, conference) by a1,a2; p2(cit=10, journal) by a2,a3;
    *            p3(cit=50, conference) by a1
    *   venues:  v1(conference), v2(journal)
    *   fos:     f1(DM), f2(DB)
    *   edges:   Authorship: p->a; PublishedIn p1->v1 p2->v2 p3->v1;
    *            WithDomain p1->f1(0.9) p2->f2(0.4) p3->f1(0.6); Cites p1->p2.
    */
  lazy val tiny: AttributedGraph = AttributedGraph.fromTuples(
    spark,
    nodeRows = Seq(
      (1L, "author", Map[String, Any]("affiliation" -> "MSR")),
      (2L, "author", Map[String, Any]("affiliation" -> "ChineseInst")),
      (3L, "author", Map[String, Any]("affiliation" -> "Other")),
      (11L, "paper", Map[String, Any]("citation" -> 100.0, "venue_type" -> "conference", "year" -> 2020.0)),
      (12L, "paper", Map[String, Any]("citation" -> 10.0, "venue_type" -> "journal", "year" -> 2001.0)),
      (13L, "paper", Map[String, Any]("citation" -> 50.0, "venue_type" -> "conference", "year" -> 2015.0)),
      (21L, "venue", Map[String, Any]("vtype" -> "conference")),
      (22L, "venue", Map[String, Any]("vtype" -> "journal")),
      (31L, "fos", Map[String, Any]("topic" -> "DM")),
      (32L, "fos", Map[String, Any]("topic" -> "DB"))),
    edgeRows = Seq(
      (11L, 1L, "Authorship", Map.empty[String, Any]),
      (11L, 2L, "Authorship", Map.empty[String, Any]),
      (12L, 2L, "Authorship", Map.empty[String, Any]),
      (12L, 3L, "Authorship", Map.empty[String, Any]),
      (13L, 1L, "Authorship", Map.empty[String, Any]),
      (11L, 21L, "PublishedIn", Map.empty[String, Any]),
      (12L, 22L, "PublishedIn", Map.empty[String, Any]),
      (13L, 21L, "PublishedIn", Map.empty[String, Any]),
      (11L, 31L, "WithDomain", Map[String, Any]("weight" -> 0.9)),
      (12L, 32L, "WithDomain", Map[String, Any]("weight" -> 0.4)),
      (13L, 31L, "WithDomain", Map[String, Any]("weight" -> 0.6)),
      (11L, 12L, "Cites", Map.empty[String, Any])))

  lazy val tinyLocal: LocalGraph = LocalGraph.fromAttributed(tiny)

  /** Small generated datasets (deterministic, shared across suites). */
  lazy val mlSmall: AttributedGraph = GraphGen.movieLens(spark, scale = 0.05)
  lazy val mlSmallLocal: LocalGraph = LocalGraph.fromAttributed(mlSmall)
  lazy val dblpSmall: AttributedGraph = GraphGen.dblp(spark, scale = 0.05)
  lazy val dblpSmallLocal: LocalGraph = LocalGraph.fromAttributed(dblpSmall)
  lazy val yelpSmall: AttributedGraph = GraphGen.yelp(spark, scale = 0.05)
  lazy val yelpSmallLocal: LocalGraph = LocalGraph.fromAttributed(yelpSmall)
}
