package repro.hypotheses

import repro.core._
import repro.core.CmpOp._

/** The evaluation hypotheses (§4.1): three per (dataset × hypothesis type),
  * ordered so that the relevant node/edge/path population shrinks from #1 to
  * #3 (the paper's Figures 7/8 stress exactly that progression), plus the
  * DBLP length-3/4 path hypotheses of Figures 5/6.
  *
  * The constants c were calibrated once against the bench-scale synthetic
  * datasets (see `jobs/CalibrateJob`): c sits between the relevant
  * sub-population's true aggregate and the confusable global mean, so a
  * sampler only answers correctly if it actually captures relevant items.
  */
object Catalog {

  /** The three hypothesis lists of one dataset. */
  final case class DatasetHypotheses(
      node: Seq[Hypothesis], edge: Seq[Hypothesis], path: Seq[Hypothesis]) {
    def byKind(kind: String): Seq[Hypothesis] = kind match {
      case "node" => node
      case "edge" => edge
      case "path" => path
    }
    def all: Seq[Hypothesis] = node ++ edge ++ path
  }

  private def node1(m: Modifier, attr: String, op: CmpOp, c: Double, name: String) =
    Hypothesis(name, PathSpec(Vector(m), Vector.empty), NodeAttrTarget(0, attr), Agg.Avg, op, c)

  // ------------------------------------------------------------- MovieLens

  private val rates = "rates"
  private def movie(preds: AttrPred*) = Modifier("movie", preds)
  private def user(preds: AttrPred*) = Modifier("user", preds)

  val movieLens: DatasetHypotheses = DatasetHypotheses(
    node = Seq(
      node1(movie(AttrPred("genre", Eq, "action")), "year", Lt, 1990, "ML-N1"),
      node1(user(AttrPred("gender", Eq, "F")), "age", Gt, 34, "ML-N2"),
      node1(movie(AttrPred("genre", Eq, "documentary")), "year", Lt, 1990, "ML-N3")),
    edge = Seq(
      Hypothesis("ML-E1",
        PathSpec(Vector(user(), movie(AttrPred("genre", Eq, "action"))), Vector(PathStep(rates))),
        EdgeAttrTarget(0, "rating"), Agg.Avg, Lt, 3.8),
      Hypothesis("ML-E2",
        PathSpec(Vector(user(), movie(AttrPred("genre", Eq, "horror"))), Vector(PathStep(rates))),
        EdgeAttrTarget(0, "rating"), Agg.Avg, Lt, 3.35),
      Hypothesis("ML-E3",
        PathSpec(Vector(user(), movie(AttrPred("genre", Eq, "documentary"))), Vector(PathStep(rates))),
        EdgeAttrTarget(0, "rating"), Agg.Avg, Gt, 3.9)),
    path = Seq(
      Hypothesis("ML-P1",
        PathSpec(
          Vector(movie(AttrPred("genre", Eq, "action")), user(), movie(AttrPred("genre", Eq, "drama"))),
          Vector(PathStep(rates, reversed = true), PathStep(rates))),
        EdgeAttrTarget(1, "rating"), Agg.Avg, Gt, 3.35),
      Hypothesis("ML-P2",
        PathSpec(
          Vector(movie(AttrPred("genre", Eq, "horror")), user(), movie(AttrPred("genre", Eq, "documentary"))),
          Vector(PathStep(rates, reversed = true), PathStep(rates))),
        EdgeAttrTarget(1, "rating"), Agg.Avg, Gt, 3.9),
      Hypothesis("ML-P3",
        PathSpec(
          Vector(movie(AttrPred("genre", Eq, "documentary")), user(), movie(AttrPred("genre", Eq, "documentary"))),
          Vector(PathStep(rates, reversed = true), PathStep(rates))),
        EdgeAttrTarget(1, "rating"), Agg.Avg, Gt, 3.9)))

  // ------------------------------------------------------------------ DBLP

  private val authorship = "Authorship"   // stored paper -> author
  private val withDomain = "WithDomain"   // stored paper -> fos
  private val cites = "Cites"             // stored paper -> paper
  private def author(preds: AttrPred*) = Modifier("author", preds)
  private def paper(preds: AttrPred*) = Modifier("paper", preds)
  private def fos(preds: AttrPred*) = Modifier("fos", preds)

  /** Co-authorship hop: author -Authorship^-1-> paper, then paper -Authorship-> author. */
  private val toPaper = PathStep(authorship, reversed = true)
  private val toAuthor = PathStep(authorship)

  val dblp: DatasetHypotheses = DatasetHypotheses(
    node = Seq(
      node1(paper(AttrPred("venue_type", Eq, "conference")), "citation", Gt, 42, "DB-N1"),
      node1(paper(AttrPred("year", Gt, 2015.0)), "citation", Gt, 35, "DB-N2"),
      node1(paper(AttrPred("venue_type", Eq, "journal"), AttrPred("year", Lt, 2000.0)),
        "citation", Lt, 36, "DB-N3")),
    edge = Seq(
      Hypothesis("DB-E1",
        PathSpec(Vector(paper(AttrPred("venue_type", Eq, "conference")), fos(AttrPred("topic", Eq, "DM"))),
          Vector(PathStep(withDomain))),
        EdgeAttrTarget(0, "weight"), Agg.Avg, Gt, 0.55),
      Hypothesis("DB-E2",
        PathSpec(Vector(paper(AttrPred("venue_type", Eq, "journal")), fos(AttrPred("topic", Eq, "DB"))),
          Vector(PathStep(withDomain))),
        EdgeAttrTarget(0, "weight"), Agg.Avg, Lt, 0.5),
      Hypothesis("DB-E3",
        PathSpec(Vector(paper(AttrPred("venue_type", Eq, "conference"), AttrPred("year", Gt, 2018.0)),
          fos(AttrPred("topic", Eq, "DM"))),
          Vector(PathStep(withDomain))),
        EdgeAttrTarget(0, "weight"), Agg.Avg, Gt, 0.55)),
    path = Seq(
      Hypothesis("DB-P1",
        PathSpec(
          Vector(author(AttrPred("affiliation", Eq, "ChineseInst")), paper(),
            author(AttrPred("affiliation", Eq, "ChineseInst"))),
          Vector(toPaper, toAuthor)),
        NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 48),
      Hypothesis("DB-P2",
        PathSpec(
          Vector(author(AttrPred("affiliation", Eq, "MSR")), paper(), author()),
          Vector(toPaper, toAuthor)),
        NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 70),
      Hypothesis("DB-P3",
        PathSpec(
          Vector(author(AttrPred("affiliation", Eq, "MSR")),
            paper(AttrPred("venue_type", Eq, "conference")),
            author(AttrPred("affiliation", Eq, "ChineseInst"))),
          Vector(toPaper, toAuthor)),
        NodeAttrTarget(1, "citation"), Agg.Avg, Gt, 80)))

  /** The length-3 and length-4 DBLP path hypotheses of Figures 5/6. */
  val dblpLongPaths: Seq[Hypothesis] = Seq(
    Hypothesis("DB-P-L3",
      PathSpec(
        Vector(author(AttrPred("affiliation", Eq, "MSR")), paper(), paper(),
          author(AttrPred("affiliation", Eq, "ChineseInst"))),
        Vector(toPaper, PathStep(cites), toAuthor)),
      NodeAttrTarget(2, "citation"), Agg.Avg, Gt, 38),
    Hypothesis("DB-P-L4",
      PathSpec(
        Vector(author(AttrPred("affiliation", Eq, "MSR")), paper(), paper(), paper(), author()),
        Vector(toPaper, PathStep(cites), PathStep(cites), toAuthor)),
      NodeAttrTarget(3, "citation"), Agg.Avg, Gt, 40))

  // ------------------------------------------------------------------ Yelp

  private val review = "review"
  private def yuser(preds: AttrPred*) = Modifier("user", preds)
  private def biz(preds: AttrPred*) = Modifier("business", preds)

  val yelp: DatasetHypotheses = DatasetHypotheses(
    node = Seq(
      node1(yuser(AttrPred("elite", Eq, "yes")), "fans", Gt, 8, "Y-N1"),
      node1(biz(AttrPred("category", Eq, "fastfood")), "checkins", Gt, 30, "Y-N2"),
      node1(biz(AttrPred("category", Eq, "sushi"), AttrPred("state", Eq, "A")),
        "checkins", Lt, 25, "Y-N3")),
    edge = Seq(
      Hypothesis("Y-E1",
        PathSpec(Vector(yuser(), biz(AttrPred("category", Eq, "fastfood"))), Vector(PathStep(review))),
        EdgeAttrTarget(0, "stars"), Agg.Avg, Gt, 4.0),
      Hypothesis("Y-E2",
        PathSpec(Vector(yuser(), biz(AttrPred("category", Eq, "sushi"))), Vector(PathStep(review))),
        EdgeAttrTarget(0, "stars"), Agg.Avg, Lt, 3.4),
      Hypothesis("Y-E3",
        PathSpec(Vector(yuser(), biz(AttrPred("category", Eq, "fastfood"), AttrPred("state", Eq, "A"))),
          Vector(PathStep(review))),
        EdgeAttrTarget(0, "stars"), Agg.Avg, Gt, 4.0)),
    path = Seq(
      Hypothesis("Y-P1",
        PathSpec(
          Vector(biz(AttrPred("category", Eq, "coffee")), yuser(), biz(AttrPred("category", Eq, "fastfood"))),
          Vector(PathStep(review, reversed = true), PathStep(review))),
        EdgeAttrTarget(1, "stars"), Agg.Avg, Gt, 4.0),
      Hypothesis("Y-P2",
        PathSpec(
          Vector(biz(AttrPred("category", Eq, "fastfood")), yuser(), biz(AttrPred("category", Eq, "fastfood"))),
          Vector(PathStep(review, reversed = true), PathStep(review))),
        EdgeAttrTarget(1, "stars"), Agg.Avg, Gt, 4.0),
      Hypothesis("Y-P3",
        PathSpec(
          Vector(biz(AttrPred("category", Eq, "sushi")), yuser(AttrPred("elite", Eq, "yes")),
            biz(AttrPred("category", Eq, "fastfood"))),
          Vector(PathStep(review, reversed = true), PathStep(review))),
        EdgeAttrTarget(1, "stars"), Agg.Avg, Gt, 3.9)))

  /** dataset name -> hypotheses, as used by the table benches. */
  val all: Map[String, DatasetHypotheses] =
    Map("MovieLens" -> movieLens, "DBLP" -> dblp, "Yelp" -> yelp)
}
