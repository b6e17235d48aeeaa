package repro.data

import org.apache.spark.sql.SparkSession
import repro.graph.DirectedGraph

/** Planted-community graphs whose node labels are the actual article and
  * product names from the paper's Tables I–III (DESIGN.md, substitutions).
  *
  * Construction (one reusable builder, [[NamedGraphs.build]]):
  *
  *  - '''Hubs''' with a filler-page in-link quota reproduce global
  *    PageRank: a hub with a larger quota receives a strict superset of
  *    the filler contributions, so the PR order over hubs is exactly the
  *    quota order.
  *  - '''Communities''': the reference is mutually linked with every core
  *    member; member `m` additionally owns `cycleSats` satellite pages
  *    with edges `ref→S` and `S→m`, each closing one 3-cycle
  *    `ref→S→m→ref`. CycleRank therefore scores member `m` exactly
  *    `e⁻² + cycleSats·e⁻³` — the CR column order is the `cycleSats`
  *    order, by construction.
  *  - '''Popular acyclic pages''' (`ref→p`, fan satellites `ref→F`,
  *    `F→p`, no path back to the reference) score zero under CycleRank
  *    but accumulate Personalized-PageRank mass — the popularity leakage
  *    the paper demonstrates.
  *  - Because every satellite receives mass only from the reference and
  *    sheds the remainder onto dangling sink pages, the PPR score of a
  *    member is `a·(1 + α·cycleSats/satOutdeg)` and of a popular page
  *    `a·(1 + α·fanSats/satOutdeg)` (a = α·mass(ref)/outdeg(ref)), so the
  *    PPR column order is exactly the order of the `count/satOutdeg`
  *    ratios — chosen below to match the paper's tables, independent of α.
  */
object NamedGraphs {

  /** Core community member: mutual with the reference; `cycleSats`
    * satellites each close one 3-cycle; satellites shed the rest of their
    * mass over `satOutdeg - 1` dangling sinks.
    */
  final case class Member(name: String, cycleSats: Int, satOutdeg: Int) {
    require(cycleSats >= 0 && satOutdeg >= 1)
    /** PPR in-flow ratio — determines the personalized-rank position. */
    def ratio: Double = cycleSats.toDouble / satOutdeg
  }

  /** Popular page with no path back to the reference: CycleRank zero,
    * PPR mass from `fanSats` fan satellites.
    */
  final case class Popular(name: String, fanSats: Int, satOutdeg: Int) {
    require(fanSats >= 0 && satOutdeg >= 1)
    def ratio: Double = fanSats.toDouble / satOutdeg
  }

  final case class Community(ref: String, members: Seq[Member], populars: Seq[Popular])

  /** @param hubQuotas  (hub name, filler in-link quota), quota descending
    * @param memberHubs hub names that are also community members — they
    *                   keep their filler quota but are excluded from the
    *                   pure-hub pool used for satellite/popular out-links
    *                   (a pad link to them would create spurious cycles)
    * @param nFiller    filler pool size (must be ≥ the largest quota)
    * @param nSinks     dangling sink pool absorbing satellite spill-over
    */
  final case class Spec(
      hubQuotas: Seq[(String, Int)],
      memberHubs: Set[String],
      communities: Seq[Community],
      nFiller: Int,
      nSinks: Int) {
    require(hubQuotas.map(_._2).forall(_ <= nFiller), "nFiller below a hub quota")
  }

  /** Materialise a spec into a labelled [[DirectedGraph]]. Deterministic:
    * sinks are assigned round-robin in declaration order.
    */
  def build(spark: SparkSession, spec: Spec): DirectedGraph = {
    val edges = Seq.newBuilder[(String, String)]
    def filler(i: Int) = f"filler$i%05d"
    def sink(i: Int)   = f"sink$i%05d"
    var sinkCursor = 0
    def nextSinks(k: Int): Seq[String] = {
      val out = (0 until k).map(j => sink((sinkCursor + j) % spec.nSinks))
      sinkCursor = (sinkCursor + k) % spec.nSinks
      out
    }

    // Hubs: filler i links every hub whose quota exceeds i.
    for ((hub, quota) <- spec.hubQuotas; i <- 0 until quota)
      edges += filler(i) -> hub

    for (c <- spec.communities) {
      for (m <- c.members) {
        edges += c.ref -> m.name
        edges += m.name -> c.ref
        // Members also link out to sinks: a member that is simultaneously a
        // global hub (Table II's Catcher / Lord of the Flies) must not
        // funnel its whole hub mass into the reference, or global PageRank
        // would rank the reference above the hubs.
        nextSinks(9).foreach(t => edges += m.name -> t)
        for (j <- 0 until m.cycleSats) {
          val s = s"${m.name}~sat$j"
          edges += c.ref -> s
          edges += s -> m.name
          nextSinks(m.satOutdeg - 1).foreach(t => edges += s -> t)
        }
      }
      for (p <- c.populars) {
        // Populars are dangling (like hubs): an out-link would funnel their
        // whole personalized mass into a single sink and promote it.
        edges += c.ref -> p.name
        for (j <- 0 until p.fanSats) {
          val f = s"${p.name}~fan$j"
          edges += c.ref -> f
          edges += f -> p.name
          nextSinks(p.satOutdeg - 1).foreach(t => edges += f -> t)
        }
      }
    }
    DirectedGraph.fromLabeledEdges(spark, edges.result())
  }

  // ---------------------------------------------------------------------
  // Table I — English Wikipedia snapshot 2018-03-01 (synthetic stand-in).
  // ---------------------------------------------------------------------

  /** PR top-5 of the en-wiki graph (paper's Table I PageRank column). */
  val EnWikiHubs: Seq[(String, Int)] = Seq(
    "United States"        -> 400,
    "Animal"               -> 350,
    "Arthropod"            -> 300,
    "Association football" -> 250,
    "Insect"               -> 200)

  val FreddieMercury = Community(
    ref = "Freddie Mercury",
    members = Seq(
      Member("Queen (band)", 12, 5), // ratio 2.4 — top non-ref PPR & CR
      Member("Brian May",     3, 5), // 0.6
      Member("Roger Taylor",  2, 5), // 0.4
      Member("John Deacon",   1, 5)  // 0.2
    ),
    populars = Seq(
      Popular("The FM Tribute Concert", 10, 5), // 2.0
      Popular("HIV/AIDS",                8, 5), // 1.6
      Popular("Queen II",                6, 5)  // 1.2
    ))

  val Pasta = Community(
    ref = "Pasta",
    members = Seq(
      Member("Italian cuisine", 6, 12), // CR #2 (6 cycles) but PPR ratio 0.5
      Member("Italy",           3, 3),  // ratio 1.0 — PPR #5
      Member("Spaghetti",       2, 3),  // 0.667
      Member("Flour",           1, 3)   // 0.333
    ),
    populars = Seq(
      Popular("Bolognese sauce", 10, 5), // 2.0
      Popular("Carbonara",        8, 5), // 1.6
      Popular("Durum",            7, 5)  // 1.4
    ))

  /** Synthetic stand-in for the 2018-03-01 English Wikipedia wikilink
    * snapshot used by Table I.
    */
  def wikipediaEn(spark: SparkSession): DirectedGraph =
    build(spark, Spec(EnWikiHubs, Set.empty, Seq(FreddieMercury, Pasta),
                      nFiller = 400, nSinks = 300))

  // ---------------------------------------------------------------------
  // Table II — Amazon co-purchase graph (synthetic stand-in).
  // ---------------------------------------------------------------------

  /** PR top-5 of the Amazon graph; Catcher and Lord of the Flies are both
    * global hubs *and* members of the "1984" community, as in the paper's
    * table.
    */
  val AmazonHubs: Seq[(String, Int)] = Seq(
    "Good to Great"          -> 400,
    "The Catcher in the Rye" -> 350,
    "DSM-IV"                 -> 300,
    "The Great Gatsby"       -> 250,
    "Lord of the Flies"      -> 200)

  val NineteenEightyFour = Community(
    ref = "1984",
    members = Seq(
      Member("Animal Farm",             5, 10), // CR #1, ratio 0.5
      Member("Fahrenheit 451",          4, 12), // 0.333
      Member("The Catcher in the Rye",  3, 1),  // ratio 3.0 — PPR #1
      Member("Brave New World",         2, 8),  // 0.25
      Member("Lord of the Flies",       1, 1)   // 1.0 — PPR #2
    ),
    populars = Seq(
      Popular("To Kill a Mockingbird", 3, 10) // 0.3 — PPR #5
    ))

  val Fellowship = Community(
    ref = "The Fellowship of the Ring",
    members = Seq(
      Member("The Hobbit",             5, 3), // 1.667 — PPR #2
      Member("The Return of the King", 4, 5), // 0.8   — PPR #5
      Member("The Silmarillion",       3, 1), // 3.0   — PPR #1
      Member("The Two Towers",         2, 5), // 0.4
      Member("Unfinished Tales",       1, 5)  // 0.2
    ),
    populars = Seq(
      Popular("Harry Potter (Book 1)", 3, 2), // 1.5 — PPR #3
      Popular("Harry Potter (Book 2)", 2, 2)  // 1.0 — PPR #4
    ))

  /** Synthetic stand-in for the Amazon co-purchase graph of Table II. */
  def amazon(spark: SparkSession): DirectedGraph =
    build(spark, Spec(AmazonHubs,
                      memberHubs = Set("The Catcher in the Rye", "Lord of the Flies"),
                      communities = Seq(NineteenEightyFour, Fellowship),
                      nFiller = 400, nSinks = 300))

  // ---------------------------------------------------------------------
  // Table III — "Fake news" across six Wikipedia language editions.
  // ---------------------------------------------------------------------

  /** Reference article name and CR community per language edition; nl and
    * pl have fewer than five cycle-sharing articles, which is what
    * produces the paper's "–" cells.
    */
  val FakeNewsEditions: Map[String, (String, Seq[String])] = Map(
    "de" -> ("Fake News",
      Seq("Barack Obama", "Tagesschau.de", "Desinformation", "Fake", "Donald Trump")),
    "en" -> ("Fake news",
      Seq("CNN", "Facebook", "US pres. election, 2016", "Propaganda", "Social media")),
    "fr" -> ("Fake news",
      Seq("Ère post-vérité", "Donald Trump", "Facebook", "Hoax", "Alex Jones (complotiste)")),
    "it" -> ("Fake news",
      Seq("Disinformazione", "Post-verità", "Bufala", "Debunker", "Clickbait")),
    "nl" -> ("Nepnieuws",
      Seq("Facebook", "Journalistiek", "Hoax", "Donald Trump")),
    "pl" -> ("Fake news",
      Seq("Dezinformacja", "Propaganda", "Media społecznościowe")))

  /** Synthetic stand-in for one language edition's wikilink graph.
    *
    * Unlike Tables I/II, Table III shows "–" cells when fewer than five
    * articles share a cycle with the reference, so the community must not
    * introduce extra scored nodes. The construction therefore uses only
    * the reference and the listed members: every member is mutual with
    * the reference (`e⁻²` each) and a fixed set of member-pair edges
    * `mᵢ→mⱼ` closes 3-cycles `ref→mᵢ→mⱼ→ref` that give participation
    * counts (4,3,2,1,0)/(3,2,1,0)/(3,2,1) for 5/4/3 members — strictly
    * descending CR scores in the paper's listed order, and nothing else
    * with a positive score.
    */
  def fakeNews(spark: SparkSession, lang: String): DirectedGraph = {
    val (ref, names) = FakeNewsEditions.getOrElse(lang,
      throw new IllegalArgumentException(s"no edition '$lang' (have ${FakeNewsEditions.keys.mkString(",")})"))
    val edges = Seq.newBuilder[(String, String)]
    for (n <- names) { edges += ref -> n; edges += n -> ref }
    val pairs: Seq[(Int, Int)] =
      Seq((0, 1), (1, 0), (0, 2)) ++ (if (names.size >= 5) Seq((0, 3), (1, 2)) else Seq.empty)
    for ((i, j) <- pairs if i < names.size && j < names.size)
      edges += names(i) -> names(j)
    // Generic background so the graph is not just the community: hubs with
    // filler in-links, disconnected from the reference.
    val hubs = Seq(s"Hub A ($lang)", s"Hub B ($lang)")
    for ((h, q) <- hubs.zip(Seq(120, 80)); i <- 0 until q)
      edges += f"filler$i%05d ($lang)" -> h
    DirectedGraph.fromLabeledEdges(spark, edges.result())
  }
}
