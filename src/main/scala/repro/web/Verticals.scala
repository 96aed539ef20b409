package repro.web

import scala.util.Random

import repro.kb.{KnowledgeBase, Triple}

/** SWDE-lite: synthetic equivalents of the four SWDE verticals used in the
  * paper's Table 1/3/4 (Movie, NBA Player, University, Book), built per
  * DESIGN.md §2.
  *
  * KB construction mirrors §5.1.1: the Movie vertical gets a large
  * IMDb-style KB covering most of the world (minus the MPAA-rating
  * predicate, which the paper's KB lacked); the other three verticals build
  * their seed KB from the ground truth of the alphabetically-first site.
  * Book sites share only a small slice of their universe with the KB site,
  * reproducing the low-overlap/low-recall regime of Fig. 4.
  */
object Verticals {

  case class VerticalData(
      vertical: String,
      namePred: String,
      preds: Vector[String],
      sites: Vector[RenderedSite],
      kb: KnowledgeBase,
  )

  private def distinctNames(n: Int, fresh: () => String): Vector[String] = {
    val used = collection.mutable.LinkedHashSet.empty[String]
    var guard = 0
    while (used.size < n && guard < n * 20) {
      val name = fresh()
      if (used.contains(name)) used += s"$name ${used.size}" else used += name
      guard += 1
    }
    used.toVector.take(n)
  }

  private def sample[T](rng: Random, xs: Vector[T], k: Int): Vector[T] =
    rng.shuffle(xs).take(k)

  // ------------------------------------------------------------------ Movie

  val MovieGenres = Vector("Drama", "Comedy", "Action", "Thriller", "Horror", "Romance",
                           "Documentary", "Animation", "Crime", "Adventure", "Fantasy", "Mystery")
  val MpaaRatings = Vector("G", "PG", "PG-13", "R", "NC-17")

  def movie(nSites: Int = 4, pagesPerSite: Int = 200, seed: Long = 11): VerticalData = {
    val rng  = new Random(seed)
    val gen  = new NameGen(rng)
    val nFilms = pagesPerSite * 2
    val directors = distinctNames(math.max(10, nFilms / 3), () => gen.person())
    val titles    = distinctNames(nFilms, () => gen.filmTitle())
    val films = titles.zipWithIndex.map { case (t, i) =>
      // One film is literally named "Help" to collide with footer boilerplate
      // and exercise the §3.1.2 uniqueness filter.
      val name = if (i == 7) "Help" else t
      WEntity(s"f$i", name, "Film",
        sample(rng, directors, 1 + rng.nextInt(2)).map("director" -> _) ++
        sample(rng, MovieGenres, 1 + rng.nextInt(3)).map("genre" -> _) :+
        ("mpaa" -> MpaaRatings(rng.nextInt(MpaaRatings.size))))
    }
    val fields = Vector(
      FieldLayout("title", "Title", multi = false),
      FieldLayout("director", "Director", multi = true),
      FieldLayout("genre", "Genre", multi = true),
      FieldLayout("mpaa", "MPAA Rating", multi = false),
    )
    val specs = (0 until nSites).map { s =>
      SiteSpec(s"movie$s.com", "title",
        if (s % 2 == 0) fields else Vector(fields(0), fields(3), fields(1), fields(2)),
        noise = NoiseSpec(recPreds = if (s == 1) Set("genre") else Set.empty),
        classPrefix = s"m$s", seed = seed * 31 + s)
    }.toVector
    val sites = specs.zipWithIndex.map { case (spec, s) =>
      val universe = sample(new Random(seed + 100 + s), films, pagesPerSite)
      SiteRenderer.render(spec, universe,
        related = i => Vector(universe((i + 1) % universe.size), universe((i + 7) % universe.size)))
    }
    // IMDb-style KB: 90% of films, no MPAA triples (§5.3: no seed data for it).
    val kbRng = new Random(seed + 999)
    val kbTriples = films.filter(_ => kbRng.nextDouble() < 0.9).flatMap { f =>
      f.facts.collect { case (p, v) if p != "mpaa" => Triple(f.id, f.name, "Film", p, v) }
    }
    VerticalData("movie", "title", fields.map(_.pred), sites, KnowledgeBase(kbTriples))
  }

  // ------------------------------------------------------------- NBA Player

  def nbaplayer(nSites: Int = 4, pagesPerSite: Int = 150, seed: Long = 22): VerticalData = {
    val rng = new Random(seed)
    val gen = new NameGen(rng)
    val teams = distinctNames(30, () => s"${gen.filmTitle().split(" ").head} ${gen.person().split(" ").last}s")
    val players = distinctNames((pagesPerSite * 1.5).toInt, () => gen.person()).zipWithIndex.map {
      case (n, i) =>
        WEntity(s"nba$i", n, "Player", Vector(
          "team"   -> teams(rng.nextInt(teams.size)),
          "height" -> s"${5 + rng.nextInt(3)}-${rng.nextInt(12)}",
          "weight" -> s"${160 + rng.nextInt(140)} lbs",
        ))
    }
    val fields = Vector(
      FieldLayout("name", "Name", multi = false),
      FieldLayout("team", "Team", multi = false),
      FieldLayout("height", "Height", multi = false),
      FieldLayout("weight", "Weight", multi = false),
    )
    val specs = (0 until nSites).map { s =>
      SiteSpec(s"nba$s.com", "name",
        if (s % 2 == 0) fields else Vector(fields(0), fields(2), fields(3), fields(1)),
        classPrefix = s"n$s", seed = seed * 31 + s)
    }.toVector
    val sites = specs.zipWithIndex.map { case (spec, s) =>
      SiteRenderer.render(spec, sample(new Random(seed + 100 + s), players, pagesPerSite))
    }
    // Seed KB = ground truth of the first site (espn.com in the paper).
    val kb = kbFromSiteTruth(sites.head, players, "Player")
    VerticalData("nbaplayer", "name", fields.map(_.pred), sites, kb)
  }

  // ------------------------------------------------------------- University

  def university(nSites: Int = 4, pagesPerSite: Int = 150, seed: Long = 33): VerticalData = {
    val rng = new Random(seed)
    val gen = new NameGen(rng)
    val unis = distinctNames((pagesPerSite * 1.5).toInt, () => gen.universityName()).zipWithIndex.map {
      case (n, i) =>
        WEntity(s"u$i", n, "University", Vector(
          "type"    -> (if (rng.nextBoolean()) "Public" else "Private"),
          "phone"   -> gen.phone(),
          "website" -> gen.website(),
        ))
    }
    val fields = Vector(
      FieldLayout("name", "Name", multi = false),
      FieldLayout("type", "Type", multi = false),
      FieldLayout("phone", "Phone", multi = false),
      FieldLayout("website", "Website", multi = false),
    )
    val specs = (0 until nSites).map { s =>
      SiteSpec(s"univ$s.edu", "name",
        if (s % 2 == 0) fields else Vector(fields(0), fields(3), fields(1), fields(2)),
        // Site 2 reproduces the §5.3 failure: a search box on every page
        // listing both University.Type values.
        noise = if (s == 2) NoiseSpec(searchBoxValues = Seq("Public", "Private")) else NoiseSpec(),
        classPrefix = s"u$s", seed = seed * 31 + s)
    }.toVector
    val sites = specs.zipWithIndex.map { case (spec, s) =>
      SiteRenderer.render(spec, sample(new Random(seed + 100 + s), unis, pagesPerSite))
    }
    val kb = kbFromSiteTruth(sites.head, unis, "University")
    VerticalData("university", "name", fields.map(_.pred), sites, kb)
  }

  // ------------------------------------------------------------------- Book

  def book(nSites: Int = 4, pagesPerSite: Int = 200, seed: Long = 44): VerticalData = {
    val rng = new Random(seed)
    val gen = new NameGen(rng)
    val nBooks = pagesPerSite * 5
    val authors    = distinctNames(nBooks / 2, () => gen.person())
    val publishers = distinctNames(40, () => gen.publisher())
    val books = distinctNames(nBooks, () => gen.bookTitle()).zipWithIndex.map { case (t, i) =>
      WEntity(s"b$i", t, "Book",
        sample(rng, authors, 1 + rng.nextInt(2)).map("author" -> _) ++ Vector(
          "publisher" -> publishers(rng.nextInt(publishers.size)),
          "pubdate"   -> gen.date(1950, 2017),
          "isbn13"    -> gen.isbn13(),
        ))
    }
    val fields = Vector(
      FieldLayout("title", "Title", multi = false),
      FieldLayout("author", "Author", multi = true),
      FieldLayout("publisher", "Publisher", multi = false),
      FieldLayout("pubdate", "Publication Date", multi = false),
      FieldLayout("isbn13", "ISBN-13", multi = false),
    )
    val specs = (0 until nSites).map { s =>
      SiteSpec(s"book$s.com", "title",
        if (s % 2 == 0) fields else Vector(fields(0), fields(2), fields(1), fields(4), fields(3)),
        classPrefix = s"b$s", seed = seed * 31 + s)
    }.toVector
    // Site 0 is the KB site; other sites share only a handful of books with
    // it, shrinking with site index down to a single page — Fig. 4's
    // low-overlap regime, where sites annotate <= 5 pages and some produce
    // no extractor at all.
    val sites = specs.zipWithIndex.map { case (spec, s) =>
      val universe =
        if (s == 0) books.take(pagesPerSite)
        else {
          val nOverlap = math.max(1, pagesPerSite / (12 * s * s))
          val overlap  = sample(new Random(seed + 200 + s), books.take(pagesPerSite), nOverlap)
          val fresh    = books.slice(pagesPerSite * s, pagesPerSite * s + pagesPerSite - overlap.size)
          new Random(seed + 300 + s).shuffle(overlap ++ fresh)
        }
      SiteRenderer.render(spec, universe)
    }
    val kb = kbFromSiteTruth(sites.head, books, "Book")
    VerticalData("book", "title", fields.map(_.pred), sites, kb)
  }

  /** Build a seed KB from one site's asserted ground truth (§5.1.1: "used
    * its ground truth to construct the seed KB").
    */
  def kbFromSiteTruth(site: RenderedSite, world: Vector[WEntity], etype: String): KnowledgeBase = {
    val byId   = world.map(e => e.id -> e).toMap
    val topics = site.topics.map(t => t.pageId -> t.entityId).toMap
    val triples = site.truth
      .filter(t => topics.contains(t.pageId))
      .map { t =>
        val e = byId(topics(t.pageId))
        Triple(e.id, e.name, etype, t.predicate, t.value)
      }
      // The page-name assertion is the entity name itself, not a KB triple.
      .filterNot(t => t.predicate == "name" || t.predicate == "title")
      .distinct
    KnowledgeBase(triples)
  }

  def all(pagesPerSite: Int = 200, seed: Long = 7): Vector[VerticalData] = Vector(
    movie(pagesPerSite = pagesPerSite, seed = seed + 11),
    nbaplayer(pagesPerSite = math.max(20, pagesPerSite * 3 / 4), seed = seed + 22),
    university(pagesPerSite = math.max(20, pagesPerSite * 3 / 4), seed = seed + 33),
    book(pagesPerSite = pagesPerSite, seed = seed + 44),
  )
}
