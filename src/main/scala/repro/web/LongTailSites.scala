package repro.web

import scala.util.Random

import repro.kb.{KnowledgeBase, Triple}

/** The "CommonCrawl movie sites" corpus (§5.1.3 / §5.5, Tables 8–9): dozens
  * of long-tail, multi-lingual movie websites sharing one seed KB.
  *
  * One world = a pool of "popular" films/people the KB knows, plus a large
  * TV-episode population (the §5.5.1 over-represented type).  Each site mixes
  * KB-covered entities (its `overlap` fraction) with fresh site-local
  * entities named in the site's language flavour — the long tail the paper
  * extracts.  Site noise profiles map one-to-one to the §5.5.1 failure
  * modes; DESIGN.md §2 records the correspondence.
  */
object LongTailSites {

  case class Profile(
      site: String,
      focus: String,
      nPages: Int,
      overlap: Double,
      flavor: String = "en",
      noise: NoiseSpec = NoiseSpec(),
      /** fresh-film titles collide with KB episode titles at this rate
        * (§5.5.1: topic identification wrongly matches movies to episodes).
        */
      titleCollision: Double = 0.0,
      personPages: Boolean = false,
  )

  /** Paper-shaped site profiles (subset of Table 8's 33 sites, one per
    * behaviour class; page counts are ~1/50 of the paper's).
    */
  def profiles(scale: Double): Vector[Profile] = {
    def n(x: Int) = math.max(12, (x * scale).toInt)
    Vector(
      Profile("themoviedb.org", "General film information", n(500), 0.55),
      Profile("blaxploitation.com", "Blaxploitation films", n(70), 0.45),
      Profile("danskefilm.com", "Danish films", n(120), 0.30, flavor = "da"),
      Profile("filmitalia.org", "Italian films", n(150), 0.35, flavor = "it"),
      Profile("kmdb.or.kr", "Korean films", n(100), 0.06, flavor = "ko"),
      Profile("rottentomatoes.com", "Film reviews", n(450), 0.40,
              noise = NoiseSpec(recPreds = Set("genre"))),
      Profile("nfb.ca", "Canadian films", n(260), 0.12),
      Profile("kinobox.cz", "Czech films", n(260), 0.15, flavor = "cs",
              noise = NoiseSpec(recPreds = Set("genre"))),
      Profile("dianying.com", "Chinese films", n(200), 0.20, flavor = "zh", titleCollision = 0.30),
      Profile("myanimelist.net", "Animated films", n(150), 0.25, titleCollision = 0.40,
              noise = NoiseSpec(recPreds = Set("genre"))),
      Profile("spicyonion.com", "Indian films", n(130), 0.30, personPages = true,
              noise = NoiseSpec(collapsePreds = Set("actedIn", "directorOf", "writerOf"))),
      Profile("the-numbers.com", "Financial performance", n(400), 0.50,
              noise = NoiseSpec(dateChart = Some(("releaseDate", 4)))),
      Profile("sodasandpopcorn.com", "Nigerian films", n(90), 0.20,
              noise = NoiseSpec(nonDetailFrac = 0.40, genericClasses = true)),
      Profile("christianfilmdatabase.com", "Christian films", n(110), 0.30,
              noise = NoiseSpec(supersetPreds = Map("genre" -> Verticals.MovieGenres))),
      Profile("colonialfilm.org.uk", "Colonial-era films", n(90), 0.10,
              noise = NoiseSpec(shuffleSections = true, genericClasses = true,
                                labelSynonyms = true, adInsertProb = 0.5)),
      Profile("boxofficemojo.com", "Financial performance", n(300), 0.0,
              noise = NoiseSpec(nonDetailFrac = 1.0)),
    )
  }

  case class SiteData(profile: Profile, rendered: RenderedSite)
  case class LongTail(sites: Vector[SiteData], kb: KnowledgeBase)

  private val FilmFields = Vector(
    FieldLayout("title", "Title", multi = false),
    FieldLayout("directedBy", "Director", multi = true),
    FieldLayout("writtenBy", "Writer", multi = true),
    FieldLayout("hasCastMember", "Cast", multi = true),
    FieldLayout("genre", "Genre", multi = true),
    FieldLayout("releaseDate", "Release Date", multi = false),
    FieldLayout("releaseYear", "Year", multi = false),
  )
  private val PersonFields = Vector(
    FieldLayout("name", "Name", multi = false),
    FieldLayout("alias", "Also Known As", multi = true),
    FieldLayout("actedIn", "Actor", multi = true),
    FieldLayout("directorOf", "Director", multi = true),
    FieldLayout("writerOf", "Writer", multi = true),
  )

  def build(scale: Double = 1.0, seed: Long = 66): LongTail = {
    val rng = new Random(seed)
    val gen = new NameGen(rng)

    // ---- popular world covered by the KB --------------------------------
    val nPop     = math.max(60, (400 * scale).toInt)
    val nPersons = math.max(80, (500 * scale).toInt)
    val nEpisodes = math.max(100, (900 * scale).toInt) // episodes outnumber films
    val personNames = {
      val used = collection.mutable.LinkedHashSet.empty[String]
      while (used.size < nPersons) used += gen.person()
      used.toVector
    }
    def film(id: String, name: String, r: Random, people: Vector[String]): WEntity = {
      def pick(k: Int) = Vector.fill(k)(people(r.nextInt(people.size))).distinct
      val date = new NameGen(r).date(1950, 2017)
      WEntity(id, name, "Film",
        pick(1 + r.nextInt(2)).map("directedBy" -> _) ++
        pick(1 + r.nextInt(2)).map("writtenBy" -> _) ++
        pick(4 + r.nextInt(8)).map("hasCastMember" -> _) ++
        new Random(r.nextLong()).shuffle(Verticals.MovieGenres).take(1 + r.nextInt(3)).map("genre" -> _) ++
        Vector("releaseDate" -> date, "releaseYear" -> date.take(4)))
    }
    val popFilms = {
      val used = collection.mutable.LinkedHashSet.empty[String]
      while (used.size < nPop) used += gen.filmTitle()
      used.toVector.zipWithIndex.map { case (t, i) => film(s"pf$i", t, new Random(seed + i), personNames) }
    }
    val commonEp = Vector("Pilot", "Finale", "Homecoming", "The Reunion")
    val episodes = (0 until nEpisodes).map { i =>
      val name = if (rng.nextDouble() < 0.3) commonEp(rng.nextInt(commonEp.size)) else gen.filmTitle()
      val date = gen.date(1995, 2017)
      WEntity(s"ep$i", name, "TVEpisode", Vector(
        "releaseYear" -> date.take(4),
        "episodeNumber" -> (1 + rng.nextInt(24)).toString,
        "seasonNumber" -> (1 + rng.nextInt(8)).toString,
        "genre" -> Verticals.MovieGenres(rng.nextInt(Verticals.MovieGenres.size)),
      ) ++ Vector.fill(2 + rng.nextInt(3))("hasCastMember" -> personNames(rng.nextInt(nPersons))))
    }.toVector

    // Person entities for the KB (derived from popular films).
    val popPersons = personNames.zipWithIndex.map { case (n, i) =>
      val acted = popFilms.filter(_.values("hasCastMember").contains(n)).map(_.name)
      val dir   = popFilms.filter(_.values("directedBy").contains(n)).map(_.name)
      val wrote = popFilms.filter(_.values("writtenBy").contains(n)).map(_.name)
      val parts = n.split(" ")
      WEntity(s"pp$i", n, "Person",
        acted.map("actedIn" -> _) ++ dir.map("directorOf" -> _) ++ wrote.map("writerOf" -> _) ++
        (if (i % 3 == 0) Vector("alias" -> s"${parts.head} ${parts.last.head}. ${parts.last}") else Vector.empty))
    }

    val kbTriples = (popFilms ++ episodes ++ popPersons).flatMap { e =>
      e.facts.map { case (p, v) => Triple(e.id, e.name, e.etype, p, v) }
    }
    val kb = KnowledgeBase(kbTriples)
    val episodeTitles = episodes.map(_.name).distinct

    // ---- per-site rendering ---------------------------------------------
    val sites = profiles(scale).zipWithIndex.map { case (prof, si) =>
      val srng = new Random(seed * 131 + si)
      val sgen = new NameGen(srng, prof.flavor)
      val nOverlap = (prof.nPages * prof.overlap).toInt

      val universe: Vector[WEntity] =
        if (prof.personPages) {
          val overlap = srng.shuffle(popPersons.filter(_.facts.size >= 3)).take(nOverlap)
          val localFilmPool = Vector.fill(40)(sgen.filmTitle())
          val fresh = (0 until (prof.nPages - overlap.size)).map { i =>
            def pickF(k: Int) = Vector.fill(k)(localFilmPool(srng.nextInt(localFilmPool.size))).distinct
            WEntity(s"${prof.site}-n$i", sgen.person(), "Person",
              pickF(2 + srng.nextInt(5)).map("actedIn" -> _) ++
              pickF(srng.nextInt(3)).map("directorOf" -> _) ++
              pickF(srng.nextInt(2)).map("writerOf" -> _))
          }.toVector
          srng.shuffle(overlap ++ fresh)
        } else {
          val overlap = srng.shuffle(popFilms).take(nOverlap)
          val localPeople = Vector.fill(math.max(20, prof.nPages / 3))(sgen.person())
          val fresh = (0 until (prof.nPages - overlap.size)).map { i =>
            val name =
              if (srng.nextDouble() < prof.titleCollision)
                episodeTitles(srng.nextInt(episodeTitles.size))
              else sgen.filmTitle()
            film(s"${prof.site}-n$i", name, new Random(srng.nextLong()), localPeople)
          }.toVector
          srng.shuffle(overlap ++ fresh)
        }

      val spec = SiteSpec(prof.site,
        namePred = if (prof.personPages) "name" else "title",
        fields = if (prof.personPages) PersonFields else FilmFields,
        noise = prof.noise,
        classPrefix = s"lt$si", seed = seed * 31 + si)
      val rendered = SiteRenderer.render(spec, universe,
        related = i =>
          if (universe.isEmpty) Vector.empty
          else Vector(universe((i + 5) % universe.size), universe((i + 13) % universe.size)))
      SiteData(prof, rendered)
    }

    LongTail(sites, kb)
  }
}
