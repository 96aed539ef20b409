package repro.web

import org.scalatest.funsuite.AnyFunSuite

import repro.util.Normalize

class VerticalsSpec extends AnyFunSuite {

  private lazy val movie = Verticals.movie(nSites = 3, pagesPerSite = 30, seed = 11)
  private lazy val nba   = Verticals.nbaplayer(nSites = 3, pagesPerSite = 25, seed = 22)
  private lazy val univ  = Verticals.university(nSites = 3, pagesPerSite = 25, seed = 33)
  private lazy val book  = Verticals.book(nSites = 3, pagesPerSite = 30, seed = 44)

  test("movie: sites and pages") {
    assert(movie.sites.size == 3)
    movie.sites.foreach(s => assert(s.pages.size == 30))
  }
  test("movie: KB lacks mpaa (paper: no seed data for MPAA rating)") {
    assert(!movie.kb.predicates.contains("mpaa"))
    assert(movie.kb.predicates == Set("director", "genre"))
  }
  test("movie: pages assert mpaa even though KB lacks it") {
    assert(movie.sites.head.truth.exists(_.predicate == "mpaa"))
  }
  test("movie: KB overlap is high") {
    val kbNames = movie.kb.entitiesByName.keySet
    val frac = movie.sites(1).topics.count(t => kbNames(Normalize(t.entityName))).toDouble /
      movie.sites(1).topics.size
    assert(frac > 0.75, s"frac=$frac")
  }
  test("movie: 'Help' film exists for the uniqueness-filter scenario") {
    assert(movie.kb.entitiesByName.contains("help") ||
      movie.sites.exists(_.topics.exists(_.entityName == "Help")))
  }
  test("nba: KB equals first-site truth predicates") {
    assert(nba.kb.predicates == Set("team", "height", "weight"))
  }
  test("nba: KB subjects are site-0 players") {
    val site0Names = nba.sites.head.topics.map(t => Normalize(t.entityName)).toSet
    assert(nba.kb.entitiesByName.keySet.subsetOf(site0Names))
  }
  test("university: site 2 carries the search-box noise") {
    val site2 = univ.sites(2)
    assert(site2.pages.forall(p => p.textNodes.exists(_.text == "Public")))
  }
  test("university: type values are frequent KB values (not topic candidates)") {
    assert(univ.kb.frequentValues.contains("public") || univ.kb.frequentValues.contains("private"))
  }
  test("book: low overlap between KB site and others") {
    val kbNames = book.kb.entitiesByName.keySet
    val site2   = book.sites(2)
    val overlap = site2.topics.count(t => kbNames(Normalize(t.entityName)))
    assert(overlap >= 1 && overlap <= site2.topics.size / 4, s"overlap=$overlap")
  }
  test("book: all five predicates asserted") {
    assert(book.sites.head.truth.map(_.predicate).toSet ==
      Set("title", "author", "publisher", "pubdate", "isbn13"))
  }
  test("every vertical: truth values exist on their pages") {
    Seq(movie, nba, univ, book).foreach { vd =>
      val site = vd.sites.head
      val page = site.pages.head
      val vals = page.textNodes.map(_.text).toSet
      site.truth.filter(_.pageId == page.pageId).foreach(t => assert(vals(t.value)))
    }
  }
  test("generation is deterministic") {
    val a = Verticals.movie(nSites = 2, pagesPerSite = 10, seed = 99)
    val b = Verticals.movie(nSites = 2, pagesPerSite = 10, seed = 99)
    assert(a.sites.map(_.pages) == b.sites.map(_.pages))
    assert(a.kb.triples == b.kb.triples)
  }
}
