package repro.web

import org.scalatest.funsuite.AnyFunSuite

class ImdbWorldSpec extends AnyFunSuite {

  private lazy val imdb = ImdbWorld.build(nFilms = 40, nEpisodes = 50, nPersons = 80,
    nPersonPages = 30, nTitlePages = 50, seed = 55)

  test("site merges person and title pages") {
    assert(imdb.site.pages.exists(_.pageId.startsWith("nm-")))
    assert(imdb.site.pages.exists(p => !p.pageId.startsWith("nm-")))
  }
  test("person pages use a different template than title pages") {
    val person = imdb.site.pages.find(_.pageId.startsWith("nm-")).get
    val title  = imdb.site.pages.find(p => !p.pageId.startsWith("nm-")).get
    val pCls = person.nodes.flatMap(_.attrs.get("class")).toSet
    val tCls = title.nodes.flatMap(_.attrs.get("class")).toSet
    assert(pCls.exists(_.startsWith("nm-")) && tCls.exists(_.startsWith("tt-")))
  }
  test("episodes share titles (Pilot ambiguity)") {
    val pilots = imdb.titles.filter(_.name == "Pilot")
    assert(pilots.size >= 2)
  }
  test("episode pages assert episode/season/series") {
    val epTruth = imdb.site.truth.filter(_.predicate == "seasonNumber")
    assert(epTruth.nonEmpty)
  }
  test("overlapping roles: some director also writes") {
    assert(imdb.titles.exists { t =>
      val d = t.values("directedBy").toSet
      t.values("writtenBy").exists(d)
    })
  }
  test("KB cast coverage is biased low (~16%)") {
    val worldCast = imdb.titles.map(_.values("hasCastMember").size).sum
    val kbCast    = imdb.kb.triples.count(_.predicate == "hasCastMember")
    val frac = kbCast.toDouble / worldCast
    assert(frac > 0.05 && frac < 0.30, s"frac=$frac")
  }
  test("KB genre coverage is higher than cast coverage") {
    val worldGenre = imdb.titles.map(_.values("genre").size).sum
    val kbGenre    = imdb.kb.triples.count(_.predicate == "genre")
    val gFrac = kbGenre.toDouble / worldGenre
    val worldCast = imdb.titles.map(_.values("hasCastMember").size).sum
    val cFrac = imdb.kb.triples.count(_.predicate == "hasCastMember").toDouble / worldCast
    assert(gFrac > cFrac)
  }
  test("KB cast facts correspond to featured presentation") {
    imdb.kb.triples.filter(_.predicate == "hasCastMember").take(50).foreach { t =>
      assert(Featured(t.subjectId, "hasCastMember", t.obj))
    }
  }
  test("person pages carry Known For strips") {
    val person = imdb.site.pages.filter(_.pageId.startsWith("nm-"))
    assert(person.exists(_.nodes.exists(_.attrs.get("class").contains("kf-i"))))
  }
  test("known-for strip items are not asserted facts at that location") {
    val p = imdb.site.pages.filter(_.pageId.startsWith("nm-"))
      .find(_.nodes.exists(_.attrs.get("class").contains("kf-i"))).get
    val kfPaths = p.nodes.filter(_.attrs.get("class").contains("kf-i")).map(_.xpath).toSet
    assert(imdb.site.truth.filter(_.pageId == p.pageId).forall(t => !kfPaths(t.xpath)))
  }
  test("deterministic build") {
    val again = ImdbWorld.build(nFilms = 40, nEpisodes = 50, nPersons = 80,
      nPersonPages = 30, nTitlePages = 50, seed = 55)
    assert(again.kb.triples == imdb.kb.triples)
    assert(again.site.pages.size == imdb.site.pages.size)
  }
}
