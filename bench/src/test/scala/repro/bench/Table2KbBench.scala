package repro.bench

import repro.SparkSpec
import repro.exp.TableFmt

/** Table 2: composition of the movie seed KB (paper: Person 7.67M/15,
  * Film 0.43M/19, TV Episode 1.09M/18 at 85M triples; ours is the same
  * shape at synthetic scale — episodes outnumber films, persons dominate).
  */
class Table2KbBench extends SparkSpec {

  private lazy val kb = BenchRuns.imdb.imdb.kb

  test("Table 2: KB composition by entity type") {
    val rows = kb.triples.groupBy(_.subjectType).toVector.sortBy(_._1).map { case (t, ts) =>
      Vector(t, ts.map(_.subjectId).distinct.size.toString, ts.map(_.predicate).distinct.size.toString)
    }
    println(TableFmt.render("Table 2: seed KB composition",
      Vector("Entity Type", "#Instances", "#Predicates"), rows))
    assert(rows.map(_.head).toSet == Set("Person", "Film", "TVEpisode"))
  }
  test("episodes outnumber films in the KB (over-represented type)") {
    val byType = kb.typeOf.values.groupBy(identity).view.mapValues(_.size).toMap
    assert(byType("TVEpisode") > byType("Film"))
  }
  test("KB has multiple predicates per entity type") {
    val personPreds = kb.triples.filter(_.subjectType == "Person").map(_.predicate).distinct
    assert(personPreds.size >= 4, s"personPreds=$personPreds")
  }
}
