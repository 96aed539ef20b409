package repro.kb

/** One KB fact (s, r, o) as defined in §2.1.
  *
  * Subjects are entities with a stable id, a display name, and a type from
  * the ontology (Person, Film, TVEpisode, …); objects are string values —
  * either names of other entities or literals (dates, phone numbers).  The
  * paper's extraction target is string-valued too (§2.1: "the subject and
  * object of each triple is a string value on a page").
  */
case class Triple(
    subjectId: String,
    subjectName: String,
    subjectType: String,
    predicate: String,
    obj: String,
)
