package repro.web

/** Layout of one predicate's section on a site's detail-page template. */
case class FieldLayout(pred: String, label: String, multi: Boolean)

/** A predicate-free sidebar strip (§5.4: "Known For", "Projects in
  * Development", talk-show appearance lists).  It shows up to `take` object
  * names drawn from `preds` of the topic entity, mixed with `extraN` random
  * strings from `extraFrom` — none of which the page asserts as facts.
  * These are the sections that make CERES-Topic's annotate-every-mention
  * strategy fail.
  */
case class StripSpec(
    title: String,
    cls: String,
    preds: Set[String],
    take: Int = 4,
    extraFrom: Vector[String] = Vector.empty,
    extraN: Int = 0,
)

/** The renderer's noise model.  Each knob reproduces a concrete phenomenon
  * the paper reports, cited next to the field.
  */
case class NoiseSpec(
    /** §2.1: pages may be missing fields. */
    missingFieldProb: Double = 0.08,
    /** §2.1 / Fig. 2: ad blocks shift sibling indices between pages. */
    adInsertProb: Double = 0.25,
    /** Fig. 1: recommendation sidebars show related entities' values of
      * these predicates (e.g. genres of a recommended movie).
      */
    recPreds: Set[String] = Set.empty,
    /** §5.4: predicate-free sidebar strips ("Known For", "Projects in
      * Development", …).
      */
    strips: Vector[StripSpec] = Vector.empty,
    /** §5.4 footnote 10: values of these predicates render in two lists —
      * a "featured" list (with e.g. character info on IMDb) and a plain
      * remainder — and the seed-KB bias correlates with the featured list.
      * Membership is decided by [[Featured]], shared with KB construction.
      */
    splitPreds: Set[String] = Set.empty,
    /** §5.3: constant values on every page (the University search-box bug). */
    searchBoxValues: Seq[String] = Nil,
    /** §5.5.1 semantic ambiguity: every page renders this fixed superset of
      * values for the predicate (christianfilmdatabase's all-genres list).
      */
    supersetPreds: Map[String, Vector[String]] = Map.empty,
    /** §5.5.1 semantic ambiguity: these predicates are rendered as a single
      * merged section without role distinction (spicyonion's filmography).
      */
    collapsePreds: Set[String] = Set.empty,
    /** §5.5.1 the-numbers: a chart of dates containing the true value of
      * this predicate plus `n` incidental dates per page.
      */
    dateChart: Option[(String, Int)] = None,
    /** §5.5.1 template variety: section order is shuffled per page. */
    shuffleSections: Boolean = false,
    /** Generic class names (`row`/`lbl`/`v`) instead of per-predicate
      * classes, so structure alone cannot identify the predicate.
      */
    genericClasses: Boolean = false,
    /** §5.5.1 template variety: the label string varies between pages, so
      * text features are weak.
      */
    labelSynonyms: Boolean = false,
    /** §3.2: some predicates' values are asserted a second time in a less
      * consistent sidebar location (duplicated credits).
      */
    dupPreds: Set[String] = Set.empty,
    /** §5.5.1: fraction of pages that are non-detail chart pages
      * (sodasandpopcorn, boxofficemojo).
      */
    nonDetailFrac: Double = 0.0,
    /** Boilerplate strings on every page; "Help" may collide with KB names. */
    footerStrings: Seq[String] = Seq("Help", "Contact Us", "About"),
)

/** Deterministic "featured" flag shared by the renderer (which list a value
  * lands in) and KB construction (which facts the biased seed KB retains) —
  * the §5.4 correlation between KB coverage and page presentation.
  */
object Featured {
  def apply(entityId: String, pred: String, value: String, rate: Int = 65): Boolean =
    math.floorMod(scala.util.hashing.MurmurHash3.stringHash(s"$entityId|$pred|$value"), 100) < rate
}

/** Full specification of one synthetic semi-structured website. */
case class SiteSpec(
    site: String,
    /** Predicate asserted by the page-title node (the "name" relation, §4). */
    namePred: String,
    fields: Vector[FieldLayout],
    noise: NoiseSpec = NoiseSpec(),
    /** Per-site class-name prefix, so different sites have different markup. */
    classPrefix: String = "s",
    seed: Long = 0,
)
