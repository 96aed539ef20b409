package repro.util

import java.text.Normalizer

/** Text normalisation used for entity mention matching.
  *
  * The paper matches page text fields against the KB with fuzzy string
  * matching [Gulhane et al. 2010]; our substitute (documented in DESIGN.md §2)
  * is normalised exact matching: lower-case, accent folding, punctuation and
  * whitespace collapsing. The synthetic sites emit entity names verbatim, so
  * this plays the same role while keeping matching deterministic.
  */
object Normalize {

  /** Canonical form of a text field for KB matching. */
  def apply(s: String): String = {
    val folded = Normalizer
      .normalize(s, Normalizer.Form.NFD)
      .replaceAll("\\p{M}+", "")
    // Letters NFD cannot decompose (no combining form).
    val translit = folded
      .replace('ø', 'o').replace('Ø', 'O')
      .replace('æ', 'a').replace('Æ', 'A')
      .replace('ð', 'd').replace('Ð', 'D')
      .replace('þ', 't').replace('Þ', 'T')
      .replace('ł', 'l').replace('Ł', 'L')
      .replace("ß", "ss")
    translit.toLowerCase
      .replaceAll("[^a-z0-9 ]+", " ")
      .replaceAll("\\s+", " ")
      .trim
  }

  /** True for strings the paper discards as topic candidates for having low
    * information content: empty strings, bare numbers (incl. years), and very
    * short tokens. Country names are handled by the uniqueness filter since
    * our KB stores them as frequent object values.
    */
  def lowInformation(s: String): Boolean = {
    val n = apply(s)
    n.isEmpty || n.length <= 2 || n.matches("[0-9 ]+")
  }
}
