package repro.web

import scala.util.Random

/** Deterministic name generator with per-language flavours.
  *
  * Long-tail sites in the paper are multi-lingual (Czech, Danish, Icelandic,
  * Italian, Indonesian, Slovak); flavoured syllable inventories make each
  * site's non-overlapping entities look distinct, so cross-site string
  * collisions happen at a realistic (low but non-zero) rate.
  */
final class NameGen(rng: Random, flavor: String = "en") {

  private val (onsets, nuclei, codas) = flavor match {
    case "it" => (Vector("b", "c", "d", "f", "g", "l", "m", "p", "r", "s", "t", "v"),
                  Vector("a", "e", "i", "o", "u"), Vector("", "", "ne", "ra", "to", "lli"))
    case "da" => (Vector("b", "d", "h", "j", "k", "l", "m", "n", "s", "t"),
                  Vector("a", "e", "i", "o", "ø", "å"), Vector("n", "r", "s", "d", "g", ""))
    case "cs" => (Vector("b", "č", "d", "h", "j", "k", "m", "n", "p", "r", "s", "v", "z"),
                  Vector("a", "e", "i", "o", "u"), Vector("k", "l", "r", "ček", ""))
    case "ko" => (Vector("k", "j", "h", "s", "m", "b", "ch", "y"),
                  Vector("a", "ae", "i", "o", "u", "eo"), Vector("n", "ng", "m", "k", ""))
    case "zh" => (Vector("zh", "x", "l", "w", "ch", "m", "f", "h", "y"),
                  Vector("a", "i", "u", "ao", "ei", "ou"), Vector("n", "ng", ""))
    case "is" => (Vector("b", "g", "h", "k", "s", "th", "v"),
                  Vector("a", "e", "i", "o", "ö", "ú"), Vector("ur", "nn", "r", "s", ""))
    case _    => (Vector("b", "c", "d", "f", "g", "h", "k", "l", "m", "n", "p", "r", "s", "t", "w"),
                  Vector("a", "e", "i", "o", "u", "ay", "ee"), Vector("n", "r", "s", "t", "ck", "ld", ""))
  }

  private def syllable(): String =
    onsets(rng.nextInt(onsets.size)) + nuclei(rng.nextInt(nuclei.size)) + codas(rng.nextInt(codas.size))

  private def word(minSyl: Int = 2, maxSyl: Int = 3): String = {
    val n = minSyl + rng.nextInt(maxSyl - minSyl + 1)
    val w = (1 to n).map(_ => syllable()).mkString
    w.capitalize
  }

  def person(): String = s"${word()} ${word(2, 4)}"

  private val titleAdjs  = Vector("Crimson", "Silent", "Broken", "Golden", "Hidden", "Last",
                                  "Burning", "Frozen", "Distant", "Sacred", "Electric", "Paper")
  private val titleNouns = Vector("Harbor", "Garden", "River", "Winter", "Promise", "Shadow",
                                  "Empire", "Letter", "Horizon", "Journey", "Mirror", "Island")

  def filmTitle(): String = rng.nextInt(4) match {
    case 0 => s"The ${titleAdjs(rng.nextInt(titleAdjs.size))} ${titleNouns(rng.nextInt(titleNouns.size))} ${word(1, 2)}"
    case 1 => s"${titleAdjs(rng.nextInt(titleAdjs.size))} ${word(2, 3)}"
    case 2 => s"${word(2, 3)} ${titleNouns(rng.nextInt(titleNouns.size))}"
    case _ => s"${word(2, 3)} ${word(2, 3)}"
  }

  def bookTitle(): String = filmTitle()

  def seriesTitle(): String = s"${word(2, 3)} ${titleNouns(rng.nextInt(titleNouns.size))}"

  def universityName(): String = rng.nextInt(3) match {
    case 0 => s"University of ${word(2, 3)}"
    case 1 => s"${word(2, 3)} State University"
    case _ => s"${word(2, 3)} College"
  }

  def publisher(): String = s"${word(2, 3)} ${Vector("Press", "Books", "House", "Publishing")(rng.nextInt(4))}"

  def phone(): String = f"(${200 + rng.nextInt(700)}%03d) ${200 + rng.nextInt(700)}%03d-${rng.nextInt(10000)}%04d"

  def website(): String = s"www.${word(2, 3).toLowerCase}.edu"

  def isbn13(): String = f"978-${rng.nextInt(10)}%d-${rng.nextInt(100000)}%05d-${rng.nextInt(1000)}%03d-${rng.nextInt(10)}%d"

  def date(minYear: Int = 1960, maxYear: Int = 2017): String = {
    val y = minYear + rng.nextInt(maxYear - minYear + 1)
    val m = 1 + rng.nextInt(12)
    val d = 1 + rng.nextInt(28)
    f"$y%04d-$m%02d-$d%02d"
  }

  def year(minYear: Int = 1960, maxYear: Int = 2017): String =
    (minYear + rng.nextInt(maxYear - minYear + 1)).toString
}
