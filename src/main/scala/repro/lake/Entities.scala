package repro.lake

import scala.util.Random

/** Deterministic entity-string generators — the vocabulary of the
  * synthetic data lakes that replace the paper's OPEN / WDC corpora.
  *
  * Four domain types mirror the paper's examples (Table I: names, hosts,
  * addresses; Section VI-C: neighborhoods, company names). Every generator
  * is a pure function of an RNG, and domains are seeded deterministically,
  * so lakes are reproducible run to run.
  */
object Entities {

  sealed trait DomainType
  object DomainType {
    case object Person       extends DomainType
    case object Street       extends DomainType
    case object Company      extends DomainType
    case object Neighborhood extends DomainType
    val all: Vector[DomainType] = Vector(Person, Street, Company, Neighborhood)
  }

  private val consonants = "bcdfghjklmnprstvw"
  private val vowels = "aeiou"

  private def syllable(rng: Random): String =
    s"${consonants(rng.nextInt(consonants.length))}${vowels(rng.nextInt(vowels.length))}"

  private def word(rng: Random, minSyl: Int, maxSyl: Int): String = {
    val n = minSyl + rng.nextInt(maxSyl - minSyl + 1)
    val w = (1 to n).map(_ => syllable(rng)).mkString
    w.capitalize
  }

  def person(rng: Random): String = s"${word(rng, 1, 2)} ${word(rng, 2, 3)}"

  private val directions = Vector("East", "West", "North", "South")
  private val streetTypes = Vector("Street", "Avenue", "Road", "Boulevard")

  def street(rng: Random): String = {
    val num  = 100 + rng.nextInt(900)
    val dir  = directions(rng.nextInt(directions.length))
    val ord  = 1 + rng.nextInt(30)
    val ordSuffix = ord % 10 match {
      case 1 if ord != 11 => "st"
      case 2 if ord != 12 => "nd"
      case 3 if ord != 13 => "rd"
      case _              => "th"
    }
    val stype = streetTypes(rng.nextInt(streetTypes.length))
    val unit  = s"${1 + rng.nextInt(20)}${('A' + rng.nextInt(6)).toChar}"
    s"$num $dir $ord$ordSuffix $stype, $unit"
  }

  private val companySuffixes = Vector("Incorporated", "Corporation", "Company", "Limited", "Group")

  def company(rng: Random): String =
    s"${word(rng, 2, 3)} ${word(rng, 1, 2)} ${companySuffixes(rng.nextInt(companySuffixes.length))}"

  private val hoodSuffixes = Vector("Hill", "Park", "Dale", "Wood", "Vale", "Port", "Side", "Gate")

  def neighborhood(rng: Random): String =
    s"${word(rng, 2, 3)} ${hoodSuffixes(rng.nextInt(hoodSuffixes.length))}"

  def generate(tpe: DomainType, rng: Random): String = tpe match {
    case DomainType.Person       => person(rng)
    case DomainType.Street       => street(rng)
    case DomainType.Company      => company(rng)
    case DomainType.Neighborhood => neighborhood(rng)
  }

  /** A pool of distinct entities of one type. */
  def pool(tpe: DomainType, size: Int, seed: Long): IndexedSeq[String] = {
    val rng = new Random(seed)
    val out = scala.collection.mutable.LinkedHashSet.empty[String]
    var guard = 0
    while (out.size < size && guard < size * 100) {
      out += generate(tpe, rng)
      guard += 1
    }
    out.toIndexedSeq
  }

  // ---------------------------------------------------------------------
  // Dirtying channel: the heterogeneity PEXESO exists to overcome.
  // ---------------------------------------------------------------------

  private val abbreviate: Map[String, String] = Map(
    "Street" -> "St.", "Avenue" -> "Ave.", "Road" -> "Rd.", "Boulevard" -> "Blvd.",
    "East" -> "E.", "West" -> "W.", "North" -> "N.", "South" -> "S.",
    "Incorporated" -> "Inc.", "Corporation" -> "Corp.", "Company" -> "Co.", "Limited" -> "Ltd.",
  )

  /** One random dirty transform: misspelling, abbreviation, case change,
    * or (for comma'd values) part reordering — the formats of Table I.
    */
  def dirty(s: String, rng: Random): String = rng.nextInt(4) match {
    case 0 => misspell(s, rng)
    case 1 => // abbreviate any known full forms
      val out = s.split(" ").map(t => abbreviate.getOrElse(t.stripSuffix(","), t) +
        (if (t.endsWith(",") && !abbreviate.contains(t.stripSuffix(","))) "," else "")).mkString(" ")
      if (out == s) misspell(s, rng) else out
    case 2 => // case change
      if (rng.nextBoolean()) s.toUpperCase else s.toLowerCase
    case 3 => // reorder comma-separated parts ("4E, 414 East 10th St.")
      val parts = s.split(",\\s*")
      if (parts.length > 1) parts.reverse.mkString(", ") else misspell(s, rng)
  }

  /** Single-character perturbation (swap / delete / duplicate / replace). */
  def misspell(s: String, rng: Random): String = {
    if (s.length < 3) return s
    val i = 1 + rng.nextInt(s.length - 2)
    rng.nextInt(4) match {
      case 0 => s.substring(0, i) + s.charAt(i + 1) + s.charAt(i) + s.substring(i + 2) // swap
      case 1 => s.substring(0, i) + s.substring(i + 1)                                 // delete
      case 2 => s.substring(0, i) + s.charAt(i) + s.substring(i)                       // duplicate
      case 3 => s.substring(0, i) + vowels(rng.nextInt(vowels.length)) + s.substring(i + 1) // replace
    }
  }

  /** Apply the channel: with probability `noise`, emit a dirty variant. */
  def channel(s: String, noise: Double, rng: Random): String =
    if (rng.nextDouble() < noise) dirty(s, rng) else s

  // ---------------------------------------------------------------------
  // Column styles: whole tables differ systematically in representation
  // (paper Section I: "heterogeneous tables may have different
  // representations") — one table abbreviates every address, another
  // upper-cases everything, a third is typo-ridden.
  // ---------------------------------------------------------------------

  sealed trait Style
  object Style {
    case object Clean    extends Style
    case object Abbrev   extends Style
    case object Upper    extends Style
    case object Reformat extends Style
    /** Per-record misspelling with the given probability. */
    final case class Misspell(prob: Double) extends Style
    /** Deterministic semantic decoration, e.g. "Castle Hill / Unionport"
      * (the paper's Section VI-C example of format heterogeneity).
      */
    case object Decorate extends Style
  }

  /** Draw a column style; `misspellProb` parameterizes the Misspell style.
    * Weights keep a majority of clean tables, as in real lakes.
    */
  def pickStyle(rng: Random, misspellProb: Double): Style = {
    val r = rng.nextDouble()
    if (r < 0.55) Style.Clean
    else if (r < 0.66) Style.Abbrev
    else if (r < 0.77) Style.Upper
    else if (r < 0.88) Style.Reformat
    else Style.Misspell(misspellProb)
  }

  /** Render an entity in a column's style. Deterministic styles (Abbrev,
    * Upper, Reformat) transform every record identically; Misspell is
    * per-record probabilistic.
    */
  def applyStyle(s: String, style: Style, rng: Random): String = style match {
    case Style.Clean  => s
    case Style.Upper  => s.toUpperCase
    case Style.Abbrev =>
      s.split(" ").map { t =>
        val bare = t.stripSuffix(",")
        val ab = abbreviate.getOrElse(bare, bare)
        if (t.endsWith(",")) ab + "," else ab
      }.mkString(" ")
    case Style.Reformat =>
      val parts = s.split(",\\s*")
      if (parts.length > 1) parts.reverse.mkString(", ")
      else { // lastname-first style reorder for non-comma values
        val ws = s.split(" ")
        if (ws.length > 1) (ws.tail :+ ws.head).mkString(" ") else s
      }
    case Style.Misspell(p) =>
      if (rng.nextDouble() < p) misspell(s, rng) else s
    case Style.Decorate =>
      // deterministic per-entity tag word
      val tagRng = new Random(s.hashCode.toLong)
      s"$s / ${word(tagRng, 2, 3)}"
  }
}
