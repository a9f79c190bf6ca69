package repro.embed

/** Deterministic character-n-gram hashing embedder.
  *
  * Offline stand-in for the paper's pretrained fastText / GloVe models
  * (Section II-A treats the embedding model as a plug-in). Each word and
  * each padded character trigram hashes to a pseudo-random unit direction
  * (seeded by the feature hash — no RNG state is kept), and the string's
  * embedding is the L2-normalized sum of its feature directions.
  *
  * Properties the paper relies on and this embedder preserves:
  *   - misspellings / abbreviation expansions / re-formattings share most
  *     n-grams, so they land at small Euclidean distance;
  *   - unrelated strings share few features, so they are near-orthogonal
  *     (distance close to √2 ≈ 70% of the max distance 2);
  *   - outputs are unit vectors, so τ can be specified as a percentage of
  *     the maximum distance 2 (Section V).
  *
  * @param dim  embedding dimensionality (paper: 300 for fastText, 50 for GloVe)
  * @param seed global hash seed, for reproducibility across runs
  */
final class HashingEmbedder(val dim: Int, val seed: Long = 0x9E3779B9L) extends Serializable {
  require(dim > 0, "dim must be positive")

  import HashingEmbedder._

  /** Embed a raw string value to a unit vector in R^dim. */
  def embed(s: String): Array[Double] = {
    val acc = new Array[Double](dim)
    val canon = canonicalize(s)
    val words = tokenize(canon)
    words.foreach { w =>
      addFeature(acc, hashFeature(w, WordSalt))
      ngrams(w, 3).foreach(g => addFeature(acc, hashFeature(g, TrigramSalt)))
    }
    VectorOps.normalize(acc)
  }

  /** Embed a whole column of values. */
  def embedAll(values: Seq[String]): Array[Array[Double]] =
    values.iterator.map(embed).toArray

  private def hashFeature(f: String, salt: Long): Long = {
    // 64-bit FNV-1a over UTF-16 code units, mixed with the salt + seed.
    var h = 0xCBF29CE484222325L ^ salt ^ seed
    var i = 0
    while (i < f.length) { h ^= f.charAt(i).toLong; h *= 0x100000001B3L; i += 1 }
    h
  }

  /** Accumulate the pseudo-random ±1 direction of feature `h` into acc. */
  private def addFeature(acc: Array[Double], h: Long): Unit = {
    var x = h
    var i = 0
    while (i < dim) {
      x = splitmix64(x)
      // one ±1 Rademacher component per dimension — unit direction up to scale
      acc(i) += (if ((x & 1L) == 0L) 1.0 else -1.0)
      i += 1
    }
  }
}

object HashingEmbedder {
  private val WordSalt    = 0x5DEECE66DL
  private val TrigramSalt = 0x2545F4914F6CDD1DL

  /** Abbreviation expansion applied before embedding (paper Section II-A:
    * "we first convert abbreviations to their full forms").
    */
  val Abbreviations: Map[String, String] = Map(
    "st"   -> "street",   "st."  -> "street",
    "ave"  -> "avenue",   "ave." -> "avenue",
    "rd"   -> "road",     "rd."  -> "road",
    "blvd" -> "boulevard","blvd."-> "boulevard",
    "e"    -> "east",     "e."   -> "east",
    "w"    -> "west",     "w."   -> "west",
    "n"    -> "north",    "n."   -> "north",
    "s"    -> "south",    "s."   -> "south",
    "jan"  -> "january",  "feb"  -> "february", "mar" -> "march",
    "apr"  -> "april",    "jun"  -> "june",     "jul" -> "july",
    "aug"  -> "august",   "sep"  -> "september","sept"-> "september",
    "oct"  -> "october",  "nov"  -> "november", "dec" -> "december",
    "inc"  -> "incorporated", "inc." -> "incorporated",
    "corp" -> "corporation",  "corp."-> "corporation",
    "co"   -> "company",      "co."  -> "company",
    "ltd"  -> "limited",      "ltd." -> "limited",
    "apt"  -> "apartment",    "apt." -> "apartment",
  )

  /** Lowercase and expand known abbreviations token-wise. */
  def canonicalize(s: String): String =
    s.toLowerCase
      .split("[\\s,]+")
      .iterator
      .filter(_.nonEmpty)
      .map(t => Abbreviations.getOrElse(t, t))
      .mkString(" ")

  /** Split a canonical string into word tokens (alphanumeric runs). */
  def tokenize(s: String): Seq[String] = {
    val out = Vector.newBuilder[String]
    val sb  = new StringBuilder
    var i = 0
    while (i <= s.length) {
      val isWordChar = i < s.length && (s.charAt(i).isLetterOrDigit)
      if (isWordChar) sb.append(s.charAt(i))
      else if (sb.nonEmpty) { out += sb.result(); sb.clear() }
      i += 1
    }
    out.result()
  }

  /** Padded character n-grams of a word, fastText-style (`^word$`). */
  def ngrams(word: String, n: Int): Seq[String] = {
    val padded = "^" + word + "$"
    if (padded.length <= n) Seq(padded)
    else (0 to padded.length - n).map(i => padded.substring(i, i + n))
  }

  /** SplitMix64 mixer — deterministic stream from a feature hash. */
  def splitmix64(state: Long): Long = {
    var z = state + 0x9E3779B97F4A7C15L
    z = (z ^ (z >>> 30)) * 0xBF58476D1CE4E5B9L
    z = (z ^ (z >>> 27)) * 0x94D049BB133111EBL
    z ^ (z >>> 31)
  }
}
