package repro.data

/** Generation profile for one Clean-Clean ER dataset.
  *
  * Size columns reproduce Table 2(a); the noise knobs encode the qualitative
  * character the paper uses to explain per-dataset results (D1 misplaced
  * values, D2 long text + 1-1 matching, D3 very long product descriptions,
  * D4/D9 bibliographic, D10 noisy and sparse).
  *
  * @param titleTokens   tokens in the first ("title") attribute
  * @param otherTokens   mean tokens per non-title attribute
  * @param typoRate      per-token probability of a character-level edit in a copy
  * @param variantRate   per-token probability of switching surface variant
  * @param dropRate      per-token probability of dropping the token in a copy
  * @param missRate      per-attribute probability of an empty value
  * @param misplaceRate  per-record probability of rotating attribute values
  * @param vocab         number of distinct meanings in the dataset vocabulary
  */
final case class CleanProfile(
    name: String,
    src1: String, src2: String,
    v1: Int, v2: Int,
    a1: Int, a2: Int,
    dups: Int,
    titleTokens: Int,
    otherTokens: Double,
    typoRate: Double,
    variantRate: Double,
    dropRate: Double,
    missRate: Double,
    misplaceRate: Double,
    vocab: Int,
) {
  require(dups <= math.min(v1, v2), s"$name: dups $dups exceeds min(v1,v2)")

  def scaled(s: Double): CleanProfile = {
    def f(n: Int) = math.max(2, math.ceil(n * s).toInt)
    val d = math.max(1, math.ceil(dups * s).toInt)
    copy(v1 = math.max(f(v1), d), v2 = math.max(f(v2), d), dups = d)
  }
}

/** The ten profiles of Table 2(a), in the paper's order. */
object DatasetProfiles {

  val D1 = CleanProfile("D1", "Rest1", "Rest2", 339, 2256, 7, 7, 89,
    titleTokens = 2, otherTokens = 0.25, typoRate = 0.06, variantRate = 0.10,
    dropRate = 0.05, missRate = 0.40, misplaceRate = 0.25, vocab = 1200)

  val D2 = CleanProfile("D2", "Abt", "Buy", 1076, 1076, 3, 3, 1076,
    titleTokens = 5, otherTokens = 11.0, typoRate = 0.08, variantRate = 0.15,
    dropRate = 0.30, missRate = 0.05, misplaceRate = 0.0, vocab = 2500)

  val D3 = CleanProfile("D3", "Amz", "GPr", 1354, 3039, 4, 4, 1104,
    titleTokens = 8, otherTokens = 35.0, typoRate = 0.03, variantRate = 0.08,
    dropRate = 0.25, missRate = 0.05, misplaceRate = 0.0, vocab = 6000)

  val D4 = CleanProfile("D4", "DBLP", "ACM", 2616, 2294, 4, 4, 2224,
    titleTokens = 9, otherTokens = 3.5, typoRate = 0.01, variantRate = 0.03,
    dropRate = 0.02, missRate = 0.02, misplaceRate = 0.0, vocab = 8000)

  val D5 = CleanProfile("D5", "IMDb", "TMDb", 5118, 6056, 13, 30, 1968,
    titleTokens = 3, otherTokens = 0.9, typoRate = 0.04, variantRate = 0.10,
    dropRate = 0.08, missRate = 0.25, misplaceRate = 0.02, vocab = 9000)

  val D6 = CleanProfile("D6", "IMDb", "TVDB", 5118, 7810, 13, 9, 1072,
    titleTokens = 3, otherTokens = 0.9, typoRate = 0.05, variantRate = 0.12,
    dropRate = 0.10, missRate = 0.25, misplaceRate = 0.02, vocab = 9000)

  val D7 = CleanProfile("D7", "TMDb", "TVDB", 6056, 7810, 30, 9, 1095,
    titleTokens = 3, otherTokens = 1.0, typoRate = 0.04, variantRate = 0.10,
    dropRate = 0.08, missRate = 0.20, misplaceRate = 0.02, vocab = 10000)

  val D8 = CleanProfile("D8", "Wmt", "Amz", 2554, 22074, 6, 6, 853,
    titleTokens = 6, otherTokens = 2.2, typoRate = 0.06, variantRate = 0.12,
    dropRate = 0.10, missRate = 0.15, misplaceRate = 0.02, vocab = 16000)

  val D9 = CleanProfile("D9", "DBLP", "Scholar", 2516, 61353, 4, 4, 2308,
    titleTokens = 9, otherTokens = 3.0, typoRate = 0.05, variantRate = 0.10,
    dropRate = 0.15, missRate = 0.15, misplaceRate = 0.02, vocab = 20000)

  val D10 = CleanProfile("D10", "IMDb", "DBP", 27615, 23182, 4, 7, 22863,
    titleTokens = 2, otherTokens = 1.2, typoRate = 0.10, variantRate = 0.15,
    dropRate = 0.20, missRate = 0.35, misplaceRate = 0.05, vocab = 15000)

  val all: Seq[CleanProfile] = Seq(D1, D2, D3, D4, D5, D6, D7, D8, D9, D10)

  val byName: Map[String, CleanProfile] = all.map(p => p.name -> p).toMap

  def apply(name: String): CleanProfile =
    byName.getOrElse(name, throw new NoSuchElementException(s"unknown dataset $name"))

  /** Bench scale for effectiveness/timing experiments (DESIGN.md §5). */
  def benchScale: Double = sys.env.getOrElse("REPRO_SCALE", "0.2").toDouble
}
