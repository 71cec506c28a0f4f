package repro.data

/** Balance category of a CCER dataset (paper §6, QE(4)):
  * Balanced (most entities of both sides matched), One-sided (most of
  * one side matched), Scarce (few of either side matched).
  */
sealed trait Category { def code: String }
case object Balanced extends Category { val code = "BLC" }
case object OneSided extends Category { val code = "OSD" }
case object Scarce extends Category { val code = "SCR" }

/** Kind of synthetic attribute value. */
sealed trait AttrKind
case object WordsAttr extends AttrKind    // pseudo-word phrase (name/title)
case object PersonsAttr extends AttrKind  // list of person names (authors)
case object PhoneAttr extends AttrKind    // digit string
case object ModelNoAttr extends AttrKind  // alphanumeric model number
case object YearAttr extends AttrKind     // 4-digit year
case object PriceAttr extends AttrKind    // decimal price
case object CategoryAttr extends AttrKind // small closed domain

/** One attribute of a dataset.
  *
  * @param name      column name
  * @param kind      value generator kind
  * @param words     phrase length range for word-based kinds
  * @param missRate1 probability the value is missing in V1 profiles
  * @param missRate2 probability the value is missing in V2 profiles
  */
final case class AttrSpec(
    name: String,
    kind: AttrKind,
    words: (Int, Int) = (3, 6),
    missRate1: Double = 0.0,
    missRate2: Double = 0.0,
)

/** Noise applied when rendering a profile from its world entity.
  *
  * @param typoRate     per-token probability of a character-level typo
  * @param dropRate     per-token probability of dropping the token
  * @param extraRate    per-value probability of appending extra tokens
  * @param misplaceRate probability of appending another attribute's
  *                     value into the first word attribute (the paper's
  *                     "misplaced attribute values", D4/D9)
  * @param digitTypos   number of corrupted digits in digit attributes
  */
final case class NoiseSpec(
    typoRate: Double,
    dropRate: Double = 0.0,
    extraRate: Double = 0.0,
    misplaceRate: Double = 0.0,
    digitTypos: Int = 0,
)

/** Synthetic analogue of one of the paper's ten datasets. Sizes are the
  * REPRO_SCALE=1.0 values; the generator scales them linearly.
  */
final case class DatasetSpec(
    id: String,
    source1: String,
    source2: String,
    n1: Int,
    n2: Int,
    dups: Int,
    category: Category,
    attrs: Seq[AttrSpec],
    keyAttrs: Seq[String],
    noise: NoiseSpec,
    vocabSize: Int,
    seed: Long,
)

object DatasetSpec {

  /** The ten dataset analogues. Collection-size ratios, duplicate
    * portions (hence BLC/OSD/SCR categories), schemas and noise profiles
    * mirror the paper's Table 2 datasets; absolute sizes are scaled so
    * each Cartesian product stays below ~0.8M pairs (see DESIGN.md).
    */
  val all: Seq[DatasetSpec] = Seq(
    // D1: restaurants (OAEI 2010). Scarce; clean names + phones.
    DatasetSpec(
      "D1", "Rest.1", "Rest.2", n1 = 339, n2 = 2256, dups = 89, category = Scarce,
      attrs = Seq(
        AttrSpec("name", WordsAttr, words = (2, 4)),
        AttrSpec("phone", PhoneAttr),
        AttrSpec("addr", WordsAttr, words = (3, 5), missRate1 = 0.1, missRate2 = 0.1),
        AttrSpec("rtype", CategoryAttr),
      ),
      keyAttrs = Seq("name", "phone"),
      noise = NoiseSpec(typoRate = 0.10, dropRate = 0.08, digitTypos = 1),
      vocabSize = 400, seed = 101L,
    ),
    // D2: Abt-Buy products. Balanced (every entity matched); noisy names.
    DatasetSpec(
      "D2", "Abt", "Buy", n1 = 760, n2 = 760, dups = 760, category = Balanced,
      attrs = Seq(
        AttrSpec("name", WordsAttr, words = (3, 6)),
        AttrSpec("description", WordsAttr, words = (8, 14), missRate1 = 0.15, missRate2 = 0.35),
        AttrSpec("price", PriceAttr, missRate1 = 0.3, missRate2 = 0.2),
      ),
      keyAttrs = Seq("name"),
      noise = NoiseSpec(typoRate = 0.15, dropRate = 0.20, extraRate = 0.25),
      vocabSize = 300, seed = 102L,
    ),
    // D3: Amazon-GoogleProducts. One-sided; noisy titles with extras.
    DatasetSpec(
      "D3", "Amazon", "Google Pr.", n1 = 480, n2 = 1080, dups = 390, category = OneSided,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (4, 8)),
        AttrSpec("manufacturer", CategoryAttr, missRate1 = 0.1, missRate2 = 0.45),
        AttrSpec("price", PriceAttr, missRate1 = 0.2, missRate2 = 0.3),
      ),
      keyAttrs = Seq("title"),
      noise = NoiseSpec(typoRate = 0.15, dropRate = 0.25, extraRate = 0.35),
      vocabSize = 280, seed = 103L,
    ),
    // D4: DBLP-ACM publications. Balanced; clean, but misplaced values.
    DatasetSpec(
      "D4", "DBLP", "ACM", n1 = 800, n2 = 700, dups = 680, category = Balanced,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (6, 10)),
        AttrSpec("authors", PersonsAttr, words = (2, 4)),
        AttrSpec("venue", CategoryAttr),
        AttrSpec("year", YearAttr),
      ),
      keyAttrs = Seq("title", "authors"),
      noise = NoiseSpec(typoRate = 0.05, dropRate = 0.04, misplaceRate = 0.25),
      vocabSize = 600, seed = 104L,
    ),
    // D5: IMDb-TMDb movies. Scarce; many missing values.
    DatasetSpec(
      "D5", "IMDb", "TMDb", n1 = 640, n2 = 760, dups = 246, category = Scarce,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (2, 5)),
        AttrSpec("modelno", ModelNoAttr, missRate1 = 0.25, missRate2 = 0.35),
        AttrSpec("year", YearAttr, missRate1 = 0.2, missRate2 = 0.3),
        AttrSpec("director", PersonsAttr, words = (1, 1), missRate1 = 0.35, missRate2 = 0.5),
        AttrSpec("genre", CategoryAttr, missRate1 = 0.2, missRate2 = 0.2),
      ),
      keyAttrs = Seq("modelno", "title"),
      noise = NoiseSpec(typoRate = 0.12, dropRate = 0.15),
      vocabSize = 350, seed = 105L,
    ),
    // D6: IMDb-TVDB. Scarce; noisier than D5 (more missing + typos).
    DatasetSpec(
      "D6", "IMDb", "TVDB", n1 = 600, n2 = 915, dups = 126, category = Scarce,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (2, 5)),
        AttrSpec("authors", PersonsAttr, words = (1, 2), missRate1 = 0.4, missRate2 = 0.55),
        AttrSpec("year", YearAttr, missRate1 = 0.3, missRate2 = 0.4),
        AttrSpec("genre", CategoryAttr, missRate1 = 0.25, missRate2 = 0.35),
      ),
      keyAttrs = Seq("title", "authors"),
      noise = NoiseSpec(typoRate = 0.16, dropRate = 0.20),
      vocabSize = 280, seed = 106L,
    ),
    // D7: TMDb-TVDB. Scarce; same noise family as D5/D6.
    DatasetSpec(
      "D7", "TMDb", "TVDB", n1 = 660, n2 = 850, dups = 119, category = Scarce,
      attrs = Seq(
        AttrSpec("name", WordsAttr, words = (2, 4)),
        AttrSpec("title", WordsAttr, words = (2, 5), missRate1 = 0.25, missRate2 = 0.35),
        AttrSpec("year", YearAttr, missRate1 = 0.3, missRate2 = 0.35),
        AttrSpec("genre", CategoryAttr, missRate1 = 0.2, missRate2 = 0.3),
      ),
      keyAttrs = Seq("name", "title"),
      noise = NoiseSpec(typoRate = 0.14, dropRate = 0.18),
      vocabSize = 300, seed = 107L,
    ),
    // D8: Walmart-Amazon. Scarce and very noisy; small shared brand
    // vocabulary makes non-duplicates confusable (paper: F1 < 0.5).
    DatasetSpec(
      "D8", "Walmart", "Amazon", n1 = 260, n2 = 2250, dups = 87, category = Scarce,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (5, 10)),
        AttrSpec("name", WordsAttr, words = (2, 4), missRate1 = 0.2, missRate2 = 0.3),
        AttrSpec("modelno", ModelNoAttr, missRate1 = 0.3, missRate2 = 0.45),
        AttrSpec("price", PriceAttr, missRate1 = 0.2, missRate2 = 0.25),
      ),
      keyAttrs = Seq("title", "name"),
      noise = NoiseSpec(typoRate = 0.18, dropRate = 0.30, extraRate = 0.40),
      vocabSize = 160, seed = 108L,
    ),
    // D9: DBLP-Scholar. One-sided with a huge V2; misplaced values.
    DatasetSpec(
      "D9", "DBLP", "Scholar", n1 = 150, n2 = 3650, dups = 137, category = OneSided,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (6, 10)),
        AttrSpec("abstract", WordsAttr, words = (10, 18), missRate1 = 0.2, missRate2 = 0.45),
        AttrSpec("authors", PersonsAttr, words = (2, 4), missRate1 = 0.05, missRate2 = 0.25),
        AttrSpec("venue", CategoryAttr, missRate1 = 0.1, missRate2 = 0.4),
      ),
      keyAttrs = Seq("title", "abstract"),
      noise = NoiseSpec(typoRate = 0.08, dropRate = 0.08, misplaceRate = 0.30),
      vocabSize = 700, seed = 109L,
    ),
    // D10: IMDb-DBpedia movies. Balanced-ish; highest portion of missing
    // values, confusable titles (paper: F1 < 0.6).
    DatasetSpec(
      "D10", "IMDb", "DBpedia", n1 = 850, n2 = 714, dups = 650, category = Balanced,
      attrs = Seq(
        AttrSpec("title", WordsAttr, words = (2, 4)),
        AttrSpec("authors", PersonsAttr, words = (1, 2), missRate1 = 0.45, missRate2 = 0.6),
        AttrSpec("year", YearAttr, missRate1 = 0.4, missRate2 = 0.55),
        AttrSpec("genre", CategoryAttr, missRate1 = 0.35, missRate2 = 0.5),
      ),
      keyAttrs = Seq("title"),
      noise = NoiseSpec(typoRate = 0.15, dropRate = 0.25),
      vocabSize = 180, seed = 110L,
    ),
  )

  /** Lookup by id ("D1" … "D10"). */
  def byId(id: String): DatasetSpec =
    all.find(_.id == id).getOrElse(throw new IllegalArgumentException(s"unknown dataset $id"))

  /** Scale a spec's sizes linearly (duplicates included, min 2). */
  def scaled(spec: DatasetSpec, scale: Double): DatasetSpec = {
    require(scale > 0, "scale must be positive")
    def s(x: Int): Int = math.max(2, math.round(x * scale).toInt)
    val n1 = s(spec.n1); val n2 = s(spec.n2)
    spec.copy(n1 = n1, n2 = n2, dups = math.min(math.min(n1, n2), s(spec.dups)))
  }
}
