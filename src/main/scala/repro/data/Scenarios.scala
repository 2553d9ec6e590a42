package repro.data

import org.apache.spark.sql.SparkSession
import repro.data.AttrKind._

/** Named scenario configurations mirroring the paper's Table 1.
  *
  * Tuple counts are scaled to laptop-bench size (see EXPERIMENTS.md §Table 1
  * for the paper-vs-ours size table); the *structural* properties the paper's
  * results hinge on are preserved per scenario: value-overlap regime (2–10 %,
  * DA ≈ 60 %), size imbalance (WA/IA/DS), schema width (IM: 15 columns),
  * match scarcity (BB/IA: < 200 matches), title ambiguity (IA), and the
  * merged brand+name pathology (BB).
  */
object Scenarios {

  /** Tiny scenario for unit tests — a few hundred rows, fast end-to-end. */
  val tiny: ScenarioConfig = ScenarioConfig(
    name = "Tiny-Test", shorthand = "TT",
    nShared = 40, nOnly1 = 80, nOnly2 = 60,
    columns = Seq(
      ColumnSpec(Title,    "title",        "name"),
      ColumnSpec(Maker,    "manufacturer", "brand"),
      ColumnSpec(Category, "type",         "genre"),
      ColumnSpec(Country,  "country",      "country_code"),
      ColumnSpec(Year,     "year",         "yr"),
    ),
    titleVocab = 150, makerVocab = 12, seed = 7L,
  )

  /** Fodors-Zagats: restaurants, small, easy (paper ER F = .99). */
  val fz: ScenarioConfig = ScenarioConfig(
    name = "Fodors-Zagats", shorthand = "FZ",
    nShared = 109, nOnly1 = 424, nOnly2 = 222,
    columns = Seq(
      ColumnSpec(Title,    "name",   "restaurant"),
      ColumnSpec(Addr,     "addr",   "address"),
      ColumnSpec(City,     "city",   "location"),
      ColumnSpec(Phone,    "phone",  "phone_no"),
      ColumnSpec(Category, "type",   "cuisine"),
      ColumnSpec(Price,    "price",  "cost"),
    ),
    titleVocab = 800, cityVocab = 30, dropTokenProb = 0.1, abbrevProb = 0.05,
    synonymProb = 0.05, nullProb = 0.01, seed = 11L,
  )

  /** Amazon-Google: products, 3 columns, noisy maker (paper ER F ≈ .59). */
  val ag: ScenarioConfig = ScenarioConfig(
    name = "Amazon-Google", shorthand = "AG",
    nShared = 580, nOnly1 = 100, nOnly2 = 1030,
    columns = Seq(
      ColumnSpec(Title, "title",        "name"),
      ColumnSpec(Maker, "manufacturer", "brand"),
      ColumnSpec(Price, "price",        "cost"),
    ),
    titleVocab = 600, makerVocab = 40, maxTitleWords = 4, titleAmbiguity = 0.6,
    dropTokenProb = 0.35, abbrevProb = 0.3, synonymProb = 0.35,
    numericNoise = true, seed = 13L,
  )

  /** Walmart-Amazon: imbalanced product pair (paper ER F ≈ .81). */
  val wa: ScenarioConfig = ScenarioConfig(
    name = "Walmart-Amazon", shorthand = "WA",
    nShared = 190, nOnly1 = 320, nOnly2 = 2400,
    columns = Seq(
      ColumnSpec(Title,    "title",    "name"),
      ColumnSpec(Maker,    "brand",    "manufacturer"),
      ColumnSpec(Category, "category", "group"),
      ColumnSpec(Price,    "price",    "cost"),
      ColumnSpec(Year,     "modelno",  "model"),
    ),
    titleVocab = 3000, makerVocab = 250, maxTitleWords = 4,
    dropTokenProb = 0.2, abbrevProb = 0.1, synonymProb = 0.25, seed = 17L,
  )

  /** iTunes-Amazon: very imbalanced, very ambiguous (paper ER F ≈ .11). */
  val ia: ScenarioConfig = ScenarioConfig(
    name = "Itunes-Amazon", shorthand = "IA",
    nShared = 131, nOnly1 = 560, nOnly2 = 2900,
    columns = Seq(
      ColumnSpec(Title,    "song",      "track"),
      ColumnSpec(Maker,    "artist",    "performer"),
      ColumnSpec(Venue,    "album",     "release"),
      ColumnSpec(Category, "genre",     "style"),
      ColumnSpec(Price,    "price",     "cost"),
      ColumnSpec(Year,     "year",      "released"),
      ColumnSpec(Language, "language",  "lang"),
      ColumnSpec(Rating,   "rating",    "stars"),
    ),
    // Tiny title vocabulary + aggressive dropout ⇒ many near-duplicate
    // non-matches, the regime where the paper's unsupervised ER collapses.
    titleVocab = 90, makerVocab = 25, maxTitleWords = 2, titleAmbiguity = 0.9,
    dropTokenProb = 0.5, abbrevProb = 0.4, synonymProb = 0.5,
    numericNoise = true, seed = 19L,
  )

  /** Fodors-Zagats-sized bibliography pair with *high* overlap (paper: 62 %). */
  val da: ScenarioConfig = ScenarioConfig(
    name = "DBLP-ACM", shorthand = "DA",
    nShared = 1100, nOnly1 = 200, nOnly2 = 40,
    columns = Seq(
      ColumnSpec(Title, "title",   "paper"),
      ColumnSpec(Maker, "authors", "writers"),
      ColumnSpec(Venue, "venue",   "booktitle"),
      ColumnSpec(Year,  "year",    "yr", in2 = false),
    ),
    titleVocab = 4000, makerVocab = 500, venueVocab = 25, maxTitleWords = 4,
    dropTokenProb = 0.02, abbrevProb = 0.02, codeProb = 0.0, nullProb = 0.005,
    seed = 23L,
  )

  /** DBLP-Scholar: large, imbalanced, dirty bibliography pair. */
  val ds: ScenarioConfig = ScenarioConfig(
    name = "DBLP-Scholar", shorthand = "DS",
    nShared = 500, nOnly1 = 110, nOnly2 = 3600,
    columns = Seq(
      ColumnSpec(Title, "title",   "name"),
      ColumnSpec(Maker, "authors", "writers"),
      ColumnSpec(Venue, "venue",   "publication"),
      ColumnSpec(Year,  "year",    "date"),
    ),
    titleVocab = 6000, makerVocab = 600, venueVocab = 100, maxTitleWords = 4,
    dropTokenProb = 0.25, abbrevProb = 0.25, synonymProb = 0.25,
    nullProb = 0.05, seed = 29L,
  )

  /** BeerAdvo-RateBeer: few matches + merged "brewery beer" names in view 1. */
  val bb: ScenarioConfig = ScenarioConfig(
    name = "BeerAdvo-RateBeer", shorthand = "BB",
    nShared = 67, nOnly1 = 2050, nOnly2 = 1400,
    columns = Seq(
      ColumnSpec(Title,    "beer_name",    "name"),
      ColumnSpec(Maker,    "brew_factory", "brewery"),
      ColumnSpec(Category, "style",        "beer_style"),
      ColumnSpec(Rating,   "abv",          "score"),
    ),
    titleVocab = 4000, makerVocab = 400, maxTitleWords = 3, titleAmbiguity = 0.25,
    mergeMakerIntoTitle1 = 0.5, dropTokenProb = 0.1, synonymProb = 0.2, seed = 31L,
  )

  /** IMDB-MovieLens: wide schema (15 columns), has the Token-Matching
    * country/language column pairs of §7.2. */
  val im: ScenarioConfig = ScenarioConfig(
    name = "IMDB-Movielens", shorthand = "IM",
    nShared = 410, nOnly1 = 2090, nOnly2 = 2480,
    columns = Seq(
      ColumnSpec(Title,    "title",      "name"),
      ColumnSpec(Maker,    "director",   "directed_by"),
      ColumnSpec(Category, "genre",      "kind"),
      ColumnSpec(Year,     "year",       "release_year"),
      ColumnSpec(Country,  "country",    "country_code"),
      ColumnSpec(Language, "language",   "lang"),
      ColumnSpec(Rating,   "rating",     "score"),
      ColumnSpec(Price,    "budget",     "gross", in2 = false),
    ),
    titleVocab = 6000, makerVocab = 800, maxTitleWords = 3,
    dropTokenProb = 0.15, abbrevProb = 0.1, codeProb = 0.9, synonymProb = 0.3,
    seed = 37L,
  )

  /** Million Songs Dataset: single relation (no integration ground truth);
    * used by the embedding-quality and timing tables only. */
  val msd: ScenarioConfig = ScenarioConfig(
    name = "Million Songs Dataset", shorthand = "MSD",
    nShared = 0, nOnly1 = 20000, nOnly2 = 0,
    columns = Seq(
      ColumnSpec(Title, "title",  "title"),
      ColumnSpec(Maker, "artist", "artist"),
      ColumnSpec(Venue, "release", "release"),
      ColumnSpec(Year,  "year",   "year"),
      ColumnSpec(Price, "duration", "duration"),
    ),
    titleVocab = 8000, makerVocab = 1500, venueVocab = 2000, maxTitleWords = 3,
    seed = 41L, singleTable = true,
  )

  /** The 8 two-dataset integration scenarios, in the paper's table order. */
  val integrationConfigs: Seq[ScenarioConfig] = Seq(im, ag, wa, ia, fz, da, ds, bb)

  /** All 9 scenarios incl. the single-table MSD. */
  val allConfigs: Seq[ScenarioConfig] = integrationConfigs :+ msd

  def byShorthand(s: String): ScenarioConfig =
    allConfigs.find(_.shorthand.equalsIgnoreCase(s))
      .orElse(if (s.equalsIgnoreCase("TT")) Some(tiny) else None)
      .getOrElse(throw new IllegalArgumentException(s"unknown scenario: $s"))

  def generate(spark: SparkSession, cfg: ScenarioConfig): Scenario =
    ScenarioGen.generate(spark, cfg)
}
