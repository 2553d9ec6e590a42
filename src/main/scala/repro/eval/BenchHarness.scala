package repro.eval

import org.apache.spark.sql.SparkSession
import repro.baselines._
import repro.core._
import repro.data.{AttrKind, Scenario, Scenarios}
import repro.integration._

/** Shared machinery behind the per-table bench suites and the
  * `jobs/Table*Job` spark-submit entrypoints: one lazily-trained bundle of
  * scenario + models per dataset shorthand, plus the row computations for
  * each table of §7. All parameters come from [[Bench.Params]]; seeds are
  * fixed so repeated runs agree.
  */
object Bench {

  final case class Params(
      corpusFactor: Long = sys.env.get("BENCH_CORPUS_FACTOR").map(_.toLong).getOrElse(100L),
      dim: Int = sys.env.get("BENCH_DIM").map(_.toInt).getOrElse(64),
      walkLength: Int = 60,
      window: Int = 3,
      // MLlib Word2Vec merges per-partition deltas; quality degrades with
      // more partitions, so default to 1 (the corpus is small enough).
      w2vPartitions: Int = sys.env.get("BENCH_W2V_PARTITIONS").map(_.toInt).getOrElse(1),
      w2vIters: Int = sys.env.get("BENCH_W2V_ITERS").map(_.toInt).getOrElse(1),
      /** word2vec min_count. Together with overlap-start walks this prunes
        * RIDs that never co-occur with a bridge token — the implicit
        * blocking behind the paper's high ER precision (§5.1). */
      minCount: Int = sys.env.get("BENCH_MINCOUNT").map(_.toInt).getOrElse(2),
      nTop: Int = 10,
      seed: Long = 2020L,
  )

  val params: Params = Params()

  def w2v(p: Params = params): EmbeddingTrainer.W2VConfig =
    EmbeddingTrainer.W2VConfig(dim = p.dim, window = p.window, minCount = p.minCount,
      maxIter = p.w2vIters, numPartitions = p.w2vPartitions, seed = p.seed)

  /** Default EmbDI configuration. For two-dataset scenarios the §5.1
    * imbalance heuristic is on (as in the paper's default): walks start only
    * from tokens occurring in both datasets and each sentence opens with a
    * RID or CID connected to that bridge token. */
  def embdiConfig(strategy: Tokenization.Strategy, p: Params = params,
                  overlapStart: Option[Set[String]] = None): EmbDI.Config =
    EmbDI.Config(
      strategy = strategy,
      walk = RandomWalker.WalkConfig(
        walkLength = p.walkLength, seed = p.seed,
        startStrategy = overlapStart match {
          case Some(shared) if shared.nonEmpty => RandomWalker.OverlapTokens(shared)
          case _ => RandomWalker.AllNodes
        },
        firstStepOrCid = overlapStart.exists(_.nonEmpty)),
      w2v = w2v(p),
      corpusFactor = p.corpusFactor,
    )

  /** All models for one scenario, trained on demand and cached. */
  final class Bundle(val spark: SparkSession, val scenario: Scenario) {
    private val cfg = scenario.config
    def datasets = if (cfg.singleTable) Seq(scenario.d1) else Seq(scenario.d1, scenario.d2)

    lazy val shared: Set[String] =
      if (cfg.singleTable) Set.empty
      else Tokenization.sharedValues(spark, scenario.d1, scenario.d2)

    /** Word-level shared tokens (bridge set under Flatten tokenization). */
    lazy val sharedWords: Set[String] =
      if (cfg.singleTable) Set.empty
      else Tokenization.sharedTokens(spark, scenario.d1, scenario.d2, Tokenization.Flatten)

    /** The default EmbDI configuration (EmbDI-O tokenization, §5.1
      * overlap-start on for dataset pairs). */
    lazy val embdiO: EmbDI.Result =
      EmbDI.run(spark, datasets, embdiConfig(Tokenization.Overlap(shared),
        overlapStart = if (cfg.singleTable) None else Some(shared ++ sharedWords)))
    lazy val embdiS: EmbDI.Result =
      EmbDI.run(spark, datasets, embdiConfig(Tokenization.Simple,
        overlapStart = if (cfg.singleTable) None else Some(shared)))
    lazy val embdiF: EmbDI.Result =
      EmbDI.run(spark, datasets, embdiConfig(Tokenization.Flatten,
        overlapStart = if (cfg.singleTable) None else Some(sharedWords)))

    private lazy val corpusTokens: Long =
      RandomWalker.corpusTokensRule(embdiO.nDistinctValues,
        datasets.map(_.count()).sum, params.corpusFactor)

    lazy val basic: EmbeddingModel =
      BasicEmbeddings.train(spark, datasets, BasicEmbeddings.Config(
        corpusTokens = corpusTokens, strategy = Tokenization.Overlap(shared),
        w2v = w2v(), seed = params.seed))

    lazy val node2vec: Node2VecEmbeddings.Result =
      Node2VecEmbeddings.train(spark, embdiO.graph, Node2VecEmbeddings.Config(
        Node2VecWalker.N2VConfig(walkLength = params.walkLength,
          corpusTokens = corpusTokens, seed = params.seed),
        w2v()))

    lazy val harp: Harp.Result =
      Harp.train(spark, embdiO.graph, Harp.Config(
        levels = 2, corpusTokens = corpusTokens, walkLength = params.walkLength,
        w2v = w2v(), seed = params.seed))

    lazy val pretrained: EmbeddingModel =
      PretrainedEmbeddings.forDatasets(datasets, Tokenization.Overlap(shared), params.dim)

    def ridRange1: (Long, Long) = (0L, scenario.nRows1)
    def ridRange2: (Long, Long) = (scenario.nRows1, scenario.nRows1 + scenario.nRows2)
    lazy val groundTruth: Set[(Long, Long)] =
      scenario.rowMatches.collect().map(r => (r.getLong(0), r.getLong(1))).toSet
  }

  private val cache = scala.collection.mutable.Map.empty[String, Bundle]

  def bundle(spark: SparkSession, shorthand: String): Bundle = synchronized {
    cache.getOrElseUpdate(shorthand.toUpperCase,
      new Bundle(spark, Scenarios.generate(spark, Scenarios.byShorthand(shorthand))))
  }

  // ----------------------------------------------------------------- Table 1

  final case class Table1Row(shorthand: String, tuples: Long, columns: Int,
                             distinctValues: Long, matches: Long, sentences: Long,
                             overlapPct: Double) {
    def render: String =
      f"$shorthand%-4s ${tuples}%8d ${columns}%4d ${distinctValues}%9d " +
      f"${matches}%8d ${sentences}%10d ${overlapPct}%7.2f"
  }

  def table1Row(spark: SparkSession, shorthand: String): Table1Row = {
    val b = bundle(spark, shorthand)
    val sc = b.scenario
    val distinct = b.embdiO.nDistinctValues
    val overlap =
      if (sc.config.singleTable) Double.NaN
      else b.shared.size.toDouble / distinct * 100.0
    // #columns = distinct attributes overall (aligned pairs counted once).
    val nCols =
      if (sc.config.singleTable) sc.columns1.size
      else sc.columns1.size + sc.columns2.size - sc.colMatches.size
    Table1Row(shorthand, sc.nRows1 + sc.nRows2, nCols,
      distinct, sc.rowMatches.count(), b.embdiO.nSentences, overlap)
  }

  // ----------------------------------------------------------------- Table 2

  final case class QualityScores(ma: Double, mr: Double, mc: Double) {
    def avg: Double = (ma + mr + mc) / 3
    def render: String = f"MA=$ma%.2f MR=$mr%.2f MC=$mc%.2f AVG=$avg%.2f"
  }

  /** MA/MR/MC test sets for a scenario under its default (Overlap)
    * tokenization, shared by all methods for fairness. */
  def qualityTests(spark: SparkSession, shorthand: String, nPerKind: Int = 300)
      : Map[String, Seq[QualityTests.QTest]] = {
    val b = bundle(spark, shorthand)
    val strat = Tokenization.Overlap(b.shared)
    val data = b.datasets.map(QualityTests.tokenize(_, strat))
    val cfg = b.scenario.config
    val oneCols = cfg.columns.filter(_.kind == AttrKind.Maker)
      .flatMap(c => Seq(c.nameIn1, c.nameIn2)).toSet
    val manyCols = cfg.columns.filter(_.kind == AttrKind.Title)
      .flatMap(c => Seq(c.nameIn1, c.nameIn2)).toSet
    Map(
      "MA" -> QualityTests.matchAttribute(data, nPerKind, params.seed + 1),
      "MR" -> QualityTests.matchRow(data, nPerKind, params.seed + 2),
      "MC" -> QualityTests.matchConcept(data, oneCols, manyCols, strat, nPerKind, params.seed + 3),
    )
  }

  def scoreQuality(model: EmbeddingModel,
                   tests: Map[String, Seq[QualityTests.QTest]]): QualityScores =
    QualityScores(
      QualityTests.evaluate(model, tests("MA"), 11L),
      QualityTests.evaluate(model, tests("MR"), 12L),
      QualityTests.evaluate(model, tests("MC"), 13L))

  // ----------------------------------------------------------------- Table 3

  /** Schema-matching F for one method's embeddings via Algorithm 5. */
  def smScore(spark: SparkSession, b: Bundle, model: EmbeddingModel): PRF = {
    val got = SchemaMatcher.toColumnPairs(SchemaMatcher.matchCids(model,
      b.scenario.columns1.map(NodeNames.cid(1, _)),
      b.scenario.columns2.map(NodeNames.cid(2, _)))).toSet
    Metrics.prf(got, b.scenario.colMatches.toSet)
  }

  def smBase(spark: SparkSession, b: Bundle): PRF =
    Metrics.prf(SchemaMatcher.matchBase(spark, b.scenario.d1, b.scenario.d2).toSet,
      b.scenario.colMatches.toSet)

  def smSeepP(b: Bundle): PRF =
    Metrics.prf(Seep.runPretrained(b.scenario.d1, b.scenario.d2).toSet,
      b.scenario.colMatches.toSet)

  def smSeepL(b: Bundle): PRF =
    Metrics.prf(Seep.runLocal(b.scenario.d1, b.scenario.d2, b.embdiO.model,
      Tokenization.Overlap(b.shared)).toSet,
      b.scenario.colMatches.toSet)

  // ----------------------------------------------------------------- Table 4

  /** Unsupervised ER F via Algorithm 6. Protocol: the query side is the set
    * of D1 rows that have a ground-truth match ("we assume that no matches
    * for Ri are present in D1" — unmatched rows are not queried), candidates
    * are all of D2; mutual matching with n_top lists. This is the only
    * protocol consistent with the paper's P/R ranges on benchmarks where
    * >90% of rows are unmatched (e.g. BB: P=.93 at n_top=1). */
  def erScore(spark: SparkSession, b: Bundle, model: EmbeddingModel,
              nTop: Int = params.nTop): PRF = {
    val queryRids = b.groundTruth.map(_._1).toSeq.sorted.map(NodeNames.rid)
      .filter(model.contains)
    val targets = EntityResolver.ridsIn(model, b.ridRange2._1, b.ridRange2._2)
    val pairs = EntityResolver.matchRids(spark, model, queryRids, targets, nTop)
      .map { case (a, c) => (NodeNames.ridValue(a), NodeNames.ridValue(c)) }
    Metrics.prf(pairs.toSet, b.groundTruth)
  }

  def deepEr(spark: SparkSession, b: Bundle, model: EmbeddingModel,
             strategy: Tokenization.Strategy, tuned: Boolean,
             labelFraction: Double = 0.05): PRF =
    DeepER.run(spark, b.scenario.d1, b.scenario.d2, b.scenario.colMatches, model,
      strategy, b.groundTruth,
      DeepER.Config(labelFraction = labelFraction, tuned = tuned, seed = params.seed),
      candidatePairs = Some(b.scenario.candidates))

  // ----------------------------------------------------------------- Table 6

  final case class TimingRow(shorthand: String, graphMs: Long, walkMs: Long,
                             trainMs: Long, n2vMs: Long, harpMs: Long) {
    def render: String =
      f"$shorthand%-4s G=${graphMs / 1000.0}%7.1f W=${walkMs / 1000.0}%7.1f " +
      f"E=${trainMs / 1000.0}%7.1f W+E=${(walkMs + trainMs) / 1000.0}%7.1f " +
      f"N2V=${n2vMs / 1000.0}%8.1f HARP=${harpMs / 1000.0}%8.1f"
  }

  def timingRow(spark: SparkSession, shorthand: String): TimingRow = {
    val b = bundle(spark, shorthand)
    val t = b.embdiO.timings
    TimingRow(shorthand, t.graphMs, t.walkMs, t.trainMs,
      b.node2vec.walkMs + b.node2vec.trainMs,
      b.harp.walkMs + b.harp.trainMs)
  }
}
