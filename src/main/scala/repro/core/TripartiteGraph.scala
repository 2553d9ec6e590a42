package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Node-name conventions of the tripartite graph. */
object NodeNames {
  val RidPrefix = "idx__"
  val CidPrefix = "cid__"

  def rid(r: Long): String = s"$RidPrefix$r"
  /** CIDs are qualified per dataset: the two relations have *different*
    * attributes (that is what schema matching must discover), so `title` in
    * dataset 1 and `name` in dataset 2 get distinct CID nodes. */
  def cid(dataset: Int, column: String): String = s"$CidPrefix${dataset}__$column"

  def isRid(n: String): Boolean = n.startsWith(RidPrefix)
  def isCid(n: String): Boolean = n.startsWith(CidPrefix)
  def isToken(n: String): Boolean = !isRid(n) && !isCid(n)

  def ridValue(n: String): Long = n.stripPrefix(RidPrefix).toLong
}

/** Tripartite graph construction (Algorithm 1 / §4.1) as DataFrame
  * transformations.
  *
  * Input datasets carry a `__rid` long column with *globally unique* row ids
  * (the scenario generator assigns `[0, n1)` to dataset 1 and `[n1, n1+n2)`
  * to dataset 2). Every cell contributes, per token produced by the
  * tokenization strategy, one token↔RID edge and one token↔CID edge. NULL
  * cells contribute nothing (the §5.2 default "Skip" policy; FD-based
  * skolemization is applied upstream by [[NullHandling]]).
  */
object TripartiteGraph {

  /** Undirected edge list: columns `src`, `dst` (node names), deduplicated.
    * Only the (token → rid) and (token → cid) direction is materialised;
    * [[CompactGraph]] symmetrizes. */
  def edges(spark: SparkSession, datasets: Seq[DataFrame],
            strategy: Tokenization.Strategy, sigFigs: Int = 4): DataFrame = {
    import spark.implicits._
    val perDataset = datasets.zipWithIndex.map { case (df, i) =>
      val dsIdx = i + 1
      val dataCols = df.columns.filterNot(_ == "__rid").toSeq
      // Melt to (rid, column, value) then explode into token edges.
      val melted: DataFrame = dataCols.map { c =>
        df.select($"__rid".cast("long").as("rid"), lit(c).as("col"),
                  col(c).cast("string").as("value"))
      }.reduce(_ union _)
      melted
        .as[(Long, String, String)]
        .flatMap { case (rid, colName, value) =>
          Tokenization.tokens(value, strategy, sigFigs).flatMap { tok =>
            Seq((tok, NodeNames.rid(rid)), (tok, NodeNames.cid(dsIdx, colName)))
          }
        }
        .toDF("src", "dst")
    }
    perDataset.reduce(_ union _).distinct()
  }

  /** Node list with types: columns `name`, `ntype` ∈ {token, rid, cid}. */
  def nodes(spark: SparkSession, edgeDf: DataFrame): DataFrame = {
    import spark.implicits._
    edgeDf.select($"src".as("name"))
      .union(edgeDf.select($"dst".as("name")))
      .distinct()
      .withColumn("ntype",
        when(col("name").startsWith(NodeNames.RidPrefix), "rid")
          .when(col("name").startsWith(NodeNames.CidPrefix), "cid")
          .otherwise("token"))
  }

  /** Summary statistics used by Table 1 and the corpus-size rule. */
  final case class Stats(nTokens: Long, nRids: Long, nCids: Long, nEdges: Long)

  def stats(spark: SparkSession, edgeDf: DataFrame): Stats = {
    val n = nodes(spark, edgeDf).groupBy("ntype").count()
      .collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    Stats(n.getOrElse("token", 0L), n.getOrElse("rid", 0L), n.getOrElse("cid", 0L),
          edgeDf.count())
  }
}
