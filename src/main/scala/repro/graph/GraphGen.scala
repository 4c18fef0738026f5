package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic social-network generation (DataFrame API).
  *
  * The paper evaluates on Flixster / LastFM / DBLP / LiveJournal. Those
  * datasets (and the action logs used to learn TIC probabilities) are not
  * available offline, so we generate heavy-tailed directed graphs of
  * comparable *relative* structure at reduced scale — see DESIGN.md §3 for
  * the substitution argument. Generation is deterministic in `seed` because
  * `spark.range` is pinned to a fixed partition count and edges are
  * de-duplicated into a canonical set.
  */
object GraphGen {

  /** A synthetic stand-in for one of the paper's datasets.
    *
    * @param name        dataset-lite name
    * @param n           number of nodes
    * @param targetArcs  requested number of directed arcs before dedup
    *                    (the realised count is slightly lower and printed in
    *                    the Table 1 bench)
    * @param zipfAlpha   skew of the degree distribution
    * @param undirected  DBLP is undirected: each generated pair is emitted in
    *                    both directions
    * @param paperNodes/paperEdges/paperType  the original dataset's stats,
    *                    reported next to ours in Table 1
    */
  final case class DatasetSpec(
      name: String,
      n: Int,
      targetArcs: Int,
      zipfAlpha: Double,
      undirected: Boolean,
      seed: Long,
      paperNodes: String,
      paperEdges: String,
      paperType: String,
  )

  /** lastfm-lite keeps the original LastFM scale (it is tiny). */
  val Lastfm: DatasetSpec =
    DatasetSpec("lastfm-lite", 1300, 14700, 0.85, undirected = false, seed = 11L,
      paperNodes = "1.3K", paperEdges = "14.7K", paperType = "directed")

  /** flixster-lite is Flixster scaled ~10x down (30K/425K -> 3K/42.5K). */
  val Flixster: DatasetSpec =
    DatasetSpec("flixster-lite", 3000, 42500, 0.9, undirected = false, seed = 12L,
      paperNodes = "30K", paperEdges = "425K", paperType = "directed")

  /** dblp-lite is DBLP scaled ~30x down (317K/1.05M -> 10K/33K undirected pairs). */
  val Dblp: DatasetSpec =
    DatasetSpec("dblp-lite", 10000, 33000, 0.8, undirected = true, seed = 13L,
      paperNodes = "317K", paperEdges = "1.05M", paperType = "undirected")

  /** livejournal-lite is LiveJournal scaled ~120x down (4.8M/69M -> 40K/575K). */
  val LiveJournal: DatasetSpec =
    DatasetSpec("livejournal-lite", 40000, 575000, 0.9, undirected = false, seed = 14L,
      paperNodes = "4.8M", paperEdges = "69M", paperType = "directed")

  val AllDatasets: Seq[DatasetSpec] = Seq(Lastfm, Flixster, Dblp, LiveJournal)

  /** Zipf-ranked key column in `[0, nKeys)` via inverse-CDF over `1/k^alpha`.
    * Rank 0 is the heaviest node.
    */
  private def zipfCol(randCol: org.apache.spark.sql.Column, nKeys: Int, alpha: Double) = {
    // Continuous approximation of the inverse CDF of a zipf(alpha) rank
    // distribution on [1, nKeys]: k ~ ((1-u) + u*nKeys^(1-alpha))^(1/(1-alpha)).
    val oneMinus = 1.0 - alpha
    val top = math.pow(nKeys.toDouble, oneMinus)
    least(
      lit(nKeys - 1),
      greatest(
        lit(0),
        (pow(lit(1.0) - randCol + randCol * top, lit(1.0 / oneMinus)) - 1.0)
          .cast(IntegerType)))
  }

  /** Generate the raw candidate-edge DataFrame for `spec` (may contain a few
    * duplicates/self-loops; `edgesDf` cleans them).
    */
  private def candidates(spark: SparkSession, spec: DatasetSpec): DataFrame = {
    // Oversample by 30% so the deduplicated count lands near targetArcs.
    val raw = (spec.targetArcs * 1.3).toLong
    val base = spark.range(0, raw, 1, 64)
    // src and dst both zipf-skewed; dst ranks are decorrelated from src ranks
    // by a deterministic affine permutation so hubs differ between the two.
    val prime = 479001599L % spec.n
    base.select(
      zipfCol(rand(spec.seed), spec.n, spec.zipfAlpha).as("srcRank"),
      zipfCol(rand(spec.seed + 1), spec.n, spec.zipfAlpha).as("dstRank"))
      .select(
        col("srcRank").cast(IntegerType).as("src"),
        ((col("dstRank").cast(LongType) * prime + 7L) % spec.n).cast(IntegerType).as("dst"))
  }

  /** The cleaned, deterministic edge set of `spec` as a DataFrame (src, dst). */
  def edgesDf(spark: SparkSession, spec: DatasetSpec): DataFrame = {
    val uniq = candidates(spark, spec)
      .where(col("src") =!= col("dst"))
      .distinct()
    if (!spec.undirected) uniq
    else {
      // canonicalise to u<v then emit both directions
      val und = uniq
        .select(least(col("src"), col("dst")).as("a"), greatest(col("src"), col("dst")).as("b"))
        .distinct()
      und.select(col("a").as("src"), col("b").as("dst"))
        .unionAll(und.select(col("b").as("src"), col("a").as("dst")))
    }
  }

  private val cache = scala.collection.concurrent.TrieMap.empty[String, SocialGraph]

  /** Materialised `SocialGraph` for `spec` (cached per JVM — generation is
    * deterministic so the cache is sound).
    */
  def graph(spark: SparkSession, spec: DatasetSpec): SocialGraph =
    cache.getOrElseUpdate(spec.name, SocialGraph.fromEdgesDf(spec.n, edgesDf(spark, spec)))
}
