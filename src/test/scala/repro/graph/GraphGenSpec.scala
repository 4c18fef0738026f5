package repro.graph

import repro.{Oracle, SparkSpec}
import org.apache.spark.sql.functions._

class GraphGenSpec extends SparkSpec {

  test("dataset specs carry the paper's Table 1 identities") {
    val names = GraphGen.AllDatasets.map(_.name)
    assert(names == Seq("lastfm-lite", "flixster-lite", "dblp-lite", "livejournal-lite"))
    assert(GraphGen.Dblp.paperType == "undirected")
    assert(GraphGen.LiveJournal.paperEdges == "69M")
  }

  test("lastfm-lite has the paper's full scale (1.3K nodes, ~14.7K arcs)") {
    val g = GraphGen.graph(spark, GraphGen.Lastfm)
    assert(g.n == 1300)
    assert(g.m > 10000 && g.m < 16000, s"m=${g.m}")
  }

  test("flixster-lite lands near its target arc count") {
    val g = GraphGen.graph(spark, GraphGen.Flixster)
    assert(g.n == 3000)
    assert(g.m > 30000 && g.m < 47000, s"m=${g.m}")
  }

  test("no self-loops in generated graphs") {
    val g = GraphGen.graph(spark, GraphGen.Lastfm)
    assert((0 until g.m).forall(e => g.src(e) != g.dst(e)))
  }

  test("no duplicate arcs in generated graphs") {
    val g = GraphGen.graph(spark, GraphGen.Lastfm)
    val set = (0 until g.m).map(e => (g.src(e), g.dst(e))).toSet
    assert(set.size == g.m)
  }

  test("generation is deterministic: same seed, same edge set") {
    val df1 = GraphGen.edgesDf(spark, GraphGen.Lastfm).collect().map(r => (r.getInt(0), r.getInt(1))).toSet
    val df2 = GraphGen.edgesDf(spark, GraphGen.Lastfm).collect().map(r => (r.getInt(0), r.getInt(1))).toSet
    assert(df1 == df2)
  }

  test("dblp-lite is symmetric (undirected as two arcs)") {
    val g = GraphGen.graph(spark, GraphGen.Dblp)
    val set = (0 until g.m).map(e => (g.src(e), g.dst(e))).toSet
    assert(set.forall { case (a, b) => set((b, a)) })
    assert(g.m % 2 == 0)
  }

  test("degree distribution is heavy-tailed: top 1% of nodes hold >10% of out-edges") {
    val g = GraphGen.graph(spark, GraphGen.Flixster)
    val degs = (0 until g.n).map(g.outDegree).sorted.reverse
    val top = degs.take(g.n / 100).map(_.toLong).sum
    assert(top.toDouble / g.m > 0.10, s"top1% share=${top.toDouble / g.m}")
  }

  test("edge endpoints are in range") {
    val g = GraphGen.graph(spark, GraphGen.Lastfm)
    assert((0 until g.m).forall(e =>
      g.src(e) >= 0 && g.src(e) < g.n && g.dst(e) >= 0 && g.dst(e) < g.n))
  }

  test("arc count via DataFrame aggregation matches DuckDB") {
    val df = GraphGen.edgesDf(spark, GraphGen.Lastfm)
    val agg = df.agg(count(lit(1)).as("m"))
    Oracle.assertEquivalent(agg, "SELECT count(*) AS m FROM edges", "edges" -> df)
  }

  test("distinct node count via DataFrame matches DuckDB") {
    val df = GraphGen.edgesDf(spark, GraphGen.Lastfm)
    val agg = df.select(explode(array(col("src"), col("dst"))).as("v"))
      .agg(countDistinct(col("v")).as("nodes"))
    Oracle.assertEquivalent(agg,
      "SELECT count(DISTINCT v) AS nodes FROM (SELECT src AS v FROM edges UNION ALL SELECT dst FROM edges)",
      "edges" -> df)
  }

  test("livejournal-lite scale (generation only — used by scalability substrate)") {
    val spec = GraphGen.LiveJournal
    assert(spec.n == 40000 && spec.targetArcs == 575000)
  }
}
