package repro.graph

import repro.{Oracle, SparkSpec}
import org.apache.spark.sql.functions._

class SocialGraphSpec extends SparkSpec {

  private val pairs = Seq((0, 1), (0, 2), (1, 2), (2, 0), (3, 2))
  private lazy val g = SocialGraph.fromPairs(4, pairs)

  test("node and edge counts") {
    assert(g.n == 4 && g.m == 5)
  }

  test("forward CSR lists out-neighbours") {
    def outs(u: Int) = (g.fwdHead(u) until g.fwdHead(u + 1)).map(g.fwdDst).toSet
    assert(outs(0) == Set(1, 2))
    assert(outs(1) == Set(2))
    assert(outs(2) == Set(0))
    assert(outs(3) == Set(2))
  }

  test("reverse CSR lists in-neighbours") {
    def ins(v: Int) = (g.revHead(v) until g.revHead(v + 1)).map(g.revSrc).toSet
    assert(ins(0) == Set(2))
    assert(ins(1) == Set(0))
    assert(ins(2) == Set(0, 1, 3))
    assert(ins(3) == Set.empty)
  }

  test("degrees match CSR") {
    assert(g.outDegree(0) == 2 && g.inDegree(2) == 3 && g.inDegree(3) == 0)
  }

  test("edge-id mapping is consistent between views") {
    // every forward-CSR position maps back to an edge with matching endpoints
    for (u <- 0 until g.n; p <- g.fwdHead(u) until g.fwdHead(u + 1)) {
      val e = g.fwdEdge(p)
      assert(g.src(e) == u && g.dst(e) == g.fwdDst(p))
    }
    for (v <- 0 until g.n; p <- g.revHead(v) until g.revHead(v + 1)) {
      val e = g.revEdge(p)
      assert(g.dst(e) == v && g.src(e) == g.revSrc(p))
    }
  }

  test("fromPairs canonicalises order: same graph from shuffled input") {
    val g2 = SocialGraph.fromPairs(4, pairs.reverse)
    assert(g2.src.sameElements(g.src) && g2.dst.sameElements(g.dst))
  }

  test("fromEdgesDf round-trips through a DataFrame") {
    val df = g.edgesDf(spark)
    val g2 = SocialGraph.fromEdgesDf(4, df)
    assert(g2.src.sameElements(g.src) && g2.dst.sameElements(g.dst))
  }

  test("in-degree computation agrees with DuckDB SQL over the edge list") {
    val df = g.edgesDf(spark)
    val sparkDeg = df.groupBy("dst").agg(count(lit(1)).as("indeg"))
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT dst, count(*) AS indeg FROM edges GROUP BY dst",
      "edges" -> df)
  }

  test("out-degree distribution agrees with DuckDB SQL") {
    val df = g.edgesDf(spark)
    val sparkDeg = df.groupBy("src").agg(count(lit(1)).as("outdeg"))
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT src, count(*) AS outdeg FROM edges GROUP BY src",
      "edges" -> df)
  }

  test("toGraphX preserves edge count and attributes") {
    val attr = Array.tabulate(g.m)(_.toDouble / 10)
    val gx = g.toGraphX(spark, attr)
    assert(gx.edges.count() == g.m)
    val sum = gx.edges.map(_.attr).sum()
    assert(math.abs(sum - attr.sum) < 1e-9)
  }

  test("empty-degree nodes are representable") {
    val iso = SocialGraph.fromPairs(3, Seq((0, 1)))
    assert(iso.inDegree(2) == 0 && iso.outDegree(2) == 0)
  }
}
