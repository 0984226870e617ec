package repro.graph

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

/** DataFrame graph operators, cross-checked against DuckDB SQL over the
  * same inputs via the Oracle (wrong joins/aggregations cannot hide
  * behind "it ran").
  */
class GraphOpsSpec extends SparkSpec {

  private lazy val toy = GraphGen.toyFig2
  private lazy val edgeDf = GraphGen.toEdgeDf(spark, toy).cache()

  test("toEdgeDf: one row per undirected edge, src < dst") {
    val rows = edgeDf.collect()
    assert(rows.length == toy.m)
    rows.foreach(r => assert(r.getInt(0) < r.getInt(1)))
  }

  test("CsrGraph roundtrip through DataFrame") {
    val back = CsrGraph.fromEdgeDf(toy.n, edgeDf)
    assert(back.neighbors.toSeq == toy.neighbors.toSeq)
    assert(back.offsets.toSeq == toy.offsets.toSeq)
  }

  test("symmetrize doubles the rows and contains both directions") {
    val sym = GraphOps.symmetrize(edgeDf)
    assert(sym.count() == 2 * toy.m)
    val asSet = sym.collect().map(r => (r.getInt(0), r.getInt(1))).toSet
    toy.undirectedEdges.foreach { case (u, v) =>
      assert(asSet((u, v)) && asSet((v, u)))
    }
  }

  test("symmetrize drops self-loops and duplicates") {
    import spark.implicits._
    val dirty = Seq((0, 1), (1, 0), (0, 0), (0, 1), (1, 2)).toDF("src", "dst")
    val sym = GraphOps.symmetrize(dirty)
    assert(sym.count() == 4) // {0-1, 1-2} in both directions
  }

  test("degrees match CSR degrees (and DuckDB)") {
    val sym = GraphOps.symmetrize(edgeDf)
    val deg = GraphOps.degrees(sym)
    val got = deg.collect().map(r => r.getInt(0) -> r.getLong(1)).toMap
    (0 until toy.n).foreach(v => assert(got(v) == toy.degree(v), s"node $v"))
    Oracle.assertEquivalent(
      deg.select(col("id").cast("string").as("id"), col("degree").cast("string").as("degree")),
      "SELECT src AS id, CAST(COUNT(*) AS VARCHAR) AS degree FROM sym GROUP BY src",
      "sym" -> sym)
  }

  test("transition edges: weights are 1/d(src); rows of P sum to 1") {
    val sym = GraphOps.symmetrize(edgeDf)
    val trans = GraphOps.transitionEdges(sym)
    val rowSums = trans.groupBy("src").agg(sum("w").as("s")).collect()
    rowSums.foreach(r => assert(math.abs(r.getDouble(1) - 1.0) < 1e-12))
    trans.collect().foreach { r =>
      assert(math.abs(r.getDouble(2) - 1.0 / toy.degree(r.getInt(0))) < 1e-12)
    }
  }

  test("spmvStep equals the dense P·x product (one-hot input)") {
    val sym = GraphOps.symmetrize(edgeDf)
    val trans = GraphOps.transitionEdges(sym)
    val s = 0
    val y = GraphOps.toDense(toy.n, GraphOps.spmvStep(trans, GraphOps.oneHot(spark, s)))
    // (P e_s)(v) = P(v, s) = 1/d(v) iff v ~ s
    (0 until toy.n).foreach { v =>
      val expect = if (toy.hasEdge(v, s)) 1.0 / toy.degree(v) else 0.0
      assert(math.abs(y(v) - expect) < 1e-12, s"v=$v")
    }
  }

  test("spmvStep matches DuckDB SQL join-aggregate") {
    import spark.implicits._
    val sym = GraphOps.symmetrize(edgeDf)
    val trans = GraphOps.transitionEdges(sym)
    val x = Seq((0, 0.25), (1, 0.5), (4, 0.25)).toDF("id", "value")
    val y = GraphOps.spmvStep(trans, x)
    // Oracle canonicalizes doubles to 6 decimals on both sides.
    Oracle.assertEquivalent(
      y.select(col("id").cast("string").as("id"), col("value")),
      """SELECT CAST(t.src AS VARCHAR) AS id,
        |       SUM(CAST(t.w AS DOUBLE) * CAST(x.value AS DOUBLE)) AS value
        |FROM t JOIN x ON t.dst = x.id GROUP BY t.src""".stripMargin,
      "t" -> trans, "x" -> x)
  }

  test("two chained spmvSteps give P²e_s (checked against CSR computation)") {
    val sym = GraphOps.symmetrize(edgeDf)
    val trans = GraphOps.transitionEdges(sym)
    val s = 3
    val step1 = GraphOps.spmvStep(trans, GraphOps.oneHot(spark, s))
    val y = GraphOps.toDense(toy.n, GraphOps.spmvStep(trans, step1))
    // Reference: dense two-step probability p_2(v, s) computed directly.
    val x1 = Array.tabulate(toy.n)(v => if (toy.hasEdge(v, s)) 1.0 / toy.degree(v) else 0.0)
    val expect = Array.tabulate(toy.n) { v =>
      var acc = 0.0
      toy.neighborsOf(v).foreach(u => acc += x1(u))
      acc / toy.degree(v)
    }
    (0 until toy.n).foreach(v => assert(math.abs(y(v) - expect(v)) < 1e-12, s"v=$v"))
  }

  test("oneHot and toDense roundtrip") {
    val x = GraphOps.toDense(5, GraphOps.oneHot(spark, 2))
    assert(x.toSeq == Seq(0.0, 0.0, 1.0, 0.0, 0.0))
  }
}
