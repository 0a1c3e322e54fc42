package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graph.GraphGen

/** DuckDB oracle checks for the distributed dataflow underneath GraphFlat:
  * degree tables, hub detection, and k-hop reachable-set sizes must match an
  * independent SQL formulation over the same edge table.
  */
class GraphFlatOracleSpec extends SparkSpec {

  private lazy val g = GraphGen.uugLite(n = 250)
  private lazy val edgeDf = g.edgeDs(spark).select("src", "dst")
  private lazy val nodeDf = g.nodeDs(spark).select("id")

  test("in-degree table matches DuckDB") {
    val sparkDeg = edgeDf.groupBy("dst").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT dst, COUNT(*) AS cnt FROM edges GROUP BY dst",
      "edges" -> edgeDf)
  }

  test("out-degree table matches DuckDB") {
    val sparkDeg = edgeDf.groupBy("src").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      sparkDeg,
      "SELECT src, COUNT(*) AS cnt FROM edges GROUP BY src",
      "edges" -> edgeDf)
  }

  test("hub detection (in-degree > threshold) matches DuckDB") {
    val thr = 10
    val sparkHubs = edgeDf.groupBy("dst").agg(count(lit(1)) as "cnt")
      .filter(col("cnt") > thr).select(col("dst") as "id")
    Oracle.assertEquivalent(
      sparkHubs,
      s"SELECT dst AS id FROM edges GROUP BY dst HAVING COUNT(*) > $thr",
      "edges" -> edgeDf)
    // and GraphFlat's own hub set agrees
    val hubs = GraphFlat.hubIds(g.edgeDs(spark), FlatConfig(1, reindexThreshold = thr))
    val sqlHubs = sparkHubs.collect().map(_.getLong(0)).toSet
    assert(hubs == sqlHubs)
  }

  test("GraphFlat 1-hop node counts match a DuckDB join") {
    import spark.implicits._
    val m = GraphFlat.run(spark, g.nodeDs(spark), g.edgeDs(spark), FlatConfig(1))
    val sparkCnt = m.map(gf => (gf.target, gf.nodes.length.toLong)).toDF("id", "cnt")
    Oracle.assertEquivalent(
      sparkCnt,
      """WITH hop1 AS (SELECT DISTINCT dst AS t, src AS n FROM edges),
        |     alln AS (SELECT id AS t, id AS n FROM nodes UNION SELECT t, n FROM hop1)
        |SELECT t AS id, COUNT(DISTINCT n) AS cnt FROM alln GROUP BY t""".stripMargin,
      "edges" -> edgeDf, "nodes" -> nodeDf)
  }

  test("GraphFlat 2-hop node counts match a DuckDB double join") {
    import spark.implicits._
    val m = GraphFlat.run(spark, g.nodeDs(spark), g.edgeDs(spark), FlatConfig(2))
    val sparkCnt = m.map(gf => (gf.target, gf.nodes.length.toLong)).toDF("id", "cnt")
    Oracle.assertEquivalent(
      sparkCnt,
      """WITH hop1 AS (SELECT DISTINCT dst AS t, src AS n FROM edges),
        |     hop2 AS (SELECT DISTINCT h.t AS t, e.src AS n FROM hop1 h JOIN edges e ON e.dst = h.n),
        |     alln AS (SELECT id AS t, id AS n FROM nodes
        |              UNION SELECT t, n FROM hop1
        |              UNION SELECT t, n FROM hop2)
        |SELECT t AS id, COUNT(DISTINCT n) AS cnt FROM alln GROUP BY t""".stripMargin,
      "edges" -> edgeDf, "nodes" -> nodeDf)
  }

  test("GraphFlat 2-hop edge counts match DuckDB (edges with dst within 1 hop)") {
    import spark.implicits._
    val m = GraphFlat.run(spark, g.nodeDs(spark), g.edgeDs(spark), FlatConfig(2))
    val sparkCnt = m.map(gf => (gf.target, gf.edges.length.toLong)).toDF("id", "cnt")
    Oracle.assertEquivalent(
      sparkCnt,
      """WITH within1 AS (SELECT id AS t, id AS n FROM nodes
        |                 UNION SELECT DISTINCT dst AS t, src AS n FROM edges),
        |     sub AS (SELECT DISTINCT w.t AS t, e.src AS s, e.dst AS d
        |             FROM within1 w JOIN edges e ON e.dst = w.n)
        |SELECT n.id AS id, COUNT(s.s) AS cnt
        |FROM nodes n LEFT JOIN sub s ON s.t = n.id
        |GROUP BY n.id""".stripMargin,
      "edges" -> edgeDf, "nodes" -> nodeDf)
  }
}
