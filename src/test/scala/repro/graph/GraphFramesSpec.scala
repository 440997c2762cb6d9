package repro.graph

import repro.{Oracle, SparkSpec, TestGraphs}

class GraphFramesSpec extends SparkSpec {

  for (seed <- 1 to 4) {
    test(s"statsDF matches DuckDB oracle, seed $seed") {
      val g = TestGraphs.uniform(30, 80, 4, seed)
      val nodes = GraphFrames.nodesDF(spark, g)
      val edges = GraphFrames.edgesDF(spark, g)
      Oracle.assertEquivalent(
        GraphFrames.statsDF(nodes, edges),
        """
        SELECT
          (SELECT count(*) FROM edges)                    AS num_edges,
          (SELECT count(*) FROM nodes)                    AS num_nodes,
          (SELECT count(DISTINCT label) FROM nodes)       AS num_labels,
          round((SELECT count(*) FROM edges) * 1.0
                / (SELECT count(*) FROM nodes), 2)        AS avg_degree,
          (SELECT coalesce(max(c), 0) FROM
             (SELECT count(*) c FROM edges GROUP BY src)) AS max_outdeg,
          (SELECT coalesce(max(c), 0) FROM
             (SELECT count(*) c FROM edges GROUP BY dst)) AS max_indeg
        """,
        "nodes" -> nodes, "edges" -> edges)
    }
  }

  test("statsDF matches LocalGraph statistics") {
    val g = TestGraphs.uniform(40, 100, 3, 9)
    val st = GraphFrames.statsDF(
      GraphFrames.nodesDF(spark, g), GraphFrames.edgesDF(spark, g)).first()
    assert(st.getLong(0) === g.m)
    assert(st.getLong(1) === g.n.toLong)
    assert(st.getLong(2) === g.labelSet.size.toLong)
    assert(st.getLong(4) === g.maxOutDeg.toLong)
    assert(st.getLong(5) === g.maxInDeg.toLong)
  }

  test("nodes/edges round-trip preserves the graph") {
    val g = TestGraphs.uniform(25, 60, 3, 10)
    val nodes = GraphFrames.nodesDF(spark, g).collect()
      .map(r => r.getLong(0).toInt -> r.getString(1)).toMap
    val edges = GraphFrames.edgesDF(spark, g).collect()
      .map(r => (r.getLong(0).toInt, r.getLong(1).toInt)).toSet
    assert(nodes === (0 until g.n).map(i => i -> g.labels(i)).toMap)
    assert(edges === g.edges.toSet)
  }

  test("degree histogram matches DuckDB oracle") {
    val g = TestGraphs.uniform(30, 90, 2, 11)
    val edges = GraphFrames.edgesDF(spark, g)
    val df = edges.groupBy("src").agg(org.apache.spark.sql.functions.count(
        org.apache.spark.sql.functions.lit(1)).as("outdeg"))
      .groupBy("outdeg").agg(org.apache.spark.sql.functions.count(
        org.apache.spark.sql.functions.lit(1)).as("freq"))
    Oracle.assertEquivalent(df,
      "SELECT outdeg, count(*) AS freq FROM " +
        "(SELECT src, count(*) AS outdeg FROM edges GROUP BY src) AS t GROUP BY outdeg",
      "edges" -> edges)
  }
}
