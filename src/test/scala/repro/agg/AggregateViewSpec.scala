package repro.agg

import org.apache.spark.sql.functions._
import repro.{Oracle, ReproSpec}
import repro.graph.GraphGen

/** Aggregate views (§6) checked against DuckDB SQL. */
class AggregateViewSpec extends ReproSpec {

  private lazy val graph = GraphGen.callGraph(spark, nV = 150, nE = 1000)

  test("Listing 4 style: city-calls-city super-nodes") {
    val res = AggregateView.fromGvdl(graph,
      """create aggregate view city-calls-city on Calls
         nodes group by city
         nodes aggregate count(id) as num-phones
         edges aggregate sum(duration) as total-duration""")
    val got = res.superNodes
      .select(col("city"), col("num_nodes").cast("string").as("num_nodes"))
    Oracle.assertEquivalent(got,
      "SELECT city, CAST(COUNT(*) AS VARCHAR) AS num_nodes FROM nodes GROUP BY city",
      "nodes" -> graph.nodes)
  }

  test("super-edges aggregate matches SQL over the resolved frame") {
    val res = AggregateView.fromGvdl(graph,
      """create aggregate view ccc on Calls
         nodes group by city
         edges aggregate sum(duration) as total-duration""")
    // Map super ids back to city names for a stable comparison key.
    val withCities = res.superEdges
      .join(res.superNodes.select(col("super_id").as("src_super"), col("city").as("src_city")),
            Seq("src_super"))
      .join(res.superNodes.select(col("super_id").as("dst_super"), col("city").as("dst_city")),
            Seq("dst_super"))
      .select(col("src_city"), col("dst_city"),
              col("num_edges").cast("string").as("num_edges"),
              col("total-duration").cast("double").as("total_duration"))
    val flat = graph.resolved.select(col("src_city").as("sc"), col("dst_city").as("dc"),
                                     col("duration"))
    Oracle.assertEquivalent(withCities,
      """SELECT sc AS src_city, dc AS dst_city,
                CAST(COUNT(*) AS VARCHAR) AS num_edges,
                SUM(CAST(duration AS DOUBLE)) AS total_duration
         FROM edges GROUP BY sc, dc""",
      "edges" -> flat)
  }

  test("node where-clause filters both super-nodes and super-edges") {
    val res = AggregateView.fromGvdl(graph,
      """create aggregate view docs on Calls
         nodes where profession = 'doctor'
         nodes group by city
         edges aggregate count(*) as num-calls""")
    val got = res.superNodes.select(col("city"), col("num_nodes").cast("string").as("num_nodes"))
    Oracle.assertEquivalent(got,
      """SELECT city, CAST(COUNT(*) AS VARCHAR) AS num_nodes
         FROM nodes WHERE profession = 'doctor' GROUP BY city""",
      "nodes" -> graph.nodes)
    // Every edge aggregated must have both endpoints among doctors.
    val doctors = graph.nodes.where(col("profession") === "doctor").count()
    assert(res.superNodes.agg(sum("num_nodes")).collect()(0).getLong(0) == doctors)
    val totalEdges = res.superEdges.agg(sum("num_edges")).collect()(0).getLong(0)
    val direct = graph.resolved
      .where(col("src_profession") === "doctor" && col("dst_profession") === "doctor")
      .count()
    assert(totalEdges == direct)
  }

  test("multi-property group by (profession × city triangle view)") {
    val res = AggregateView.fromGvdl(graph,
      """create aggregate view pc on Calls
         nodes group by profession, city
         edges aggregate min(duration) as min-d, max(duration) as max-d""")
    val groups = graph.nodes.select("profession", "city").distinct().count()
    assert(res.superNodes.count() == groups)
    assert(res.superEdges.columns.contains("min-d"))
    assert(res.superEdges.columns.contains("max-d"))
  }

  test("avg aggregate on nodes") {
    val res = AggregateView.fromGvdl(graph,
      """create aggregate view a on Calls
         nodes group by state
         nodes aggregate avg(id) as mean-id""")
    val got = res.superNodes.select(col("state"),
      round(col("mean-id"), 4).cast("string").as("mean_id"))
    Oracle.assertEquivalent(got,
      "SELECT state, CAST(ROUND(AVG(CAST(id AS DOUBLE)), 4) AS VARCHAR) AS mean_id FROM nodes GROUP BY state",
      "nodes" -> graph.nodes)
  }

  test("super ids are dense 1..n") {
    val res = AggregateView.fromGvdl(graph,
      "create aggregate view d on Calls nodes group by city")
    val ids = res.superNodes.select("super_id").collect().map(_.getInt(0)).sorted
    assert(ids.toSeq == (1 to ids.length))
  }
}
