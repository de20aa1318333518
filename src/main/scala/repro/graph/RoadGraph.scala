package repro.graph

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import scala.collection.mutable

/** Road network with embedded PoI vertices, in CSR form. Built undirected by
  * `fromEdges` (each edge mirrored, the paper's §7 setting) or directed by
  * `fromDirectedEdges` (the §6 "directed graphs" variation — every search in
  * this repo walks the CSR forward, so directedness needs no algorithm
  * changes; reverse-distance needs (`transpose`) are explicit).
  *
  * Vertex ids are dense `0 until numVertices`; a vertex is a PoI iff
  * `poiCategory(v) >= 0` (the value is a category id of a
  * [[repro.semantics.CategoryForest]]). Edge weights are nonnegative
  * (lat/lon-style distances in the synthetic datasets, §7.1 of the paper).
  *
  * The CSR arrays are plain primitives so the whole graph can be broadcast
  * to Spark executors cheaply (see [[PoiDistances]]).
  */
final class RoadGraph(
    val numVertices: Int,
    val adjIndex: Array[Int],    // length numVertices + 1
    val adjVertex: Array[Int],
    val adjWeight: Array[Double],
    val poiCategory: Array[Int], // -1 for plain road vertices
    val xs: Array[Double],       // coordinates (degrees); informational
    val ys: Array[Double],
) extends Serializable {

  require(adjIndex.length == numVertices + 1, "bad CSR index length")
  require(poiCategory.length == numVertices, "bad poiCategory length")

  def degree(v: Int): Int = adjIndex(v + 1) - adjIndex(v)

  def isPoi(v: Int): Boolean = poiCategory(v) >= 0

  /** Number of directed adjacency entries (2× undirected edge count). */
  def numDirectedEdges: Int = adjVertex.length

  /** Undirected edge count — what the paper's Table 5 reports as |E|. */
  def numEdges: Int = numDirectedEdges / 2

  lazy val numPois: Int = poiCategory.count(_ >= 0)

  lazy val pois: Array[Int] = (0 until numVertices).filter(isPoi).toArray

  /** PoI vertices grouped by exact category. */
  lazy val poisByCategory: Map[Int, Array[Int]] =
    pois.groupBy(poiCategory)

  /** Sum of undirected edge weights — the "whole graph" weight mass used to
    * contextualize Table 7's explored-weight sums.
    */
  lazy val totalWeight: Double = adjWeight.sum / 2.0

  /** PoI counts per category, for workload generation (the paper selects
    * "only categories that have a large number of PoI vertices").
    */
  lazy val categoryCounts: Map[Int, Int] =
    poisByCategory.view.mapValues(_.length).toMap

  /** The graph with every edge reversed; `Dijkstra.fromSource(transpose, d)`
    * gives distances *to* `d`, which the destination variation needs. A
    * structurally-undirected graph transposes to itself (same distances).
    */
  lazy val transpose: RoadGraph = {
    val deg = new Array[Int](numVertices)
    var u = 0
    while (u < numVertices) {
      var i = adjIndex(u)
      while (i < adjIndex(u + 1)) { deg(adjVertex(i)) += 1; i += 1 }
      u += 1
    }
    val idx = new Array[Int](numVertices + 1)
    (0 until numVertices).foreach(i => idx(i + 1) = idx(i) + deg(i))
    val pos = idx.clone()
    val av  = new Array[Int](numDirectedEdges)
    val aw  = new Array[Double](numDirectedEdges)
    u = 0
    while (u < numVertices) {
      var i = adjIndex(u)
      while (i < adjIndex(u + 1)) {
        val v = adjVertex(i)
        av(pos(v)) = u; aw(pos(v)) = adjWeight(i); pos(v) += 1
        i += 1
      }
      u += 1
    }
    new RoadGraph(numVertices, idx, av, aw, poiCategory, xs, ys)
  }

  /** Vertices, edges and PoIs as DataFrames — the dataflow-facing view of
    * the dataset (each undirected edge appears once, src < dst).
    */
  def toDataFrames(spark: SparkSession): (DataFrame, DataFrame, DataFrame) = {
    import spark.implicits._
    val vs = (0 until numVertices).map(v => (v, xs(v), ys(v)))
    val es = for {
      u <- 0 until numVertices
      i <- adjIndex(u) until adjIndex(u + 1)
      if u < adjVertex(i)
    } yield (u, adjVertex(i), adjWeight(i))
    val ps = (0 until numVertices).filter(isPoi).map(v => (v, poiCategory(v)))
    (
      vs.toDF("vertex", "x", "y"),
      es.toDF("src", "dst", "weight"),
      ps.toDF("poi", "category"),
    )
  }
}

object RoadGraph {

  /** Build a CSR graph from an undirected edge list. */
  def fromEdges(
      numVertices: Int,
      edges: Seq[(Int, Int, Double)],
      poiCategory: Array[Int],
      xs: Array[Double] = null,
      ys: Array[Double] = null,
  ): RoadGraph = {
    require(edges.forall { case (u, v, w) =>
      u >= 0 && u < numVertices && v >= 0 && v < numVertices && w >= 0 && u != v
    }, "invalid edge")
    val deg = new Array[Int](numVertices)
    edges.foreach { case (u, v, _) => deg(u) += 1; deg(v) += 1 }
    val idx = new Array[Int](numVertices + 1)
    var i = 0
    while (i < numVertices) { idx(i + 1) = idx(i) + deg(i); i += 1 }
    val pos = idx.clone()
    val av  = new Array[Int](edges.size * 2)
    val aw  = new Array[Double](edges.size * 2)
    edges.foreach { case (u, v, w) =>
      av(pos(u)) = v; aw(pos(u)) = w; pos(u) += 1
      av(pos(v)) = u; aw(pos(v)) = w; pos(v) += 1
    }
    val x = if (xs != null) xs else new Array[Double](numVertices)
    val y = if (ys != null) ys else new Array[Double](numVertices)
    new RoadGraph(numVertices, idx, av, aw, poiCategory.clone(), x, y)
  }

  /** Build a CSR graph from a directed edge list (§6 variation). */
  def fromDirectedEdges(
      numVertices: Int,
      edges: Seq[(Int, Int, Double)],
      poiCategory: Array[Int],
      xs: Array[Double] = null,
      ys: Array[Double] = null,
  ): RoadGraph = {
    require(edges.forall { case (u, v, w) =>
      u >= 0 && u < numVertices && v >= 0 && v < numVertices && w >= 0 && u != v
    }, "invalid edge")
    val deg = new Array[Int](numVertices)
    edges.foreach { case (u, _, _) => deg(u) += 1 }
    val idx = new Array[Int](numVertices + 1)
    (0 until numVertices).foreach(i => idx(i + 1) = idx(i) + deg(i))
    val pos = idx.clone()
    val av  = new Array[Int](edges.size)
    val aw  = new Array[Double](edges.size)
    edges.foreach { case (u, v, w) => av(pos(u)) = v; aw(pos(u)) = w; pos(u) += 1 }
    val x = if (xs != null) xs else new Array[Double](numVertices)
    val y = if (ys != null) ys else new Array[Double](numVertices)
    new RoadGraph(numVertices, idx, av, aw, poiCategory.clone(), x, y)
  }

  /** Rebuild a graph from its DataFrame form (inverse of `toDataFrames`). */
  def fromDataFrames(vertices: DataFrame, edges: DataFrame, pois: DataFrame): RoadGraph = {
    val vRows = vertices.select("vertex", "x", "y").collect()
    val n     = vRows.length
    val xs    = new Array[Double](n)
    val ys    = new Array[Double](n)
    vRows.foreach { r =>
      val v = r.getInt(0); xs(v) = r.getDouble(1); ys(v) = r.getDouble(2)
    }
    val cat = Array.fill(n)(-1)
    pois.select("poi", "category").collect().foreach { r => cat(r.getInt(0)) = r.getInt(1) }
    val es = edges.select("src", "dst", "weight").collect().toSeq.map {
      (r: Row) => (r.getInt(0), r.getInt(1), r.getDouble(2))
    }
    fromEdges(n, es, cat, xs, ys)
  }

  /** Connectivity check (tests + generator invariant). */
  def isConnected(g: RoadGraph): Boolean = {
    if (g.numVertices == 0) return true
    val seen  = new Array[Boolean](g.numVertices)
    val stack = mutable.ArrayDeque(0)
    seen(0) = true
    var count = 1
    while (stack.nonEmpty) {
      val u = stack.removeLast()
      var i = g.adjIndex(u)
      while (i < g.adjIndex(u + 1)) {
        val v = g.adjVertex(i)
        if (!seen(v)) { seen(v) = true; count += 1; stack.append(v) }
        i += 1
      }
    }
    count == g.numVertices
  }
}
