package repro.bench

import repro.core.SRoute

/** Shared harness helpers for the table-reproduction benchmarks. */
object BenchUtil {

  def timeNanos[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val a  = body
    (a, System.nanoTime() - t0)
  }

  def ms(nanos: Long): Double = nanos / 1e6

  /** Render a paper-style table: header row + aligned columns. */
  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all    = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (s"== $title ==" +: fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }

  def fmtRoute(r: SRoute, name: Int => String): String =
    r.pois.map(name).mkString(" -> ")

  /** Used-heap after a best-effort GC — the sanity column of the Table 6
    * memory model (per-process RSS is meaningless in one shared JVM).
    */
  def usedHeapBytes(): Long = {
    System.gc(); System.gc()
    Thread.sleep(50)
    val rt = Runtime.getRuntime
    rt.totalMemory() - rt.freeMemory()
  }

  /** Retained-bytes model for Table 6: graph footprint + peak live queue
    * entries × measured per-entry cost (route vector + boxing overhead).
    */
  def graphBytes(g: repro.graph.RoadGraph): Long =
    // CSR: adjVertex(4) + adjWeight(8) per directed edge; 4+8+8+8 per vertex
    4L * g.numDirectedEdges + 8L * g.numDirectedEdges + 28L * g.numVertices

  def routeEntryBytes(avgRouteLen: Double): Long =
    (64 + 40 * avgRouteLen).toLong // Vector node + boxed ints + entry header

  def mb(bytes: Long): String = f"${bytes / 1048576.0}%.1f MB"
}
