package repro.core

import org.apache.spark.graphx.{Edge, Graph, VertexId}
import org.apache.spark.sql.{DataFrame, SparkSession}

/** GraphX rendering of the iterative h-index k-core algorithm (r=1, s=2):
  * a Pregel-style loop where every vertex holds its current τ, each
  * superstep gathers neighbours' τ values with ``aggregateMessages`` and
  * recomputes the h-index, until no vertex changes. Provided per the
  * reproduction hint; the generic engines above cover all (r,s).
  */
object PregelCore {

  /** Core numbers of every vertex appearing in the canonical edge
    * DataFrame (columns u, v). Returns a DataFrame (id, kappa).
    */
  def coreNumbers(spark: SparkSession, edges: DataFrame, maxIters: Int = 1000): DataFrame = {
    import spark.implicits._
    val edgeRdd = edges.select("u", "v").as[(Long, Long)].rdd
      .map { case (u, v) => Edge(u: VertexId, v: VertexId, ()) }
    val base = Graph.fromEdges(edgeRdd, defaultValue = 0)
    var g = base.outerJoinVertices(base.degrees)((_, _, d) => d.getOrElse(0)).cache()
    var iter = 0
    var converged = false
    while (!converged && iter < maxIters) {
      val gathered = g.aggregateMessages[Array[Int]](
        ctx => { ctx.sendToDst(Array(ctx.srcAttr)); ctx.sendToSrc(Array(ctx.dstAttr)) },
        _ ++ _,
      )
      val next = g.outerJoinVertices(gathered) { (_, old, msgs) =>
        msgs.map(m => HIndex.linear(m, m.length)).getOrElse(old)
      }.cache()
      val changed = next.vertices.join(g.vertices)
        .filter { case (_, (n, o)) => n != o }.count()
      g.unpersist(blocking = false)
      g = next
      if (changed == 0) converged = true else iter += 1
    }
    g.vertices.map { case (id, tau) => (id, tau) }.toDF("id", "kappa")
  }
}
