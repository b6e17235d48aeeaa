package repro.graph

import org.apache.spark.graphx.{Edge, Graph, VertexId}
import org.apache.spark.sql.{DataFrame, SparkSession}

/** Conversion between the DataFrame graph representation and GraphX, so
  * iterative algorithms can run as pregel-style vertex computations over
  * DataFrame-loaded graphs (the reproduction target's dataflow shape).
  */
object GraphXBridge {

  /** Build a GraphX graph whose vertex attribute is unit and edge
    * attribute is unit; vertices with no edges are preserved.
    */
  def toGraphX(g: DirectedGraph): Graph[Unit, Unit] = {
    val edgeRdd = g.edges.rdd.map(r => Edge[Unit](r.getLong(0), r.getLong(1), ()))
    val vertRdd = g.vertices.rdd.map(r => (r.getLong(0): VertexId, ()))
    Graph(vertRdd, edgeRdd)
  }

  /** Materialise a GraphX vertex RDD of doubles back into a `(id, score)`
    * DataFrame.
    */
  def scoresToDf(spark: SparkSession, g: Graph[Double, _]): DataFrame = {
    import spark.implicits._
    g.vertices.map { case (id, v) => (id, v) }.toDF("id", "score")
  }
}
