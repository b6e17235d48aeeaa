package repro.platform

import java.nio.file.{Files, Path, Paths}
import scala.jdk.CollectionConverters._
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.{DirectedGraph, GraphLoader}

/** Filesystem-backed datastore (paper §III): stores datasets, and the
  * results and logs produced by executions.
  *
  * Layout under `root`:
  * {{{
  *   datasets/<name>.<csv|net|asd>   uploaded graphs, by format extension
  *   results/<taskId>/               result CSV (id,score) per finished task
  *   logs/<taskId>.log               execution log lines per task
  * }}}
  */
final class Datastore(val root: Path, spark: SparkSession) {
  private val datasetsDir = Files.createDirectories(root.resolve("datasets"))
  private val resultsDir  = Files.createDirectories(root.resolve("results"))
  private val logsDir     = Files.createDirectories(root.resolve("logs"))

  /** Register ("upload") a dataset file; format is inferred from the
    * extension, matching the demo's supported upload formats.
    */
  def uploadDataset(name: String, sourceFile: Path): Unit = {
    val ext = extensionOf(sourceFile.getFileName.toString)
    Files.copy(sourceFile, datasetsDir.resolve(s"$name.$ext"))
  }

  /** Register an in-memory graph as an edgelist-CSV dataset. */
  def putDataset(name: String, g: DirectedGraph): Unit = {
    val rows = g.edges.select(col("src"), col("dst")).collect()
      .map(r => s"${r.getLong(0)},${r.getLong(1)}")
    Files.write(datasetsDir.resolve(s"$name.csv"), rows.toSeq.asJava)
    g.labels.foreach { l =>
      val lab = l.collect().map(r => s"${r.getLong(0)}\t${r.getString(1)}")
      Files.write(datasetsDir.resolve(s"$name.labels"), lab.toSeq.asJava)
    }
  }

  /** Names of all registered datasets. */
  def datasetNames: Set[String] =
    Files.list(datasetsDir).iterator().asScala
      .map(_.getFileName.toString)
      .filterNot(_.endsWith(".labels"))
      .map(f => f.substring(0, f.lastIndexOf('.')))
      .toSet

  /** Load a dataset by name, dispatching on its stored format. */
  def loadDataset(name: String): DirectedGraph = {
    val file = Files.list(datasetsDir).iterator().asScala
      .filterNot(_.getFileName.toString.endsWith(".labels"))
      .find(_.getFileName.toString.startsWith(s"$name."))
      .getOrElse(throw new IllegalArgumentException(s"dataset '$name' not found"))
    val path = file.toString
    val g = extensionOf(path) match {
      case "csv" => GraphLoader.edgeListCsv(spark, path)
      case "net" => GraphLoader.pajek(spark, path)
      case "asd" => GraphLoader.asd(spark, path)
      case other => throw new IllegalArgumentException(s"unsupported dataset format .$other")
    }
    val labelFile = datasetsDir.resolve(s"$name.labels")
    if (Files.exists(labelFile) && g.labels.isEmpty) {
      import spark.implicits._
      val labels = Files.readAllLines(labelFile).asScala.toSeq
        .map(_.split("\t", 2)).map(a => (a(0).toLong, a(1)))
        .toDF("id", "label")
      g.copy(labels = Some(labels))
    } else g
  }

  /** Persist a finished task's `(id, score)` result. */
  def writeResult(taskId: String, result: DataFrame): Unit = {
    val dir = resultsDir.resolve(taskId)
    Files.createDirectories(dir)
    val rows = result.select(col("id"), col("score")).collect()
      .map(r => s"${r.getLong(0)},${r.getDouble(1)}")
    Files.write(dir.resolve("scores.csv"), rows.toSeq.asJava)
  }

  /** Read a task result back as a DataFrame; None if never written. */
  def readResult(taskId: String): Option[DataFrame] = {
    val f = resultsDir.resolve(taskId).resolve("scores.csv")
    if (!Files.exists(f)) None
    else {
      import spark.implicits._
      val rows = Files.readAllLines(f).asScala.toSeq
        .map(_.split(",")).map(a => (a(0).toLong, a(1).toDouble))
      Some(rows.toDF("id", "score"))
    }
  }

  /** Append a log line for a task (the Status component reads these). */
  def appendLog(taskId: String, line: String): Unit = {
    val f = logsDir.resolve(s"$taskId.log")
    Files.write(f, java.util.List.of(line),
      java.nio.file.StandardOpenOption.CREATE, java.nio.file.StandardOpenOption.APPEND)
  }

  /** All log lines recorded for a task. */
  def readLog(taskId: String): Seq[String] = {
    val f = logsDir.resolve(s"$taskId.log")
    if (Files.exists(f)) Files.readAllLines(f).asScala.toSeq else Seq.empty
  }

  private def extensionOf(name: String): String = {
    val i = name.lastIndexOf('.')
    require(i >= 0, s"dataset file '$name' has no extension")
    name.substring(i + 1)
  }
}

object Datastore {
  /** Create a datastore under a fresh temp directory (tests, demos). */
  def temp(spark: SparkSession): Datastore =
    new Datastore(Files.createTempDirectory("repro-datastore"), spark)

  def at(path: String, spark: SparkSession): Datastore =
    new Datastore(Files.createDirectories(Paths.get(path)), spark)
}
