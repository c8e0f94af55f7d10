package repro.bench

import java.io.{File, PrintWriter}
import org.apache.spark.sql.SparkSession
import repro.baselines.{MossoLite, Randomized, Sags, Sweg}
import repro.core.local.Slugger
import repro.core.model.HierSummary
import repro.graph.LocalGraph

/** Shared machinery for the per-table benchmark harnesses: uniform algorithm
  * runners, lossless verification, markdown table rendering, and result
  * persistence under results/.
  */
object Harness {

  final case class Run(summary: HierSummary, millis: Long) {
    def relSize(m: Long): Double = summary.cost.toDouble / m
  }

  def timeIt[A](body: => A): (A, Long) = {
    val t0 = System.nanoTime()
    val r = body
    (r, (System.nanoTime() - t0) / 1000000)
  }

  /** name -> runner, in the paper's Fig. 5 order. */
  def algorithms(bigT: Int = 20, seed: Long = 42): Seq[(String, LocalGraph => Run)] = Seq(
    "SLUGGER"    -> ((g: LocalGraph) => { val (r, ms) = timeIt(Slugger.summarize(g, Slugger.Config(T = bigT, seed = seed))); Run(r.summary, ms) }),
    "SWEG"       -> ((g: LocalGraph) => { val (r, ms) = timeIt(Sweg.summarize(g, bigT, seed)); Run(r, ms) }),
    "RANDOMIZED" -> ((g: LocalGraph) => { val (r, ms) = timeIt(Randomized.summarize(g, seed)); Run(r, ms) }),
    "SAGS"       -> ((g: LocalGraph) => { val (r, ms) = timeIt(Sags.summarize(g, seed = seed)); Run(r, ms) }),
    "MOSSO-LITE" -> ((g: LocalGraph) => { val (r, ms) = timeIt(MossoLite.summarize(g, seed = seed)); Run(r, ms) }),
  )

  def loadGraph(spark: SparkSession, spec: Datasets.Spec, scale: Double): LocalGraph =
    LocalGraph.fromDF(spec.gen(spark, scale))

  def fmt(d: Double): String = f"$d%.3f"

  /** Render a GitHub-flavored markdown table. */
  def markdown(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb ++= header.mkString("| ", " | ", " |\n")
    sb ++= header.map(_ => "---").mkString("| ", " | ", " |\n")
    rows.foreach(r => sb ++= r.mkString("| ", " | ", " |\n"))
    sb.toString
  }

  /** Print a table and persist it under results/<name>.md. */
  def report(name: String, title: String, header: Seq[String], rows: Seq[Seq[String]]): Unit = {
    val body = s"# $title\n\n" + markdown(header, rows)
    println("\n" + body)
    val dir = new File("results")
    dir.mkdirs()
    val pw = new PrintWriter(new File(dir, s"$name.md"))
    try pw.write(body) finally pw.close()
  }
}
