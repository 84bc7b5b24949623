package repro.experiments

import org.apache.spark.sql.SparkSession

/** Shared plumbing for the four evaluation reproductions (paper §8,
  * Figs 13–16). Each experiment produces an [[ExperimentTable]] of the
  * same rows the paper plots, printed in plain text and recorded next to
  * the paper's numbers in EXPERIMENTS.md.
  */
object Harness {

  final case class ExperimentTable(title: String, header: Seq[String],
                                   rows: Seq[Seq[String]]) {
    def render: String = {
      val all    = header +: rows
      val widths = header.indices.map(i => all.map(_(i).length).max)
      def line(cells: Seq[String]): String =
        cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
      val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
      (Seq(s"== $title ==", line(header), sep) ++ rows.map(line)).mkString("\n")
    }
  }

  def ms(x: Double): String = f"$x%.1f"
  def ratio(a: Double, b: Double): String = if (b == 0) "-" else f"${a / b}%.2f"

  /** Wall-clock of `body` in milliseconds alongside its value. */
  def timed[A](body: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = body
    (a, (System.nanoTime() - t0) / 1e6)
  }

  /** A standalone session for the `jobs/` entrypoints (benches reuse the
    * shared SparkSpec session instead).
    */
  def localSpark(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}
