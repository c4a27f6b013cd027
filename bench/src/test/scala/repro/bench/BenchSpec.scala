package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Base for the per-table benchmark suites. Each suite prints the analog of
  * one paper table, writes it under `results/`, and asserts the qualitative
  * claims the paper derives from that table (which system wins, by roughly
  * what factor) — absolute numbers are expected to differ on synthetic data.
  */
trait BenchSpec extends SparkSpec {

  /** Seeds for repetition averaging (paper: 10; here: 3, see DESIGN.md). */
  def seeds: Seq[Long] =
    sys.env.get("BENCH_SEEDS").map(_.toInt).map(n => (1L to n.toLong)).getOrElse(Experiments.Seeds)

  /** The 7 moderate Clean-Clean datasets — the driver-side sweep and the
    * averaged-effectiveness figures run on these; the two large analogs join
    * for the per-dataset finals (Tables 5/7).
    */
  val smallCc: Seq[String] = Seq("AbtBuy-A", "DblpAcm-A", "ScholarDblp-A",
    "AmazonGP-A", "ImdbTmdb-A", "ImdbTvdb-A", "TmdbTvdb-A")

  val allCc: Seq[String] = smallCc ++ Seq("Movies-A", "WalmartAmazon-A")

  def publish(name: String, table: String): Unit = {
    Experiments.writeResult(name, table)
    info("\n" + table)
    println(s"\n=== $name ===\n$table")
  }
}
