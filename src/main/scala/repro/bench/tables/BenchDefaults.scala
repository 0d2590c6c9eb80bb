package repro.bench.tables

import repro.core.Metrics

/** Shared knobs for the table benches; env-overridable so the same harness
  * runs at smoke scale in CI and at full bench scale.
  */
object BenchDefaults {
  /** Scale factor for the accuracy tables (paper datasets are 20K–120K
    * images; sf=0.05 gives 0.8K–1.2K images per corpus — see DESIGN.md §6).
    */
  def sf: Double = sys.env.get("REPRO_BENCH_SF").map(_.toDouble).getOrElse(0.05)

  /** Embedding dimension (paper: 512). */
  def dim: Int = sys.env.get("REPRO_BENCH_DIM").map(_.toInt).getOrElse(128)

  /** Extra scale multiplier for the Table 6 latency rows. */
  def t6Scale: Double = sys.env.get("REPRO_T6_SCALE").map(_.toDouble).getOrElse(1.0)

  val Target: Int = Metrics.DefaultTarget
  val Budget: Int = Metrics.DefaultBudget
}

/** One labeled table row of per-dataset values. */
final case class PanelRow(label: String, values: Seq[Double]) {
  def withAvg: Seq[Double] = values :+ (values.sum / values.size)
}
