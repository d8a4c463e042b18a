package repro.bench

import org.apache.spark.sql.SparkSession

import repro.SparkSpec
import repro.core.BlendSession

/** Base for the per-table benchmark suites: shares the test SparkSession,
  * installs BLEND (placeholder function + Catalyst rule) and tunes shuffle
  * parallelism for the small-index workloads.
  */
trait BenchSpec extends SparkSpec {
  override lazy val spark: SparkSession = {
    val s = SparkSpec.shared
    // Small shuffles dominate these workloads: fewer partitions and no AQE
    // re-planning lowers the per-query overhead floor, so the differences
    // the optimizer exploits are visible at lite scale.
    s.conf.set("spark.sql.shuffle.partitions", "8")
    s.conf.set("spark.sql.adaptive.enabled", "false")
    BlendSession.install(s)
    s
  }
}
