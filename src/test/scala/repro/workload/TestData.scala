package repro.workload

import java.nio.file.{Files, Path}
import org.apache.spark.sql.SparkSession

/** Shared miniature datasets for Spark-backed suites: generated once per
  * test JVM at SF small enough for the DuckDB oracle (store_sales ≈ 8 k
  * rows) and reused by every suite.
  */
object TestData {
  val SF: Double = 0.002

  lazy val dir: Path = Files.createTempDirectory("sc-testdata")

  private var regularCache: Option[Dataset] = None
  private var partitionedCache: Option[Dataset] = None

  def regular(spark: SparkSession): Dataset = synchronized {
    regularCache.getOrElse {
      val d = TpcDsLite.generate(spark, dir.resolve("regular"), SF, partitioned = false)
      regularCache = Some(d); d
    }
  }

  def partitioned(spark: SparkSession): Dataset = synchronized {
    partitionedCache.getOrElse {
      val d = TpcDsLite.generate(spark, dir.resolve("partitioned"), SF, partitioned = true)
      partitionedCache = Some(d); d
    }
  }

  /** Fresh output directory for a controller run. */
  def freshOutDir(tag: String): Path = Files.createTempDirectory(s"sc-out-$tag")
}
