package repro.workload

import java.nio.file.{Files, Path}
import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** A generated TPC-DS-shaped dataset on local Parquet storage.
  *
  * @param name           "TPC-DS" or "TPC-DSp"
  * @param dir            directory holding one sub-dir of Parquet per table
  * @param partitioned    true for the date-partitioned variant (TPC-DSp)
  * @param tableBytes     on-disk bytes of each table
  * @param partitionBytes for partitioned sales tables: table → year → bytes
  */
final case class Dataset(
    name: String,
    dir: Path,
    partitioned: Boolean,
    tableBytes: Map[String, Long],
    partitionBytes: Map[String, Map[Int, Long]],
) {
  def totalBytes: Long = tableBytes.values.sum
  def tablePath(table: String): String = dir.resolve(table).toString

  /** Bytes a statement reads from `table`, honoring partition pruning. */
  def effectiveReadBytes(table: String, years: Option[Seq[Int]]): Long = years match {
    case Some(ys) if partitioned && partitionBytes.contains(table) =>
      ys.map(y => partitionBytes(table).getOrElse(y, 0L)).sum
    case _ => tableBytes(table)
  }
}

/** Deterministic synthetic generator for a TPC-DS-shaped schema (§ VI-A).
  *
  * Substitutes dsdgen (offline build, miniature scale): three sales fact
  * tables, date_dim spanning 1998–2002, item, customer and store dimensions.
  * SF=1 is ~0.5 GB; tests use SF≈0.002, benches SF≈0.02–0.05. The
  * date-partitioned variant mirrors the paper's TPC-DSp: the sales tables
  * are partitioned by sold year (`*_sold_year`), enabling real partition
  * pruning in Spark and partition-aware read-cost modeling.
  */
object TpcDsLite {
  val SalesTables: Vector[String] = Vector("store_sales", "catalog_sales", "web_sales")
  val DimTables: Vector[String]   = Vector("date_dim", "item", "customer", "store")
  val AllTables: Vector[String]   = SalesTables ++ DimTables

  val FirstYear = 1998
  val LastYear  = 2002
  /** Days in date_dim: 1998-01-01 .. 2002-12-31 (fixed, like TPC-DS). */
  val NDays = 1826

  private val NStoreSalesPerSf   = 4_000_000L
  private val NCatalogSalesPerSf = 2_000_000L
  private val NWebSalesPerSf     = 1_000_000L
  private val NCustomerPerSf     =   200_000L
  private val NItemPerSf         =    40_000L

  private def n(base: Long, sf: Double): Long = math.max(10L, (base * sf).toLong)

  def dateDim(spark: SparkSession): DataFrame = {
    import spark.implicits._
    spark.range(1, NDays + 1).toDF("d_date_sk").select(
      $"d_date_sk",
      date_add(lit(s"$FirstYear-01-01").cast(DateType), ($"d_date_sk" - 1).cast(IntegerType))
        .cast(StringType) as "d_date",
    ).select(
      $"d_date_sk", $"d_date",
      year(col("d_date").cast(DateType))                          as "d_year",
      month(col("d_date").cast(DateType))                         as "d_moy",
      quarter(col("d_date").cast(DateType))                       as "d_qoy",
      dayofweek(col("d_date").cast(DateType))                     as "d_dow",
    )
  }

  def item(spark: SparkSession, sf: Double, seed: Long = 11): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NItemPerSf, sf) + 1).toDF("i_item_sk").select(
      $"i_item_sk",
      concat(lit("ITEM"), $"i_item_sk")                           as "i_item_id",
      concat(lit("Category"), ($"i_item_sk" % 10))                as "i_category",
      concat(lit("Class"), ($"i_item_sk" % 20))                   as "i_class",
      concat(lit("Brand"), (rand(seed) * 50 + 1).cast(IntegerType)) as "i_brand",
      (rand(seed + 1) * 100 + 1).cast(IntegerType)                as "i_manufact_id",
      round(rand(seed + 2) * 99 + 1, 2)                           as "i_current_price",
    )
  }

  def customer(spark: SparkSession, sf: Double, seed: Long = 13): DataFrame = {
    import spark.implicits._
    spark.range(1, n(NCustomerPerSf, sf) + 1).toDF("c_customer_sk").select(
      $"c_customer_sk",
      concat(lit("CUST"), $"c_customer_sk")                       as "c_customer_id",
      concat(lit("ST"), (rand(seed) * 20).cast(IntegerType))      as "c_state",
      (rand(seed + 1) * 60 + 1940).cast(IntegerType)              as "c_birth_year",
    )
  }

  def store(spark: SparkSession, sf: Double, seed: Long = 17): DataFrame = {
    import spark.implicits._
    val count = math.max(4L, (50 * sf).toLong)
    spark.range(1, count + 1).toDF("s_store_sk").select(
      $"s_store_sk",
      concat(lit("STORE"), $"s_store_sk")                         as "s_store_id",
      concat(lit("ST"), (rand(seed) * 10).cast(IntegerType))      as "s_state",
    )
  }

  private def sales(spark: SparkSession, rows: Long, sf: Double, prefix: String,
                    custCol: String, seed: Long, withStore: Boolean): DataFrame = {
    val nItem = n(NItemPerSf, sf); val nCust = n(NCustomerPerSf, sf)
    val nStore = math.max(4L, (50 * sf).toLong)
    val base = spark.range(rows).select(
      (rand(seed)     * NDays + 1).cast(LongType)       as s"${prefix}_sold_date_sk",
      (rand(seed + 1) * nItem + 1).cast(LongType)       as s"${prefix}_item_sk",
      (rand(seed + 2) * nCust + 1).cast(LongType)       as custCol,
      (rand(seed + 3) * 100 + 1).cast(IntegerType)      as s"${prefix}_quantity",
      round(rand(seed + 4) * 500 + 1, 2)                as s"${prefix}_sales_price",
      round(rand(seed + 5) * 25000 + 50, 2)             as s"${prefix}_ext_sales_price",
      round(rand(seed + 6) * 12000 - 3000, 2)           as s"${prefix}_net_profit",
    )
    if (withStore) base.withColumn(s"${prefix}_store_sk",
      (rand(seed + 7) * nStore + 1).cast(LongType))
    else base
  }

  def storeSales(spark: SparkSession, sf: Double, seed: Long = 23): DataFrame =
    sales(spark, n(NStoreSalesPerSf, sf), sf, "ss", "ss_customer_sk", seed, withStore = true)

  def catalogSales(spark: SparkSession, sf: Double, seed: Long = 29): DataFrame =
    sales(spark, n(NCatalogSalesPerSf, sf), sf, "cs", "cs_bill_customer_sk", seed, withStore = false)

  def webSales(spark: SparkSession, sf: Double, seed: Long = 31): DataFrame =
    sales(spark, n(NWebSalesPerSf, sf), sf, "ws", "ws_bill_customer_sk", seed, withStore = false)

  def table(spark: SparkSession, name: String, sf: Double): DataFrame = name match {
    case "store_sales"   => storeSales(spark, sf)
    case "catalog_sales" => catalogSales(spark, sf)
    case "web_sales"     => webSales(spark, sf)
    case "date_dim"      => dateDim(spark)
    case "item"          => item(spark, sf)
    case "customer"      => customer(spark, sf)
    case "store"         => store(spark, sf)
    case other           => throw new IllegalArgumentException(s"unknown table $other")
  }

  /** Year column appended to a sales table for the partitioned variant. */
  def yearColumn(prefix: String): String = s"${prefix}_sold_year"

  private def withYear(spark: SparkSession, df: DataFrame, prefix: String): DataFrame = {
    val dd = dateDim(spark).select(col("d_date_sk") as "yd_sk", col("d_year") as yearColumn(prefix))
    df.join(dd, col(s"${prefix}_sold_date_sk") === col("yd_sk"), "left").drop("yd_sk")
  }

  private def dirBytes(p: Path): Long = {
    if (!Files.exists(p)) 0L
    else {
      val s = Files.walk(p)
      try s.filter(Files.isRegularFile(_)).mapToLong(Files.size(_)).sum
      finally s.close()
    }
  }

  /** Generate the dataset under `dir`, writing each table as Parquet.
    * For `partitioned = true` the three sales tables gain a `*_sold_year`
    * column and are written `partitionBy` that column (TPC-DSp).
    */
  def generate(spark: SparkSession, dir: Path, sf: Double, partitioned: Boolean): Dataset = {
    Files.createDirectories(dir)
    val prefixOf = Map("store_sales" -> "ss", "catalog_sales" -> "cs", "web_sales" -> "ws")
    AllTables.foreach { t =>
      val path = dir.resolve(t)
      val df = table(spark, t, sf)
      if (partitioned && SalesTables.contains(t)) {
        val pfx = prefixOf(t)
        withYear(spark, df, pfx).write.mode("overwrite")
          .partitionBy(yearColumn(pfx)).parquet(path.toString)
      } else {
        df.write.mode("overwrite").parquet(path.toString)
      }
    }
    val tableBytes = AllTables.map(t => t -> dirBytes(dir.resolve(t))).toMap
    val partBytes =
      if (!partitioned) Map.empty[String, Map[Int, Long]]
      else SalesTables.map { t =>
        val pfx = prefixOf(t)
        t -> (FirstYear to LastYear).map { y =>
          y -> dirBytes(dir.resolve(t).resolve(s"${yearColumn(pfx)}=$y"))
        }.toMap
      }.toMap
    Dataset(if (partitioned) "TPC-DSp" else "TPC-DS", dir, partitioned, tableBytes, partBytes)
  }

  /** Register every base table of `ds` as a Spark temp view. */
  def registerViews(spark: SparkSession, ds: Dataset): Unit =
    AllTables.foreach(t => spark.read.parquet(ds.tablePath(t)).createOrReplaceTempView(t))
}
