package repro.stats

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Per-column min/max statistics, the information MMP consumes.
  *
  * Orderable non-string types (numerics, dates, timestamps, booleans) are
  * canonicalized to Double so stats computed by Spark aggregation and stats
  * read from parquet footers compare identically: dates become epoch days,
  * timestamps epoch millis, booleans 0/1.
  */
sealed trait ColStats
final case class NumStats(min: Double, max: Double) extends ColStats
final case class StrStats(min: String, max: String) extends ColStats

/** Statistics for one dataset: row count, size estimate and column stats
  * keyed by flattened column token.
  */
final case class DatasetStats(rowCount: Long, sizeBytes: Long, cols: Map[String, ColStats])

/** Builds and caches dataset statistics.
  *
  * In the paper, MMP reads columnar min/max from parquet partition metadata
  * (or a cache of it) so that no table scan is needed at pruning time. This
  * catalog is that substrate: stats are computed once at ingestion time with
  * a single aggregation job per dataset and thereafter served from memory.
  * [[ParquetStats]] provides the alternative path that reads the same
  * numbers directly from real parquet footers.
  */
final class StatsCatalog {
  private val cache = scala.collection.mutable.Map.empty[String, DatasetStats]

  def put(name: String, stats: DatasetStats): Unit = cache(name) = stats
  def apply(name: String): DatasetStats =
    cache.getOrElse(name, throw new NoSuchElementException(s"no stats for dataset '$name'"))
  def get(name: String): Option[DatasetStats] = cache.get(name)
  def names: Set[String] = cache.keySet.toSet

  /** Compute and register stats for `df` with one aggregation job. */
  def ingest(name: String, df: DataFrame): DatasetStats = {
    val s = StatsCatalog.compute(df)
    put(name, s)
    s
  }

  def remove(name: String): Unit = cache.remove(name)
}

object StatsCatalog {

  /** Quote a (possibly dotted) flattened column token for use in `col`. */
  def qcol(token: String): Column = col(s"`$token`")

  /** Flattened (token, column-expression, leaf type) triples for a schema. */
  def flatColumns(schema: StructType): Seq[(String, String, DataType)] = {
    def walk(prefix: String, path: String, dt: DataType): Seq[(String, String, DataType)] = dt match {
      case st: StructType =>
        st.fields.toSeq.flatMap { f =>
          val tok = if (prefix.isEmpty) f.name else s"$prefix.${f.name}"
          val p = if (path.isEmpty) s"`${f.name}`" else s"$path.`${f.name}`"
          walk(tok, p, f.dataType)
        }
      case _ => Seq((prefix, path, dt))
    }
    walk("", "", schema)
  }

  /** Project a (possibly nested) DataFrame to a flat one whose column names
    * are the flattened schema tokens (`product.price` etc.).
    */
  def flatten(df: DataFrame): DataFrame = {
    val cols = flatColumns(df.schema).map { case (tok, path, _) => expr(path).as(tok) }
    df.select(cols: _*)
  }

  /** One-pass min/max/count over every orderable column of `df`. */
  def compute(df: DataFrame): DatasetStats = {
    val flat = flatColumns(df.schema)
    val aggs = flat.flatMap { case (tok, path, dt) =>
      val c = expr(path)
      dt match {
        case _: NumericType | DateType | TimestampType | BooleanType | StringType =>
          Seq(min(c).as(s"min::$tok"), max(c).as(s"max::$tok"))
        case _ => Seq.empty
      }
    } :+ count(lit(1)).as("cnt::")

    val row = df.agg(aggs.head, aggs.tail: _*).collect()(0)
    val byName = row.schema.fieldNames.zipWithIndex.toMap
    val rowCount = row.getLong(byName("cnt::"))

    def numeric(v: Any): Double = v match {
      case d: java.sql.Date      => d.toLocalDate.toEpochDay.toDouble
      case t: java.sql.Timestamp => t.getTime.toDouble
      case b: Boolean            => if (b) 1.0 else 0.0
      case bd: java.math.BigDecimal => bd.doubleValue
      case n: Number             => n.doubleValue
      case other => throw new IllegalArgumentException(s"non-numeric stat value $other")
    }

    val cols = flat.flatMap { case (tok, _, dt) =>
      (byName.get(s"min::$tok"), byName.get(s"max::$tok")) match {
        case (Some(i), Some(j)) if row.get(i) != null && row.get(j) != null =>
          dt match {
            case StringType => Some(tok -> StrStats(row.getString(i), row.getString(j)))
            case _          => Some(tok -> NumStats(numeric(row.get(i)), numeric(row.get(j))))
          }
        case _ => None
      }
    }.toMap

    DatasetStats(rowCount, rowCount * df.schema.defaultSize, cols)
  }
}
