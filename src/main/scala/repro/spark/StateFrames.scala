package repro.spark

import org.apache.spark.sql.{DataFrame, Row, SparkSession}
import org.apache.spark.sql.types._
import repro.core.Value

/** Bridges between runtime entity state / event logs and DataFrames, so
  * DuckDB oracle checks (`repro.Oracle`) can compare stateful-dataflow
  * results against plain SQL over the same inputs. */
object StateFrames {

  private def sparkType(v: Value): DataType = v match {
    case Value.VInt(_)    => LongType
    case Value.VDouble(_) => DoubleType
    case Value.VBool(_)   => BooleanType
    case _                => StringType
  }

  private def sparkValue(v: Value): Any = v match {
    case Value.VInt(i)    => i
    case Value.VDouble(d) => d
    case Value.VBool(b)   => b
    case Value.VStr(s)    => s
    case other            => repro.core.Eval.show(other)
  }

  /** One row per entity of `clazz`: the entity key (column `key`) plus the
    * selected scalar fields with native Spark types. */
  def entityFrame(
      spark: SparkSession,
      state: Map[(String, String), Map[String, Value]],
      clazz: String,
      fields: Seq[String],
  ): DataFrame = {
    val rows = state.collect { case ((c, k), fs) if c == clazz =>
      Row.fromSeq(k +: fields.map(f => sparkValue(fs(f))))
    }.toList
    val sample = state.collectFirst { case ((c, _), fs) if c == clazz => fs }
      .getOrElse(throw new NoSuchElementException(s"no $clazz entities in state"))
    val schema = StructType(
      StructField("key", StringType, nullable = false) +:
        fields.map(f => StructField(f, sparkType(sample(f)), nullable = false)))
    spark.createDataFrame(rows.asJavaList, schema)
  }

  /** Build a DataFrame from explicit rows (event logs). Column types come
    * from the first row's values. */
  def logFrame(spark: SparkSession, cols: Seq[String], rows: Seq[Seq[Value]]): DataFrame = {
    require(rows.nonEmpty, "logFrame needs at least one row")
    val schema = StructType(cols.zip(rows.head).map { case (c, v) =>
      StructField(c, sparkType(v), nullable = false)
    })
    val data = rows.map(r => Row.fromSeq(r.map(sparkValue)))
    spark.createDataFrame(data.asJavaList, schema)
  }

  private implicit class ListOps[T](private val xs: Seq[T]) extends AnyVal {
    def asJavaList: java.util.List[T] = {
      val l = new java.util.ArrayList[T](xs.size)
      xs.foreach(l.add)
      l
    }
  }
}
