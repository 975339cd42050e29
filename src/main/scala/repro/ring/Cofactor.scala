package repro.ring

import org.apache.spark.sql.{Column, DataFrame, Dataset, Encoder, Encoders, SparkSession}
import org.apache.spark.sql.expressions.Aggregator
import org.apache.spark.sql.functions._

/** Attribute layout of a cofactor triple: which DataFrame columns are lifted
  * as continuous (λ_con) and which as categorical (λ_cat), in triple index
  * order. Categorical values must be integer-encoded (as in the paper).
  */
final case class CofactorSchema(cont: Seq[String], cat: Seq[String]) {
  val k: Int = cont.size
  val l: Int = cat.size

  /** Triple index of a continuous attribute. */
  def contIdx(name: String): Int = {
    val i = cont.indexOf(name); require(i >= 0, s"$name is not a continuous attr of $this"); i
  }

  /** Triple index of a categorical attribute. */
  def catIdx(name: String): Int = {
    val i = cat.indexOf(name); require(i >= 0, s"$name is not a categorical attr of $this"); i
  }

  /** Concatenation for factorized multiplication (this side's attrs first). */
  def ++(o: CofactorSchema): CofactorSchema = CofactorSchema(cont ++ o.cont, cat ++ o.cat)
}

/** The paper's `SUM_TRIPLE` aggregate as a Spark typed [[Aggregator]]: rows are
  * pre-projected to `(Array[Double] continuous, Array[Int] categorical)` and
  * reduced with the fused lift-and-add of [[Triple]]. Buffers are
  * Java-serialized — triples are tiny relative to the data.
  */
final class TripleAggregator(k: Int, l: Int)
    extends Aggregator[(Array[Double], Array[Int]), Triple, Triple] {
  override def zero: Triple = Triple.zero(k, l)
  override def reduce(b: Triple, a: (Array[Double], Array[Int])): Triple = b.addRow(a._1, a._2)
  override def merge(b1: Triple, b2: Triple): Triple = b1.plus(b2)
  override def finish(r: Triple): Triple = r
  override def bufferEncoder: Encoder[Triple] = Encoders.javaSerialization[Triple]
  override def outputEncoder: Encoder[Triple] = Encoders.javaSerialization[Triple]
}

/** Computation of cofactor triples over DataFrames. */
object Cofactor {

  /** Column pair (continuous array, categorical array) feeding [[TripleAggregator]].
    * Continuous attrs are cast to double, categorical to int; nulls must have
    * been imputed upstream (MICE always aggregates the imputed dataset X̃).
    */
  def inputCols(schema: CofactorSchema): (Column, Column) = {
    val c =
      if (schema.cont.isEmpty) array().cast("array<double>")
      else array(schema.cont.map(col(_).cast("double")): _*)
    val d =
      if (schema.cat.isEmpty) array().cast("array<int>")
      else array(schema.cat.map(col(_).cast("int")): _*)
    (c, d)
  }

  private def toPairs(df: DataFrame, schema: CofactorSchema): Dataset[(Array[Double], Array[Int])] = {
    val (c, d) = inputCols(schema)
    implicit val enc: Encoder[(Array[Double], Array[Int])] =
      Encoders.tuple(ExprEncoders.doubleArray, ExprEncoders.intArray)
    df.select(c.as("c"), d.as("d")).as[(Array[Double], Array[Int])]
  }

  /** One-pass cofactor triple of `df` under `schema` (SELECT SUM_TRIPLE(…) FROM df). */
  def triple(df: DataFrame, schema: CofactorSchema): Triple = {
    val ds = toPairs(df, schema)
    val agg = new TripleAggregator(schema.k, schema.l)
    val rows = ds.select(agg.toColumn).collect()
    if (rows.isEmpty) Triple.zero(schema.k, schema.l) else rows.head
  }

  /** Register the untyped `sum_triple(contArray, catArray) -> binary` UDAF in
    * `spark` for the given arity, under `name`. The binary payload is a
    * Java-serialized [[Triple]] ([[Triple.fromBytes]]); used for grouped
    * partial triples in factorized evaluation and callable from SQL.
    */
  def registerUdaf(spark: SparkSession, name: String, k: Int, l: Int): Unit = {
    implicit val enc: Encoder[(Array[Double], Array[Int])] =
      Encoders.tuple(ExprEncoders.doubleArray, ExprEncoders.intArray)
    val agg = new Aggregator[(Array[Double], Array[Int]), Triple, Array[Byte]] {
      override def zero: Triple = Triple.zero(k, l)
      override def reduce(b: Triple, a: (Array[Double], Array[Int])): Triple = b.addRow(a._1, a._2)
      override def merge(b1: Triple, b2: Triple): Triple = b1.plus(b2)
      override def finish(r: Triple): Array[Byte] = Triple.toBytes(r)
      override def bufferEncoder: Encoder[Triple] = Encoders.javaSerialization[Triple]
      override def outputEncoder: Encoder[Array[Byte]] = Encoders.BINARY
    }
    spark.udf.register(name, org.apache.spark.sql.functions.udaf(agg, enc))
  }

  /** Grouped partial triples: `SELECT keys, SUM_TRIPLE(attrs) FROM df GROUP BY keys`.
    * Returns a DataFrame with the key columns plus a binary `__triple` column.
    */
  def partialTriples(df: DataFrame, keys: Seq[String], schema: CofactorSchema,
                     tripleCol: String = "__triple"): DataFrame = {
    val spark = df.sparkSession
    val fn = s"sum_triple_${schema.k}_${schema.l}"
    registerUdaf(spark, fn, schema.k, schema.l)
    val (c, d) = inputCols(schema)
    df.groupBy(keys.map(col): _*)
      .agg(call_udf(fn, c, d).as(tripleCol))
  }
}

/** Explicit encoders for primitive arrays (kept off implicit search paths so
  * suites can import what they need without ambiguity).
  */
object ExprEncoders {
  val doubleArray: Encoder[Array[Double]] =
    org.apache.spark.sql.catalyst.encoders.ExpressionEncoder[Array[Double]]()
  val intArray: Encoder[Array[Int]] =
    org.apache.spark.sql.catalyst.encoders.ExpressionEncoder[Array[Int]]()
  val longArray: Encoder[Array[Long]] =
    org.apache.spark.sql.catalyst.encoders.ExpressionEncoder[Array[Long]]()
}
