package repro.spark

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec, SynthData}
import repro.core.Diablo
import repro.core.Translate.ArraySig
import repro.local.LocalBackend.Rec
import repro.spark.SparkBackend._

/** DIABLO over the provided TPC-H-lite generators: loop programs written
  * against lineitem-shaped data, oracle-checked with DuckDB. Exercises the
  * whole pipeline on realistic OLAP input (SF=0.01 scale).
  */
class SynthDataSpec extends SparkSpec {

  // project off the date column: java.sql.Date decoding needs extra
  // --add-opens on JDK 17 and these tests do not use it
  private lazy val li = SynthData.lineitem(spark, sf = 0.001)
    .select("l_orderkey", "l_extendedprice").cache()

  /** lineitem as a DIABLO vector of (K = orderkey, A = extendedprice). */
  private lazy val liArr: SArr = {
    val df = li.select(
      monotonically_increasing_id().as("k1"),
      struct(col("l_orderkey").as("K"),
             col("l_extendedprice").as("A")).as("v"))
    SArr(Some(df), 1)
  }

  test("DIABLO revenue-per-order over lineitem matches DuckDB") {
    val src = "var C: map[long,double] = map(); for v in V do C[v.K] += v.A;"
    val code = Diablo.compile(src, Map("V" -> ArraySig(1)))
    val st = SparkBackend.run(code, Map("V" -> liArr), spark)
    val got = st("C").asInstanceOf[SArr].df.get
      .select(col("k1").cast("long").as("o"), col("v").cast("double").as("rev"))
    Oracle.assertEquivalent(got,
      "select cast(l_orderkey as bigint) as o, sum(cast(l_extendedprice as double)) as rev " +
      "from lineitem group by l_orderkey",
      "lineitem" -> li)
  }

  test("DIABLO conditional aggregation over lineitem matches DuckDB") {
    val src =
      """var total: double = 0.0;
        |var cnt: long = 0;
        |for v in V do if (v.A < 50000.0) { total += v.A; cnt += 1; };
        |""".stripMargin
    val code = Diablo.compile(src, Map("V" -> ArraySig(1)))
    val st = SparkBackend.run(code, Map("V" -> liArr), spark)
    import spark.implicits._
    // round: summation order differs between Spark and DuckDB, and the
    // oracle canon is fixed-point (6 decimals) on an ~1e8-scale sum
    val got = Seq((math.round(st("total").asInstanceOf[SScalar].v.asInstanceOf[Double]),
                   st("cnt").asInstanceOf[SScalar].v.asInstanceOf[Long])).toDF("t", "c")
    Oracle.assertEquivalent(got,
      "select cast(round(sum(cast(l_extendedprice as double))) as bigint) as t, " +
      "count(*) as c " +
      "from lineitem where cast(l_extendedprice as double) < 50000.0",
      "lineitem" -> li)
  }

  test("zipf keys from SynthData drive a skewed DIABLO group-by") {
    val zdf = SynthData.zipfKeys(spark, rows = 5000, nKeys = 50)
      .select(monotonically_increasing_id().as("k1"),
              struct(col("k").as("K"), col("v").as("A")).as("v"))
    val src = "var C: map[long,double] = map(); for v in V do C[v.K] += v.A;"
    val code = Diablo.compile(src, Map("V" -> ArraySig(1)))
    val st = SparkBackend.run(code, Map("V" -> SArr(Some(zdf), 1)), spark)
    val counts = st("C").asInstanceOf[SArr].df.get.count()
    assert(counts > 0 && counts <= 50)
  }
}
