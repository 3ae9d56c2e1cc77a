package repro.spark

import repro.SparkSpec
import repro.core.Diablo
import repro.core.Translate._
import repro.local.LocalBackend.{ArrayD, Data, ScalarD}
import repro.spark.SparkBackend._
import repro.spark.SparkTestUtil._

/** Spark-side coverage of every incremental-update monoid, including the
  * ones no benchmark program uses (`*=`) and array-destination min/max.
  */
class SparkMonoidSpec extends SparkSpec {

  private def vec(vs: (Long, Any)*): ArrayD =
    ArrayD(vs.map { case (k, v) => List[Any](k) -> v }.toMap, 1)

  private def run(src: String, sigs: Map[String, Sig], data: Map[String, Data]) =
    SparkBackend.run(Diablo.compile(src, sigs), toSparkState(spark, data), spark)

  test("*= product aggregation on Spark") {
    val st = run("var p: double = 1.0; for v in V do p *= v;",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 2.0, 1L -> 3.0, 2L -> 4.0)))
    assert(outScalar(st, "p") == 24.0)
  }

  test("scalar min=/max= on Spark") {
    val st = run(
      "var lo: double = 1.0e30; var hi: double = -1.0e30; " +
      "for v in V do { lo min= v; hi max= v; };",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 5.0, 1L -> -2.0, 2L -> 9.0)))
    assert(outScalar(st, "lo") == -2.0)
    assert(outScalar(st, "hi") == 9.0)
  }

  test("array-destination min= with grouping on Spark") {
    // per-key minimum over (K, A) records
    val recs = List(
      (1L, 5.0), (1L, 2.0), (2L, 7.0), (2L, 9.0), (1L, 8.0)
    ).zipWithIndex.map { case ((k, a), i) =>
      List[Any](i.toLong) ->
        (repro.local.LocalBackend.Rec(Vector("K" -> k, "A" -> a)): Any)
    }.toMap
    val st = run(
      "var M: map[long,double] = map(); for v in V do M[v.K] min= v.A;",
      Map("V" -> ArraySig(1)), Map("V" -> ArrayD(recs, 1)))
    val m = dfToArray(outDF(st, "M"), 1).m
    assert(m == Map(List(1L) -> 2.0, List(2L) -> 7.0))
  }

  test("array-destination &&= / ||= on Spark") {
    val st = run(
      "var A: map[long,bool] = map(); var O: map[long,bool] = map(); " +
      "for v in V do { A[v.K] &&= v.A > 0.0; O[v.K] ||= v.A > 6.0; };",
      Map("V" -> ArraySig(1)),
      Map("V" -> ArrayD(List(
        (1L, 5.0), (1L, -2.0), (2L, 7.0)
      ).zipWithIndex.map { case ((k, a), i) =>
        List[Any](i.toLong) ->
          (repro.local.LocalBackend.Rec(Vector("K" -> k, "A" -> a)): Any)
      }.toMap, 1)))
    assert(dfToArray(outDF(st, "A"), 1).m ==
      Map(List(1L) -> false, List(2L) -> true))
    assert(dfToArray(outDF(st, "O"), 1).m ==
      Map(List(1L) -> false, List(2L) -> true))
  }

  test("min= over tuples is argmin on Spark (struct ordering)") {
    val st = run(
      "var m: (double,long) = (1.0e30, 0); for i = 0, n-1 do m min= (V[i], i);",
      Map("V" -> ArraySig(1), "n" -> ScalarSig),
      Map("V" -> vec(0L -> 5.0, 1L -> 2.0, 2L -> 8.0), "n" -> ScalarD(3L)))
    val rec = outScalar(st, "m").asInstanceOf[repro.local.LocalBackend.Rec]
    assert(rec.fields == Vector("_1" -> 2.0, "_2" -> 1L))
  }
}
