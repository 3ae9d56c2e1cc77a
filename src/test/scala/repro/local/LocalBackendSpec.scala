package repro.local

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Diablo
import repro.core.Translate._
import repro.local.LocalBackend._

/** Detailed semantics of the local backend: monoids, merge (◁), lookup
  * defaults, while-loops, conditionals, tuples and records.
  */
class LocalBackendSpec extends AnyFunSuite {

  private def vec(vs: (Long, Any)*): ArrayD =
    ArrayD(vs.map { case (k, v) => List[Any](k) -> v }.toMap, 1)

  private def run(src: String, sigs: Map[String, Sig],
                  data: Map[String, Data], par: Boolean = false) =
    LocalBackend.run(Diablo.compile(src, sigs), data, par)

  private def sc(st: Map[String, Data], n: String): Any =
    st(n).asInstanceOf[ScalarD].v
  private def arr(st: Map[String, Data], n: String): Map[List[Any], Any] =
    st(n).asInstanceOf[ArrayD].m

  test("array merge ◁ keeps old entries and overrides updated ones") {
    val st = run("for i = 0, 1 do V[i] := 9.0;",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 1.0, 1L -> 2.0, 5L -> 3.0)))
    assert(arr(st, "V") == Map(List(0L) -> 9.0, List(1L) -> 9.0, List(5L) -> 3.0))
  }

  test("incremental update adds to existing values") {
    val st = run("for i = 0, 2 do V[i] += 10.0;",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 1.0, 1L -> 2.0, 2L -> 3.0)))
    assert(arr(st, "V") == Map(List(0L) -> 11.0, List(1L) -> 12.0, List(2L) -> 13.0))
  }

  test("incremental update on a fresh array starts from the identity") {
    val st = run("var C: map[long,long] = map(); for v in V do C[v] += 1;",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 7L, 1L -> 7L, 2L -> 8L)))
    assert(arr(st, "C") == Map(List(7L) -> 2L, List(8L) -> 1L))
  }

  test("*= multiplies across iterations") {
    val st = run("var p: double = 1.0; for v in V do p *= v;",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 2.0, 1L -> 3.0, 2L -> 4.0)))
    assert(sc(st, "p") == 24.0)
  }

  test("min= and max= on scalars") {
    val st = run(
      "var lo: double = 1.0e30; var hi: double = -1.0e30; " +
      "for v in V do { lo min= v; hi max= v; };",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 5.0, 1L -> -2.0, 2L -> 9.0)))
    assert(sc(st, "lo") == -2.0)
    assert(sc(st, "hi") == 9.0)
  }

  test("min= on tuples is lexicographic (argmin)") {
    val st = run(
      "var m: (double,long) = (1.0e30, 0); for v in V do m min= (v, i0);",
      Map("V" -> ArraySig(1), "i0" -> ScalarSig),
      Map("V" -> vec(0L -> 5.0, 1L -> 2.0), "i0" -> ScalarD(7L)))
    val Rec(fields) = sc(st, "m"): @unchecked
    assert(fields == Vector("_1" -> 2.0, "_2" -> 7L))
  }

  test("&&= and ||= fold booleans") {
    val st = run(
      "var all: bool = true; var any: bool = false; " +
      "for v in V do { all &&= v > 0.0; any ||= v > 100.0; };",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 5.0, 1L -> 50.0)))
    assert(sc(st, "all") == true)
    assert(sc(st, "any") == false)
  }

  test("while loop repeats until the condition fails") {
    val st = run("var k: long = 0; var s: long = 0; while (k < 5) { k += 1; s += k; };",
      Map.empty, Map.empty)
    assert(sc(st, "k") == 5L)
    assert(sc(st, "s") == 15L)
  }

  test("while loop with a distributed body") {
    val st = run(
      "var k: long = 0; while (k < 3) { k += 1; for i = 0, 2 do V[i] += 1.0; };",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> 0.0, 1L -> 0.0, 2L -> 0.0)))
    assert(arr(st, "V") == Map(List(0L) -> 3.0, List(1L) -> 3.0, List(2L) -> 3.0))
  }

  test("if/else selects the right accumulator") {
    val st = run(
      "var a: long = 0; var b: long = 0; " +
      "for v in V do if (v < 3.0) a += 1; else b += 1;",
      Map("V" -> ArraySig(1)),
      Map("V" -> vec(0L -> 1.0, 1L -> 2.0, 2L -> 5.0, 3L -> 9.0)))
    assert(sc(st, "a") == 2L)
    assert(sc(st, "b") == 2L)
  }

  test("matrix assignment with two keys") {
    val st = run("for i = 0, 1 do for j = 0, 1 do M[i,j] := i*10 + j;",
      Map("M" -> ArraySig(2)),
      Map("M" -> ArrayD(Map(List[Any](0L, 0L) -> 0L), 2)))
    assert(arr(st, "M") == Map(
      List(0L, 0L) -> 0L, List(0L, 1L) -> 1L,
      List(1L, 0L) -> 10L, List(1L, 1L) -> 11L))
  }

  test("reading a missing element yields no update (empty bag semantics)") {
    val st = run("for i = 5, 9 do W[i] := V[i];",
      Map("V" -> ArraySig(1), "W" -> ArraySig(1)),
      Map("V" -> vec(5L -> 1.0), "W" -> vec(0L -> 0.0)))
    assert(arr(st, "W") == Map(List(0L) -> 0.0, List(5L) -> 1.0))
  }

  test("record field access in loops") {
    val p = Rec(Vector("x" -> 3.0, "y" -> 4.0))
    val st = run("var s: double = 0.0; for v in V do s += v.x * v.y;",
      Map("V" -> ArraySig(1)), Map("V" -> vec(0L -> p, 1L -> p)))
    assert(sc(st, "s") == 24.0)
  }

  test("scalar assignment with a false condition keeps the old value") {
    val st = run("var x: long = 7; if (1 > 2) x := 9;", Map.empty, Map.empty)
    assert(sc(st, "x") == 7L)
  }

  test("range with driver-computed bounds") {
    val st = run("for i = 0, n-1 do V[i] := 1.0;",
      Map("V" -> ArraySig(1), "n" -> ScalarSig),
      Map("V" -> vec(0L -> 0.0), "n" -> ScalarD(3L)))
    assert(arr(st, "V").keySet == Set(List(0L), List(1L), List(2L)))
  }

  test("division is double division (Spark SQL semantics)") {
    val st = run("var x: double = 0.0; x := 7/2;", Map.empty, Map.empty)
    assert(sc(st, "x") == 3.5)
  }

  test("modulo stays integral on longs") {
    val st = run("var x: long = 0; x := 7%3;", Map.empty, Map.empty)
    assert(sc(st, "x") == 1L)
  }

  test("parallel mode groups identically to sequential for word count") {
    val src = "var C: map[long,long] = map(); for v in V do C[v] += 1;"
    val data = Map("V" -> ArrayD(
      (0L until 500L).map(i => List[Any](i) -> ((i % 7): Any)).toMap, 1))
    val seq = run(src, Map("V" -> ArraySig(1)), data, par = false)
    val par = run(src, Map("V" -> ArraySig(1)), data, par = true)
    assert(arr(seq, "C") == arr(par, "C"))
  }

  test("combine is null-neutral") {
    import repro.core.Comprehension._
    assert(LocalBackend.combine(MSum, null, 5L) == 5L)
    assert(LocalBackend.combine(MSum, 5L, null) == 5L)
    assert(LocalBackend.combine(MMin, null, 3.0) == 3.0)
    assert(LocalBackend.combine(MMax, 2L, 9L) == 9L)
    assert(LocalBackend.combine(MAnd, true, false) == false)
    assert(LocalBackend.combine(MOr, false, true) == true)
  }

  test("compareAny orders records lexicographically") {
    val a = Rec(Vector("_1" -> 1.0, "_2" -> 9L))
    val b = Rec(Vector("_1" -> 1.0, "_2" -> 3L))
    val c = Rec(Vector("_1" -> 0.5, "_2" -> 99L))
    assert(LocalBackend.compareAny(a, b) > 0)
    assert(LocalBackend.compareAny(c, a) < 0)
  }

  test("arith promotes long to double") {
    assert(LocalBackend.arith("+", 1L, 2.5) == 3.5)
    assert(LocalBackend.arith("*", 2.0, 3L) == 6.0)
    assert(LocalBackend.arith("+", 2L, 3L) == 5L)
  }
}
