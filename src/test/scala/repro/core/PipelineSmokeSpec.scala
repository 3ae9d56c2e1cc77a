package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Translate._
import repro.local.LocalBackend
import repro.local.LocalBackend._
import repro.programs.Benchmarks

/** Early end-to-end smoke tests of the pipeline on the local backend
  * (no Spark): translation runs and produces the arithmetically expected
  * results on tiny inputs.
  */
class PipelineSmokeSpec extends AnyFunSuite {

  private def runLocal(name: String, scale: Int, par: Boolean = false)
      : Map[String, Data] = {
    val p = Benchmarks.byName(name)
    val code = Diablo.compile(p.source, p.sigs)
    LocalBackend.run(code, p.data(scale, 42), par)
  }

  private def scalar(st: Map[String, Data], n: String): Any =
    st(n).asInstanceOf[ScalarD].v
  private def array(st: Map[String, Data], n: String): Map[List[Any], Any] =
    st(n).asInstanceOf[ArrayD].m

  test("sum matches direct computation") {
    val p = Benchmarks.sum
    val data = p.data(100, 42)
    val expected = data("V").asInstanceOf[ArrayD].m.values
      .map(_.asInstanceOf[Double]).sum
    val st = LocalBackend.run(Diablo.compile(p.source, p.sigs), data)
    assert(math.abs(scalar(st, "sum").asInstanceOf[Double] - expected) < 1e-9)
  }

  test("count counts") {
    val st = runLocal("Count", 57)
    assert(scalar(st, "cnt") == 57L)
  }

  test("word count matches groupBy") {
    val p = Benchmarks.wordCount
    val data = p.data(200, 1)
    val words = data("W").asInstanceOf[ArrayD].m.values.map(_.asInstanceOf[String])
    val expected = words.groupBy(identity).map { case (w, ws) => (List[Any](w), ws.size.toLong) }
    val st = LocalBackend.run(Diablo.compile(p.source, p.sigs), data)
    assert(array(st, "C") == expected)
  }

  test("matrix multiplication matches brute force") {
    val p = Benchmarks.matrixMultiplication
    val d = 5
    val data = p.data(d, 3)
    val m = data("M").asInstanceOf[ArrayD].m
    val n = data("N").asInstanceOf[ArrayD].m
    val st = LocalBackend.run(Diablo.compile(p.source, p.sigs), data)
    val r = array(st, "R")
    for (i <- 0L until d.toLong; j <- 0L until d.toLong) {
      val expected = (0L until d.toLong).map(k =>
        m(List(i, k)).asInstanceOf[Double] * n(List(k, j)).asInstanceOf[Double]).sum
      assert(math.abs(r(List(i, j)).asInstanceOf[Double] - expected) < 1e-9,
        s"R[$i,$j]")
    }
  }

  test("all benchmark programs translate and run on tiny inputs (seq)") {
    for (p <- Benchmarks.all) {
      val code = Diablo.compile(p.source, p.sigs)
      val st = LocalBackend.run(code, p.data(20, 7))
      for (o <- p.outputs) assert(st.contains(o), s"${p.name}: missing output $o")
    }
  }

  test("parallel mode agrees with sequential on all benchmarks") {
    for (p <- Benchmarks.all) {
      val code = Diablo.compile(p.source, p.sigs)
      val seq = LocalBackend.run(code, p.data(30, 11), par = false)
      val par = LocalBackend.run(code, p.data(30, 11), par = true)
      for (o <- p.outputs) (seq(o), par(o)) match {
        // parallel reduction reassociates floating-point sums
        case (ScalarD(a: Double), ScalarD(b: Double)) =>
          assert(math.abs(a - b) <= 1e-6 * (1.0 + math.abs(a)), s"${p.name}.$o")
        case (ScalarD(a), ScalarD(b)) => assert(a == b, s"${p.name}.$o")
        case (ArrayD(a, _), ArrayD(b, _)) =>
          assert(a.keySet == b.keySet, s"${p.name}.$o keys")
          for (k <- a.keySet) (a(k), b(k)) match {
            case (x: Double, y: Double) =>
              assert(math.abs(x - y) < 1e-6, s"${p.name}.$o[$k]")
            case (x, y) => assert(x == y, s"${p.name}.$o[$k]")
          }
        case other => fail(s"${p.name}.$o kind mismatch: $other")
      }
    }
  }
}
