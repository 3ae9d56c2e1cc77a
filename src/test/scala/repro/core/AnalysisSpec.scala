package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Ast._

/** Restriction checker tests (§3.2, Definition 3.1) — every accept/reject
  * example the paper discusses, plus edge cases.
  */
class AnalysisSpec extends AnyFunSuite {

  private def violations(src: String) = Analysis.check(Parser.parse(src))
  private def accepted(src: String): Unit = {
    val v = violations(src)
    assert(v.isEmpty, s"expected accept, got: $v")
  }
  private def rejected(src: String): Unit =
    assert(violations(src).nonEmpty, "expected reject, got accept")

  // ------------------------------------------------- paper accept examples

  test("incremental group-by update is accepted (§3.2)") {
    // for i do C[V[i].K] += V[i].D
    accepted("for i = 0, 9 do C[V[i].K] += V[i].D;")
  }

  test("increment-then-read at the same location is accepted (exception b)") {
    // for i do { for j do V[i] += 1; W[i] := V[i] }
    accepted("for i = 0, 9 do { for j = 0, 9 do V[i] += 1; W[i] := V[i]; };")
  }

  test("write-then-read of the same affine location is accepted (exception a)") {
    accepted("for i = 0, 9 do { V[i] := W[i]; U[i] := V[i]; };")
  }

  test("two-loop stencil rewrite is accepted (§3.2)") {
    accepted(
      """for i = 1, 8 do Vp[i] := V[i];
        |for i = 1, 8 do V[i] := (Vp[i-1] + Vp[i+1])/2;
        |""".stripMargin)
  }

  test("vectorized temporary is accepted (§3.2 n[i] rewrite)") {
    accepted("for i = 0, 9 do { n[i] := V[i]; W[i] := f(n[i]); };")
  }

  test("matrix multiplication is accepted") {
    accepted(repro.programs.Benchmarks.matrixMultiplication.source)
  }

  test("all benchmark programs are accepted") {
    for (p <- repro.programs.Benchmarks.all)
      assert(violations(p.source).isEmpty, s"${p.name}: ${violations(p.source)}")
  }

  // ------------------------------------------------- paper reject examples

  test("stencil recurrence is rejected: V[i] := (V[i-1]+V[i+1])/2") {
    rejected("for i = 1, 8 do V[i] := (V[i-1] + V[i+1])/2;")
  }

  test("scalar temporary in a loop is rejected: n := V[i]") {
    rejected("for i = 0, 9 do { n := V[i]; W[i] := f(n); };")
  }

  test("matrix factorization with scalar pq/error is rejected (§3.2)") {
    rejected(
      """for i = 0, n-1 do
        |  for j = 0, m-1 do {
        |    pq := 0.0;
        |    for k = 0, l-1 do
        |      pq += P[i,k]*Q[k,j];
        |    error := R[i,j] - pq;
        |    for k = 0, l-1 do {
        |      P2[i,k] += a*(2.0*error*Q[k,j] - b*P[i,k]);
        |      Q2[k,j] += a*(2.0*error*P[i,k] - b*Q[k,j]);
        |    };
        |  };
        |""".stripMargin)
  }

  test("exception-b violation: read under an extra loop index (§3.2 M[i,j] example)") {
    rejected(
      """for i = 0, 9 do {
        |  for j = 0, 9 do {
        |    V[i] += 1;
        |    M[i,j] := V[i];
        |  };
        |};
        |""".stripMargin)
  }

  test("read-before-write of the same array is rejected") {
    rejected("for i = 0, 9 do { U[i] := V[i]; V[i] := 0.0; };")
  }

  test("aggregated array read in the same loop without exception is rejected") {
    rejected("for i = 0, 9 do { C[K[i]] += 1; W[i] := C[i]; };")
  }

  test("non-affine destination index is rejected") {
    rejected("for i = 0, 9 do V[W[i]] := 1.0;")
  }

  test("destination not covering all loop indexes is rejected") {
    rejected("for i = 0, 9 do for j = 0, 9 do V[i] := 0.0;")
  }

  test("quadratic index is not affine") {
    rejected("for i = 0, 9 do V[i*i] := 1.0;")
  }

  test("declaration inside a for-loop is rejected") {
    rejected("for i = 0, 9 do { var t: double = 0.0; V[i] := t; };")
  }

  test("while nested in a for-loop is rejected (sequential)") {
    rejected("for i = 0, 9 do while (b) x += 1;")
  }

  test("duplicate loop index is rejected") {
    rejected("for i = 0, 9 do for i = 0, 9 do V[i] := 0.0;")
  }

  test("traversed collection cannot be aggregated in the same for-in") {
    rejected("for c in C do C[c] += 1;")
  }

  // ---------------------------------------------------------- affine unit

  test("affine expressions") {
    val lv = Set("i", "j")
    assert(Analysis.affineExpr(Parser.parseExpr("2*i + 3*j + 1"), lv))
    assert(Analysis.affineExpr(Parser.parseExpr("i - 1"), lv))
    assert(Analysis.affineExpr(Parser.parseExpr("n*2 + i"), lv)) // n is a constant here
    assert(!Analysis.affineExpr(Parser.parseExpr("i*j"), lv))
    assert(!Analysis.affineExpr(Parser.parseExpr("V[i]"), lv))
  }

  test("affine destinations must cover the context") {
    val d = LIndex("V", List(Ref("i")))
    assert(Analysis.affine(d, Set("i"), Set("i", "j")))
    assert(!Analysis.affine(d, Set("i", "j"), Set("i", "j")))
    assert(Analysis.affine(LVar("x"), Set.empty, Set("i")))
    assert(!Analysis.affine(LVar("x"), Set("i"), Set("i")))
  }

  test("overlap is by array name") {
    assert(Analysis.overlap(LIndex("V", List(Ref("i"))), LIndex("V", List(Ref("j")))))
    assert(Analysis.overlap(LVar("V"), LIndex("V", List(Ref("i")))))
    assert(!Analysis.overlap(LVar("V"), LVar("W")))
  }
}
