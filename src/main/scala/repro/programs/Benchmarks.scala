package repro.programs

import repro.core.Translate.{ArraySig, ScalarSig, Sig}
import repro.local.LocalBackend.{Data, ScalarD}

/** The benchmark programs of §6 / Appendix B, written in the loop-based
  * source language. `data(scale, seed)` builds deterministic inputs whose
  * size grows with `scale` (the meaning of scale is per program: element
  * count for collections, matrix dimension for matrix programs).
  *
  * PageRank uses the edge-list form (the measured datasets were
  * `RDD[(Long,Long)]`), KMeans expresses ArgMin with the lexicographic
  * `min=` monoid over (distance, index) pairs, and Avg as sum/count
  * accumulators — see DESIGN.md (Substitutions).
  */
object Benchmarks {

  final case class ProgramSpec(
      name: String,
      source: String,
      sigs: Map[String, Sig],
      data: (Int, Long) => Map[String, Data],
      outputs: List[String])

  val count = ProgramSpec("Count",
    """var cnt: long = 0;
      |for v in V do cnt += 1;
      |""".stripMargin,
    Map("V" -> ArraySig(1)),
    (n, s) => Map("V" -> BenchData.doubles(n, s)),
    List("cnt"))

  val sum = ProgramSpec("Sum",
    """var sum: double = 0.0;
      |for v in V do sum += v;
      |""".stripMargin,
    Map("V" -> ArraySig(1)),
    (n, s) => Map("V" -> BenchData.doubles(n, s)),
    List("sum"))

  val average = ProgramSpec("Average",
    """var sum: double = 0.0;
      |var cnt: long = 0;
      |for v in V do { sum += v; cnt += 1; };
      |var avg: double = sum/cnt;
      |""".stripMargin,
    Map("V" -> ArraySig(1)),
    (n, s) => Map("V" -> BenchData.doubles(n, s)),
    List("avg"))

  val conditionalCount = ProgramSpec("Conditional Count",
    """var cnt: long = 0;
      |for v in V do if (v < 100.0) cnt += 1;
      |""".stripMargin,
    Map("V" -> ArraySig(1)),
    (n, s) => Map("V" -> BenchData.doubles(n, s)),
    List("cnt"))

  val conditionalSum = ProgramSpec("Conditional Sum",
    """var sum: double = 0.0;
      |for v in V do if (v < 100.0) sum += v;
      |""".stripMargin,
    Map("V" -> ArraySig(1)),
    (n, s) => Map("V" -> BenchData.doubles(n, s)),
    List("sum"))

  val equal = ProgramSpec("Equal",
    """var eq: bool = true;
      |for w in W do eq &&= (w == w0);
      |""".stripMargin,
    Map("W" -> ArraySig(1), "w0" -> ScalarSig),
    (n, s) => Map("W" -> BenchData.strings(n, s), "w0" -> ScalarD("key7")),
    List("eq"))

  val equalFrequency = ProgramSpec("Equal Frequency",
    """var C: map[string,long] = map();
      |for w in W do C[w] += 1;
      |var mx: long = 0;
      |var mn: long = 1000000000;
      |for c in C do { mx max= c; mn min= c; };
      |var eqf: bool = mx == mn;
      |""".stripMargin,
    Map("W" -> ArraySig(1)),
    (n, s) => Map("W" -> BenchData.strings(n, s)),
    List("eqf", "mx", "mn"))

  val stringMatch = ProgramSpec("String Match",
    """var f1: bool = false;
      |var f2: bool = false;
      |var f3: bool = false;
      |for w in W do {
      |  f1 ||= (w == "key1");
      |  f2 ||= (w == "key2");
      |  f3 ||= (w == "key3");
      |};
      |""".stripMargin,
    Map("W" -> ArraySig(1)),
    (n, s) => Map("W" -> BenchData.strings(n, s)),
    List("f1", "f2", "f3"))

  val wordCount = ProgramSpec("Word Count",
    """var C: map[string,long] = map();
      |for w in W do C[w] += 1;
      |""".stripMargin,
    Map("W" -> ArraySig(1)),
    (n, s) => Map("W" -> BenchData.strings(n, s)),
    List("C"))

  val histogram = ProgramSpec("Histogram",
    """var R: map[long,long] = map();
      |var G: map[long,long] = map();
      |var B: map[long,long] = map();
      |for p in P do {
      |  R[p.red] += 1;
      |  G[p.green] += 1;
      |  B[p.blue] += 1;
      |};
      |""".stripMargin,
    Map("P" -> ArraySig(1)),
    (n, s) => Map("P" -> BenchData.rgb(n, s)),
    List("R", "G", "B"))

  val linearRegression = ProgramSpec("Linear Regression",
    """var sum_x: double = 0.0;
      |var sum_y: double = 0.0;
      |for p in P do { sum_x += p.x; sum_y += p.y; };
      |var x_bar: double = sum_x/n;
      |var y_bar: double = sum_y/n;
      |var xx_bar: double = 0.0;
      |var yy_bar: double = 0.0;
      |var xy_bar: double = 0.0;
      |for p in P do {
      |  xx_bar += (p.x - x_bar)*(p.x - x_bar);
      |  yy_bar += (p.y - y_bar)*(p.y - y_bar);
      |  xy_bar += (p.x - x_bar)*(p.y - y_bar);
      |};
      |var slope: double = xy_bar/xx_bar;
      |var intercept: double = y_bar - slope*x_bar;
      |""".stripMargin,
    Map("P" -> ArraySig(1), "n" -> ScalarSig),
    (n, s) => Map("P" -> BenchData.points(n, s), "n" -> ScalarD(n.toLong)),
    List("slope", "intercept"))

  val groupBy = ProgramSpec("Group-By",
    """var C: map[long,double] = map();
      |for v in V do C[v.K] += v.A;
      |""".stripMargin,
    Map("V" -> ArraySig(1)),
    (n, s) => Map("V" -> BenchData.keyed(n, s)),
    List("C"))

  val matrixAddition = ProgramSpec("Matrix Addition",
    """var R: matrix[double] = matrix();
      |for i = 0, n-1 do
      |  for j = 0, n-1 do
      |    R[i,j] := M[i,j] + N[i,j];
      |""".stripMargin,
    Map("M" -> ArraySig(2), "N" -> ArraySig(2), "n" -> ScalarSig),
    (d, s) => Map(
      "M" -> BenchData.matrix(d, s),
      "N" -> BenchData.matrix(d, s + 1),
      "n" -> ScalarD(d.toLong)),
    List("R"))

  val matrixMultiplication = ProgramSpec("Matrix Multiplication",
    """var R: matrix[double] = matrix();
      |for i = 0, n-1 do
      |  for j = 0, n-1 do {
      |    R[i,j] := 0.0;
      |    for k = 0, n-1 do
      |      R[i,j] += M[i,k] * N[k,j];
      |  };
      |""".stripMargin,
    Map("M" -> ArraySig(2), "N" -> ArraySig(2), "n" -> ScalarSig),
    (d, s) => Map(
      "M" -> BenchData.matrix(d, s),
      "N" -> BenchData.matrix(d, s + 1),
      "n" -> ScalarD(d.toLong)),
    List("R"))

  /** One PageRank step over an edge list (scale = number of vertices;
    * edges ≈ 10 × vertices as in the paper).
    */
  val pageRank = ProgramSpec("PageRank",
    """var C: vector[long] = vector();
      |var OUT: vector[double] = vector();
      |var P2: vector[double] = vector();
      |for e in E do C[e.src] += 1;
      |for e in E do OUT[e.dst] += P[e.src]/C[e.src];
      |for i = 0, n-1 do P2[i] := 0.15/n + 0.85*OUT[i];
      |""".stripMargin,
    Map("E" -> ArraySig(1), "P" -> ArraySig(1), "n" -> ScalarSig),
    (nv, s) => Map(
      "E" -> BenchData.edges(nv, nv * 10, s),
      "P" -> BenchData.ranks(nv),
      "n" -> ScalarD(nv.toLong)),
    List("P2"))

  /** One KMeans step (scale = number of points; 100 centroids on the
    * paper's 10×10 grid).
    */
  val kMeans = ProgramSpec("KMeans",
    """var near: vector[(double,long)] = vector();
      |var SX: vector[double] = vector();
      |var SY: vector[double] = vector();
      |var CN: vector[long] = vector();
      |var C2: vector[(double,double)] = vector();
      |for i = 0, n-1 do near[i] := (1.0e30, 0);
      |for i = 0, n-1 do
      |  for j = 0, k-1 do
      |    near[i] min= (sqrt((P[i].x-C[j].x)*(P[i].x-C[j].x)
      |                     + (P[i].y-C[j].y)*(P[i].y-C[j].y)), j);
      |for i = 0, n-1 do {
      |  SX[near[i]._2] += P[i].x;
      |  SY[near[i]._2] += P[i].y;
      |  CN[near[i]._2] += 1;
      |};
      |for j = 0, k-1 do C2[j] := (SX[j]/CN[j], SY[j]/CN[j]);
      |""".stripMargin,
    Map("P" -> ArraySig(1), "C" -> ArraySig(1), "n" -> ScalarSig, "k" -> ScalarSig),
    (n, s) => {
      val g = 10
      Map(
        "P" -> BenchData.kmeansPoints(n, g, s),
        "C" -> BenchData.kmeansCentroids(g),
        "n" -> ScalarD(n.toLong),
        "k" -> ScalarD((g * g).toLong))
    },
    List("C2"))

  /** Covariance-matrix PCA over an n×d data matrix (scale = rows, d = 4). */
  val pca = ProgramSpec("PCA",
    """var mean: vector[double] = vector();
      |var cov: matrix[double] = matrix();
      |for i = 0, n-1 do
      |  for j = 0, d-1 do
      |    mean[j] += X[i,j]/n;
      |for i = 0, n-1 do
      |  for j = 0, d-1 do
      |    for k = 0, d-1 do
      |      cov[j,k] += (X[i,j]-mean[j])*(X[i,k]-mean[k])/n;
      |""".stripMargin,
    Map("X" -> ArraySig(2), "n" -> ScalarSig, "d" -> ScalarSig),
    (n, s) => Map(
      "X" -> BenchData.denseRect(n, 4, s),
      "n" -> ScalarD(n.toLong),
      "d" -> ScalarD(4L)),
    List("mean", "cov"))

  /** One matrix-factorization gradient-descent step (§3.2), with the
    * scalar pq/error rewritten as matrices as the paper prescribes.
    * Scale = matrix dimension; rank d = 2, a = 0.002, b = 0.02.
    */
  val matrixFactorization = ProgramSpec("Matrix Factorization",
    """var pq: matrix[double] = matrix();
      |var E: matrix[double] = matrix();
      |var P2: matrix[double] = matrix();
      |var Q2: matrix[double] = matrix();
      |for i = 0, n-1 do
      |  for j = 0, m-1 do
      |    pq[i,j] := 0.0;
      |for i = 0, n-1 do
      |  for j = 0, m-1 do
      |    for k = 0, d-1 do
      |      pq[i,j] += P[i,k]*Q[k,j];
      |for i = 0, n-1 do
      |  for j = 0, m-1 do
      |    E[i,j] := R[i,j] - pq[i,j];
      |for i = 0, n-1 do
      |  for k = 0, d-1 do
      |    P2[i,k] := P[i,k];
      |for k = 0, d-1 do
      |  for j = 0, m-1 do
      |    Q2[k,j] := Q[k,j];
      |for i = 0, n-1 do
      |  for j = 0, m-1 do
      |    for k = 0, d-1 do {
      |      P2[i,k] += a*(2.0*E[i,j]*Q[k,j] - b*P[i,k]);
      |      Q2[k,j] += a*(2.0*E[i,j]*P[i,k] - b*Q[k,j]);
      |    };
      |""".stripMargin,
    Map("R" -> ArraySig(2), "P" -> ArraySig(2), "Q" -> ArraySig(2),
        "n" -> ScalarSig, "m" -> ScalarSig, "d" -> ScalarSig,
        "a" -> ScalarSig, "b" -> ScalarSig),
    (dim, s) => Map(
      "R" -> BenchData.sparseMatrix(dim, dim, 0.1, s),
      "P" -> BenchData.denseRect(dim, 2, s + 1),
      "Q" -> BenchData.denseRect(2, dim, s + 2),
      "n" -> ScalarD(dim.toLong), "m" -> ScalarD(dim.toLong),
      "d" -> ScalarD(2L),
      "a" -> ScalarD(0.002), "b" -> ScalarD(0.02)),
    List("P2", "Q2"))

  /** The 16 programs of Table 1, in the paper's order. */
  val table1: List[ProgramSpec] = List(
    average, conditionalCount, conditionalSum, count, equal, equalFrequency,
    stringMatch, sum, wordCount, histogram, matrixMultiplication,
    linearRegression, kMeans, pca, pageRank, matrixFactorization)

  /** The 12 programs of Table 2 / Figure 3, in the paper's order. */
  val table2: List[ProgramSpec] = List(
    conditionalSum, equal, stringMatch, wordCount, histogram,
    linearRegression, groupBy, matrixAddition, matrixMultiplication,
    pageRank, kMeans, matrixFactorization)

  val all: List[ProgramSpec] = (table1 ++ table2).distinctBy(_.name)

  def byName(name: String): ProgramSpec =
    all.find(_.name == name).getOrElse(
      throw new NoSuchElementException(s"no benchmark named $name"))
}
