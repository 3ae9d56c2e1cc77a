package repro.bench

import org.apache.spark.sql.SparkSession
import repro.baselines.{CasperSim, MoldSim}
import repro.core.{Diablo, Optimize, Parser, Translate}
import repro.local.LocalBackend
import repro.programs.Benchmarks
import repro.programs.Benchmarks.ProgramSpec
import repro.spark.SparkBackend
import repro.spark.SparkBackend.{SArr, SScalar, SValue}
import repro.handwritten.HandWritten
import repro.local.LocalBackend.{ArrayD, Rec, ScalarD}

/** Benchmark harnesses, one per paper table. Each prints the paper's
  * numbers next to ours so the reader can diff shapes (see EXPERIMENTS.md).
  * Timing follows the paper's method where affordable: repeated runs with
  * the first discarded for JVM warm-up, mean of the rest.
  */
object Harness {

  def timeMs[A](reps: Int = 3)(body: => A): Double = {
    body // discarded warm-up run (the paper discards the first of 4)
    val ts = (1 until reps.max(2)).map { _ =>
      val t0 = System.nanoTime
      body
      (System.nanoTime - t0) / 1e6
    }
    ts.sum / ts.size
  }

  // =========================================================== Table 1

  /** Paper Table 1 ("Compilation time in secs"); None = blank/failed. */
  val paperTable1: Map[String, (Option[String], Option[String], String)] = Map(
    // name -> (MOLD, Casper, DIABLO)
    "Average"               -> (None, Some("172.25"), "5.75"),
    "Conditional Count"     -> (None, Some("20.25"), "5.75"),
    "Conditional Sum"       -> (None, Some("18.75"), "5.25"),
    "Count"                 -> (None, Some("9.75"), "5.75"),
    "Equal"                 -> (None, Some("11.25"), "5.75"),
    "Equal Frequency"       -> (None, Some("778.00"), "5.75"),
    "String Match"          -> (Some("68"), Some("806.00"), "8.50"),
    "Sum"                   -> (None, Some("10.25"), "5.00"),
    "Word Count"            -> (Some("11"), Some("102.25"), "6.50"),
    "Histogram"             -> (Some("233"), Some("10272.00"), "9.00"),
    "Matrix Multiplication" -> (Some("40"), Some("fail"), "8.25"),
    "Linear Regression"     -> (Some("28"), Some(">19 hours"), "8.75"),
    "KMeans"                -> (Some("340"), Some("fail"), "9.75"),
    "PCA"                   -> (Some("66"), Some("fail"), "13.25"),
    "PageRank"              -> (None, None, "9.50"),
    "Matrix Factorization"  -> (None, None, "14.50"),
  )

  final case class Table1Row(name: String,
      moldPaper: String, moldSim: String,
      casperPaper: String, casperSim: String,
      diabloPaper: String, diabloMs: Double)

  def diabloCompileMs(p: ProgramSpec): Double = timeMs(4) {
    Optimize.optimize(Translate.translate(Parser.parse(p.source), p.sigs))
  }

  def table1(casperBudgetMs: Long = 60000): List[Table1Row] =
    Benchmarks.table1.map { p =>
      val (mp, cp, dp) = paperTable1(p.name)
      val diabloMs = diabloCompileMs(p)
      val t0 = System.nanoTime
      val moldRes = MoldSim.translate(p.source)
      val moldS = (System.nanoTime - t0) / 1e9
      val moldStr = moldRes match {
        case MoldSim.Translated(_, st) => f"$moldS%.2fs ($st%d states)"
        case MoldSim.Failed(_, st)     => f"fail ($st%d states)"
      }
      val t1 = System.nanoTime
      val casperRes = CasperSim.translate(p, casperBudgetMs)
      val casperS = (System.nanoTime - t1) / 1e9
      val casperStr = casperRes match {
        case CasperSim.Synthesized(n) => f"$casperS%.2fs ($n%d cands)"
        case CasperSim.Failed(_, n)   => f"fail ($n%d cands)"
        case CasperSim.Timeout(n)     => f">${casperBudgetMs / 1000}%ds ($n%d cands)"
      }
      Table1Row(p.name, mp.getOrElse("n/a"), moldStr, cp.getOrElse("n/a"), casperStr,
        dp, diabloMs)
    }

  def printTable1(rows: List[Table1Row]): Unit = {
    println("\n=== Table 1: translator compilation time ===")
    println("(paper columns in secs on their hardware; ours as measured; " +
      "'n/a' = not reported in the paper)")
    println(f"${"program"}%-22s| ${"MOLD(paper)"}%-12s| ${"MOLD-sim"}%-22s| " +
      f"${"Casper(paper)"}%-14s| ${"Casper-sim"}%-22s| ${"DIABLO(paper)"}%-14s| DIABLO(ours)")
    for (r <- rows)
      println(f"${r.name}%-22s| ${r.moldPaper}%-12s| ${r.moldSim}%-22s| " +
        f"${r.casperPaper}%-14s| ${r.casperSim}%-22s| ${r.diabloPaper + "s"}%-14s| ${r.diabloMs}%.1f ms")
  }

  // =========================================================== Table 2

  /** Paper Table 2: (count, size MB, par secs, seq secs). */
  val paperTable2: Map[String, (String, Double, Double)] = Map(
    "Conditional Sum"       -> ("10^9", 19.6, 40.6),
    "Equal"                 -> ("5x10^8", 9.2, 33.2),
    "String Match"          -> ("5x10^8", 8.3, 32.6),
    "Word Count"            -> ("5x10^7", 57.1, 69.4),
    "Histogram"             -> ("5x10^7", 8.2, 30.6),
    "Linear Regression"     -> ("10^8", 13.5, 39.0),
    "Group-By"              -> ("5x10^7", 56.6, 51.9),
    "Matrix Addition"       -> ("210x210", 0.13, 216.0),
    "Matrix Multiplication" -> ("420x420", 20.8, 137.8),
    "PageRank"              -> ("1500000", 10.9, 44.9),
    "KMeans"                -> ("500000", 32.6, 26.2),
    "Matrix Factorization"  -> ("980x980", 13.2, 22.7),
  )

  /** Laptop-scale sizes (the paper ran at cluster scale; shapes, not
    * absolute numbers, are the comparison target).
    */
  val table2Scales: Map[String, Int] = Map(
    "Conditional Sum"       -> 2_000_000,
    "Equal"                 -> 1_000_000,
    "String Match"          -> 1_000_000,
    "Word Count"            -> 500_000,
    "Histogram"             -> 300_000,
    "Linear Regression"     -> 500_000,
    "Group-By"              -> 500_000,
    "Matrix Addition"       -> 300,
    "Matrix Multiplication" -> 70,
    "PageRank"              -> 100_000,
    "KMeans"                -> 20_000,
    "Matrix Factorization"  -> 120,
  )

  final case class Table2Row(name: String, scale: Int,
      paperPar: Double, paperSeq: Double, parMs: Double, seqMs: Double)

  def table2(): List[Table2Row] =
    Benchmarks.table2.map { p =>
      val scale = table2Scales(p.name)
      val code = Diablo.compile(p.source, p.sigs)
      val data = p.data(scale, 42)
      // the paper's method: 4 runs, first discarded, mean of the rest
      val parMs = timeMs(4)(LocalBackend.run(code, data, par = true))
      val seqMs = timeMs(4)(LocalBackend.run(code, data, par = false))
      val (_, pp, ps) = paperTable2(p.name)
      Table2Row(p.name, scale, pp, ps, parMs, seqMs)
    }

  def printTable2(rows: List[Table2Row]): Unit = {
    println("\n=== Table 2: parallel (Scala parallel collections) vs sequential ===")
    println("(paper at cluster-node scale in secs; ours at laptop scale in ms)")
    println(f"${"program"}%-22s| ${"scale"}%-9s| ${"paper par(s)"}%-13s| " +
      f"${"paper seq(s)"}%-13s| ${"our par(ms)"}%-12s| ${"our seq(ms)"}%-12s| par/seq(paper) | par/seq(ours)")
    for (r <- rows)
      println(f"${r.name}%-22s| ${r.scale}%-9d| ${r.paperPar}%-13.2f| " +
        f"${r.paperSeq}%-13.2f| ${r.parMs}%-12.1f| ${r.seqMs}%-12.1f| " +
        f"${r.paperPar / r.paperSeq}%-15.2f| ${r.parMs / r.seqMs}%.2f")
  }

  // ================================================== Figure 3 (as table)

  val figure3Scales: Map[String, Int] = Map(
    "Conditional Sum"       -> 400_000,
    "Equal"                 -> 200_000,
    "String Match"          -> 200_000,
    "Word Count"            -> 200_000,
    "Histogram"             -> 150_000,
    "Linear Regression"     -> 200_000,
    "Group-By"              -> 200_000,
    "Matrix Addition"       -> 120,
    "Matrix Multiplication" -> 60,
    "PageRank"              -> 3_000,
    "KMeans"                -> 5_000,
    "Matrix Factorization"  -> 40,
  )

  final case class Fig3Row(name: String, scale: Int,
      diabloMs: Double, handMs: Double) {
    def ratio: Double = diabloMs / handMs
  }

  def figure3(spark: SparkSession): List[Fig3Row] =
    Benchmarks.table2.map { p =>
      val scale = figure3Scales(p.name)
      val data = p.data(scale, 42)
      val state: Map[String, SValue] = data.map {
        case (n, ScalarD(v)) => n -> SScalar(v)
        case (n, a @ ArrayD(_, ka)) =>
          val df = SparkBackend.arrayToDF(spark, a).cache()
          df.count() // materialize inputs outside the timed region
          n -> SArr(Some(df), ka)
      }
      val code = Diablo.compile(p.source, p.sigs)
      val diabloMs = timeMs(3) {
        val st = SparkBackend.run(code, state, spark)
        p.outputs.foreach { o => st(o) match {
          case SArr(Some(df), _) => df.count(); case _ => ()
        }}
      }
      val handMs = timeMs(3)(runHandWritten(p.name, state, spark))
      Fig3Row(p.name, scale, diabloMs, handMs)
    }

  /** Run (and force) the hand-written counterpart of a benchmark. */
  def runHandWritten(name: String, state: Map[String, SValue],
                     spark: SparkSession): Unit = {
    def df(n: String) = state(n).asInstanceOf[SArr].df.get
    def scalar(n: String) = state(n).asInstanceOf[SScalar].v
    name match {
      case "Conditional Sum" => HandWritten.conditionalSum(df("V"))
      case "Equal"           => HandWritten.equal(df("W"), scalar("w0").asInstanceOf[String])
      case "String Match"    => HandWritten.stringMatch(df("W"))
      case "Word Count"      => HandWritten.wordCount(df("W")).count()
      case "Histogram"       =>
        HandWritten.histogram(df("P"), "red").count()
        HandWritten.histogram(df("P"), "green").count()
        HandWritten.histogram(df("P"), "blue").count()
      case "Linear Regression" => HandWritten.linearRegression(df("P"))
      case "Group-By"        => HandWritten.groupBy(df("V")).count()
      case "Matrix Addition" => HandWritten.matrixAddition(df("M"), df("N")).count()
      case "Matrix Multiplication" =>
        HandWritten.matrixMultiplication(df("M"), df("N")).count()
      case "PageRank" =>
        HandWritten.pageRank(df("E"), df("P"), scalar("n").asInstanceOf[Long]).count()
      case "KMeans" =>
        val centroids = df("C").collect().map { r =>
          val s = r.getStruct(1)
          (r.getLong(0), (s.getDouble(0), s.getDouble(1)))
        }
        HandWritten.kMeans(df("P"), centroids)
      case "Matrix Factorization" =>
        val (np, nq) = HandWritten.matrixFactorization(df("R"), df("P"), df("Q"))
        np.count(); nq.count()
      case other => throw new IllegalArgumentException(s"no hand-written $other")
    }
  }

  def printFigure3(rows: List[Fig3Row]): Unit = {
    println("\n=== Figure 3 (as a table): DIABLO-generated vs hand-written Spark ===")
    println("(paper claim: comparable for simple programs; DIABLO slower on " +
      "KMeans / Matrix Factorization / PageRank because of extra joins)")
    println(f"${"program"}%-22s| ${"scale"}%-8s| ${"DIABLO(ms)"}%-11s| " +
      f"${"hand(ms)"}%-9s| DIABLO/hand")
    for (r <- rows)
      println(f"${r.name}%-22s| ${r.scale}%-8d| ${r.diabloMs}%-11.0f| " +
        f"${r.handMs}%-9.0f| ${r.ratio}%.2fx")
  }
}
