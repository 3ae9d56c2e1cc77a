package repro.tiling

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._

/** Packed (tiled) matrices (paper §5).
  *
  * A sparse matrix DataFrame (k1, k2, v) is packed into equal t×t tiles:
  * a DataFrame (ti, tj, tile) where `tile` is a dense Array[Double] in
  * row-major order — the paper's `{((I,J), Array[T])}` representation.
  * `unpack` is the inverse (it materializes the dense zeros, as the
  * paper's `scan` does). Operations on tiled matrices (`add`, `multiply`,
  * `merge`) work directly on tiles without unpacking — the fusion §5
  * argues for.
  */
object Tiled {

  /** pack(M): group elements into t×t tiles; absent cells are 0. */
  def pack(m: DataFrame, t: Int): DataFrame = {
    val form = udf { (cells: Seq[Row]) =>
      val a = Array.fill(t * t)(0.0)
      cells.foreach(r => a(r.getLong(0).toInt) = r.getDouble(1))
      a
    }
    m.groupBy(
        (col("k1") / t).cast("long").as("ti"),
        (col("k2") / t).cast("long").as("tj"))
      .agg(collect_list(struct(
        ((col("k1") % t) * t + (col("k2") % t)).cast("long").as("off"),
        col("v").cast("double").as("cv"))).as("cells"))
      .select(col("ti"), col("tj"), form(col("cells")).as("tile"))
  }

  /** unpack(N): back to sparse (k1, k2, v), including explicit zeros. */
  def unpack(tm: DataFrame, t: Int): DataFrame =
    tm.select(col("ti"), col("tj"), posexplode(col("tile")))
      .select(
        (col("ti") * t + (col("pos") / t).cast("long")).as("k1"),
        (col("tj") * t + col("pos") % t).as("k2"),
        col("col").as("v"))

  /** Tile-wise addition (no shuffle beyond the join). */
  def add(a: DataFrame, b: DataFrame): DataFrame = {
    val addT = udf { (x: Seq[Double], y: Seq[Double]) =>
      x.zip(y).map { case (u, v) => u + v }.toArray
    }
    a.withColumnRenamed("tile", "_a")
      .join(b.withColumnRenamed("tile", "_b"), Seq("ti", "tj"))
      .select(col("ti"), col("tj"), addT(col("_a"), col("_b")).as("tile"))
  }

  /** Tiled matrix multiply: join on the shared tile dimension, dense t×t
    * multiply per tile pair, elementwise-sum the partial tiles per (ti,tj).
    */
  def multiply(a: DataFrame, b: DataFrame, t: Int): DataFrame = {
    val mulT = udf { (x: Seq[Double], y: Seq[Double]) =>
      val out = Array.fill(t * t)(0.0)
      var i = 0
      while (i < t) {
        var k = 0
        while (k < t) {
          val xv = x(i * t + k)
          if (xv != 0.0) {
            var j = 0
            while (j < t) { out(i * t + j) += xv * y(k * t + j); j += 1 }
          }
          k += 1
        }
        i += 1
      }
      out
    }
    val sumT = udf { (tiles: Seq[Seq[Double]]) =>
      val out = Array.fill(t * t)(0.0)
      tiles.foreach(p => { var i = 0; while (i < out.length) { out(i) += p(i); i += 1 } })
      out
    }
    a.select(col("ti"), col("tj").as("tk"), col("tile").as("_a"))
      .join(b.select(col("ti").as("tk"), col("tj"), col("tile").as("_b")), Seq("tk"))
      .select(col("ti"), col("tj"), mulT(col("_a"), col("_b")).as("p"))
      .groupBy("ti", "tj")
      .agg(collect_list(col("p")).as("ps"))
      .select(col("ti"), col("tj"), sumT(col("ps")).as("tile"))
  }

  /** Tiled merge N ◁′ pack(x): tiles of the right-hand side replace tiles
    * of the left (tile-granularity merge, as in the paper's zipPartitions
    * implementation).
    */
  def merge(oldTm: DataFrame, newTm: DataFrame): DataFrame =
    oldTm.withColumnRenamed("tile", "_o")
      .join(newTm.withColumnRenamed("tile", "_n"), Seq("ti", "tj"), "full_outer")
      .select(col("ti"), col("tj"), coalesce(col("_n"), col("_o")).as("tile"))
}
