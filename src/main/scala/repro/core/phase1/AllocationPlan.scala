package repro.core.phase1

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.model.DbSchema
import scala.collection.mutable

/** Quota: `count` tuples of bin `binId` get the B values of combo `comboId`. */
final case class Alloc(binId: Int, comboId: Int, count: Long) extends Serializable

/** Mutable pool of per-bin availability, shared between the Hasse completer
  * and the ILP completer so the two halves of the hybrid never double-spend
  * the same tuples.
  */
final class BinPool(bins: IndexedSeq[Bin]) {
  private val avail = mutable.Map(bins.map(b => b.id -> b.count): _*)

  def available(binId: Int): Long = avail.getOrElse(binId, 0L)

  /** Take up to `n` tuples from `binId`; returns the amount actually taken. */
  def take(binId: Int, n: Long): Long = {
    val got = math.min(n, available(binId))
    if (got > 0) avail(binId) -= got
    got
  }

  /** Bins that still have unassigned tuples. */
  def remaining: Seq[(Int, Long)] = avail.toSeq.filter(_._2 > 0).sortBy(_._1)
}

/** Applies a driver-computed quota plan to the tuples of V_Join.
  *
  * Tuples are interchangeable within a bin, so the plan only says how many
  * of each bin go to each combo; a window `row_number` per bin plus a
  * range-join against the (small) cumulative quota table materializes the
  * per-tuple assignment in one shuffle — no per-tuple driver work.
  */
object AllocationPlan {

  /** @param r1WithBin R1 (sans FK) with a `__bin` column
    * @return same rows with a `__combo` column; `-1` marks tuples the plan
    *         left unassigned (candidates for invalid-tuple handling)
    */
  def apply(r1WithBin: DataFrame, schema: DbSchema, allocs: Seq[Alloc]): DataFrame = {
    val spark = r1WithBin.sparkSession
    import spark.implicits._

    // Cumulative [lo, hi] row-number ranges per bin, in plan order.
    val ranges = allocs.groupBy(_.binId).toSeq.flatMap { case (binId, as) =>
      var cum = 0L
      as.map { a =>
        val lo = cum; cum += a.count
        (binId, a.comboId, lo, cum) // rn in (lo, hi]
      }
    }
    if (ranges.isEmpty) return r1WithBin.withColumn("__combo", lit(-1))

    val rangesDf = ranges.toDF("__rbin", "__combo", "__lo", "__hi")
    val w = Window.partitionBy(col("__bin")).orderBy(col(schema.r1.key))
    r1WithBin
      .withColumn("__rn", row_number().over(w).cast("long"))
      .join(rangesDf,
            col("__bin") === col("__rbin") &&
              col("__rn") > col("__lo") && col("__rn") <= col("__hi"),
            "left")
      .withColumn("__combo", coalesce(col("__combo"), lit(-1)))
      .drop("__rn", "__lo", "__hi", "__rbin")
  }
}
