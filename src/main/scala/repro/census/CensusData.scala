package repro.census

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import java.util.{Random => JRandom}

/** A person row; `hid` is the ground-truth foreign key used only to derive
  * consistent CC targets — algorithms receive Persons with `hid` blinded.
  */
final case class Person(pid: Long, Rel: String, MultiLing: String, Age: Int, hid: Long)

/** A housing-unit row. */
final case class House(hid: Long, Tenure: String, Area: String)

/** Deterministic synthetic substitute for the paper's 2010 Census extract.
  *
  * Households are generated around an owner so that the ground truth
  * satisfies every DC of Table 4: member ages are sampled *inside* the
  * permissible gap to the owner (a strict subset of each DC's range), at
  * most one owner and one spouse-or-partner per home, and the
  * grandchild/child-in-law (resp. parent) roles are gated on the owner's age
  * per DCs 10–11. CC targets counted on this ground truth are therefore
  * mutually consistent — the same property the paper's real data provides.
  *
  * Base scale 1× ≈ 1,950 homes / ~5,000 persons (the paper's 2.56
  * persons-per-home ratio at ~1/5 of its 1× size; see DESIGN.md
  * substitution 3). Generation is per-household RNG-seeded, so any scale is
  * reproducible and generated in parallel with Spark.
  */
object CensusData {
  val HousesPerScale = 1950L

  private def rngFor(seed: Long, hid: Long): JRandom =
    new JRandom(seed * 1000003L ^ hid * 0x9E3779B97F4A7C15L)

  def housing(spark: SparkSession, nHouses: Long, nAreas: Int, seed: Long): Dataset[House] = {
    import spark.implicits._
    spark.range(1, nHouses + 1).map { hid =>
      val rng = rngFor(seed + 17, hid)
      House(hid, CensusSchema.Tenures(rng.nextInt(CensusSchema.Tenures.size)),
            CensusSchema.areaName(rng.nextInt(nAreas)))
    }
  }

  /** Members of one household, DC-safe by construction. */
  private[census] def members(hid: Long, seed: Long): Seq[Person] = {
    import CensusSchema._
    val rng = rngFor(seed, hid)
    def ml(): String = if (rng.nextDouble() < 0.3) "1" else "0"
    def uniform(lo: Int, hi: Int): Int = lo + rng.nextInt(hi - lo + 1)
    val out = scala.collection.mutable.ArrayBuffer.empty[Person]
    var idx = 0
    def add(rel: String, age: Int): Unit = {
      out += Person(hid * 16 + idx, rel, ml(), age, hid); idx += 1
    }
    val a = uniform(18, 94) // owner age
    add(Owner, a)

    if (rng.nextDouble() < 0.5) { // one spouse OR unmarried partner (DC 12)
      val rel = if (rng.nextDouble() < 0.8) Spouse else UnmarriedPartner
      add(rel, uniform(math.max(15, a - 20), math.min(MaxAge, a + 20))) // ⊂ [a−50, a+50] (DC 3)
    }
    if (a >= 25) { // children: ages in [a−50, a−12] ⊂ both DC-1 and DC-2 ranges
      val u = rng.nextDouble()
      val nKids = if (u < 0.4) 0 else if (u < 0.65) 1 else if (u < 0.85) 2 else 3
      (0 until nKids).foreach { _ =>
        val t = rng.nextDouble()
        val rel = if (t < 0.6) BiologicalChild else if (t < 0.75) StepChild
                  else if (t < 0.9) AdoptedChild else FosterChild
        add(rel, uniform(math.max(0, a - 50), a - 12))
      }
    }
    if (rng.nextDouble() < 0.12) // sibling within ±35 (DC 4)
      add(Sibling, uniform(math.max(0, a - 35), math.min(MaxAge, a + 35)))
    if (a <= 94 && rng.nextDouble() < 0.08) { // parents only for owners ≤ 94 (DC 11)
      val rel = if (rng.nextDouble() < 0.7) Parent else ParentInLaw
      add(rel, uniform(a + 12, math.min(MaxAge, a + 30))) // ⊂ [a+12, a+115] (DC 5)
    }
    if (a >= 45) { // grandchild / child-in-law only for older owners (DC 10)
      if (rng.nextDouble() < 0.07)
        add(Grandchild, uniform(math.max(0, a - 60), a - 30)) // ⊂ [a−115, a−30] (DC 6)
      if (rng.nextDouble() < 0.06)
        add(ChildInLaw, uniform(math.max(0, a - 45), a - 20)) // ⊂ [a−69, a−1] (DC 7)
    }
    if (rng.nextDouble() < 0.1)
      add(Housemate, uniform(18, 85))
    out.toSeq
  }

  def persons(spark: SparkSession, nHouses: Long, seed: Long): Dataset[Person] = {
    import spark.implicits._
    spark.range(1, nHouses + 1).flatMap(hid => members(hid, seed))
  }

  /** Generate (Persons-with-ground-truth-FK, Housing) at `scale`. */
  def generate(spark: SparkSession, scale: Double, nAreas: Int = 12,
               seed: Long = 7L): (DataFrame, DataFrame) = {
    val nHouses = math.max(4L, (HousesPerScale * scale).toLong)
    val p = persons(spark, nHouses, seed).toDF()
    val h = housing(spark, nHouses, nAreas, seed).toDF()
    (p, h)
  }

  /** Persons with the FK column blinded — the algorithms' actual input. */
  def blind(personsDf: DataFrame): DataFrame =
    personsDf.withColumn("hid", lit(null).cast("long"))
}
