package repro.core

import org.apache.spark.sql.DataFrame
import repro.core.model._

/** One step of the snowflake extension: connect the accumulated fact-side
  * view (playing R1) to the next dimension relation `r2` (playing R2).
  *
  * @param r2       the dimension table for this step
  * @param schema   schema pair where `r1` covers the accumulated attributes
  *                 (fact attributes plus dimensions joined in earlier steps)
  * @param ccs      CCs over the join view of everything joined so far ⋈ r2
  * @param dcs      FK DCs for this step's foreign key
  */
final case class SnowflakeStep(r2: DataFrame, schema: DbSchema,
                               ccs: Seq[CardinalityConstraint],
                               dcs: Seq[DenialConstraint])

/** Snowflake-schema generalization (end of Section 5.2, Example 5.6): run
  * C-Extension table-pair by table-pair, inside out. After each step the
  * completed pair is joined and becomes the R1 of the next step, so later
  * CCs may span the join view of every table handled so far, and tuples are
  * only ever *added* to a relation while it plays R2.
  */
object Snowflake {

  final case class StepResult(r1Hat: DataFrame, r2Hat: DataFrame, joined: DataFrame)

  /** @param fact the central relation, missing every step's FK column
    * @return per-step results; `results.last.joined` is the full join view
    */
  def run(fact: DataFrame, steps: Seq[SnowflakeStep]): Seq[StepResult] = {
    var r1 = fact
    val out = Seq.newBuilder[StepResult]
    for (step <- steps) {
      val res = CExtension.run(r1, step.r2, step.schema, step.ccs, step.dcs)
      val joined = res.r1Hat.join(res.r2Hat, Seq(step.schema.r2.key))
      out += StepResult(res.r1Hat, res.r2Hat, joined)
      res.vjoin.unpersist()
      // The joined view (fact keys + all attributes so far) is the next R1.
      r1 = joined
    }
    out.result()
  }
}
