package repro.baselines

import org.apache.spark.sql.Dataset
import repro.core._

/** Ray-style assembler (quality-comparison baseline for Tables IV/V).
  *
  * Ray [2] grows seeds greedily and stops at any ambiguity, without the
  * DBG-level error-correction passes (tip removal across merged contigs,
  * bubble filtering, second merge round) that PPA-assembler applies. We
  * model that as: standard (k+1)-mer DBG, one labeling+merging round only,
  * no bubble/tip correction, dangling fragments kept — producing the
  * fragmented, lower-N50 assemblies the paper reports for Ray.
  */
object RayLike {

  def assemble(reads: Dataset[String], base: Assembler.Opts): Assembler.Result = {
    val opts = base.copy(errorCorrection = false, dropDanglingShort = false)
    Assembler.assemble(reads, opts)
  }
}
