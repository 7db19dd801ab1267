package repro.baselines

import org.apache.spark.rdd.RDD
import org.apache.spark.sql.Dataset
import repro.core._

/** SWAP-Assembler-style baseline (quality comparison, Tables IV/V).
  *
  * SWAP [12] merges semi-extended edges aggressively and, in the paper's
  * measurements, produces by far the most misassemblies and mismatches. We
  * model its failure mode as: no coverage filtering (theta = 0, so error
  * k-mers stay in the graph) plus dominance-ratio edge sparsification —
  * on a branching side, keep only the max-coverage edge when it dominates
  * the runner-up by `ratio`, else cut the side. Forcing through unbalanced
  * repeat junctions welds different genome loci into chimeric contigs
  * (misassemblies); embedded error k-mers surface as reference mismatches.
  * No error-correction round afterwards.
  */
object SwapLike {

  /** Key identifying a physical edge from both endpoints' perspectives. */
  private def edgeKey(id: Long, e: Edge): (Long, Long, Int, Int) =
    if (id < e.nbr) (id, e.nbr, e.mySide, e.nbrSide)
    else (e.nbr, id, e.nbrSide, e.mySide)

  /** Per-side dominance sparsification + mutual agreement. */
  def sparsify(nodes: RDD[(Long, Node)], ratio: Double): RDD[(Long, Node)] = {
    val selected = nodes.flatMap { case (id, n) =>
      Seq(Side.Left, Side.Right).flatMap { s =>
        val es = n.edgesOn(s).filter(_.nbr != id) // self-loops removed outright
        if (es.isEmpty) Nil
        else if (es.size == 1) es
        else {
          val sorted = es.sortBy(-_.cov)
          if (sorted(0).cov >= ratio * sorted(1).cov) Seq(sorted(0)) else Nil
        }
      }.map(e => (edgeKey(id, e), (id, e)))
    }
    // keep edges both endpoints selected (count == 2; self-keyed loops gone)
    val mutual = selected
      .groupByKey()
      .filter(_._2.size == 2)
      .flatMap { case (_, ends) => ends }
    nodes.cogroup(mutual).map { case (id, (ns, es)) =>
      (id, ns.head.copy(edges = es.toVector))
    }
  }

  def assemble(reads: Dataset[String], base: Assembler.Opts,
               ratio: Double = 1.5): Assembler.Result = {
    val opts = base.copy(theta = 0L, errorCorrection = false, dropDanglingShort = false)
    val vertices = DbgConstruction.build(reads, opts.k, opts.theta)
    val nodes = sparsify(DbgConstruction.nodes(vertices, opts.k), ratio)
    Assembler.assembleFromNodes(nodes, opts)
  }
}
