package repro.experiments

/** T1 — paper Table 1: graph inputs. Prints the SBM stand-ins' sizes next to
  * the paper's SNAP sizes (DESIGN.md §3 documents the substitution).
  */
object ExpInputs {

  def table(): Table = {
    val rows = BenchGraphs.standIns.map { case (paperName, preset) =>
      val gt = BenchGraphs(preset)
      val (pn, pm) = BenchGraphs.paperSizes(paperName)
      Seq(paperName, pn.toString, pm.toString,
        preset, gt.graph.numVertices.toString, gt.graph.numEdges.toString,
        gt.communities.length.toString)
    }
    Table("T1 (Table 1): graph inputs — paper SNAP graphs vs SBM stand-ins",
      Seq("paper_graph", "paper_n", "paper_m", "stand_in", "n", "m", "gt_communities"),
      rows)
  }
}
