package repro.experiments

import repro.retrieval._

/** Table 2 (paper §7.2.1): end-to-end retrieval quality of all nine
  * methods on every evaluation dataset — MRR@10 on the Dev/NQ point
  * tasks, NDCG@10 on the TREC graded task (MS datasets only, as in the
  * paper) — plus AQT (paper Figure 4, folded in here since figures are
  * out of scope but the efficiency claim needs the numbers).
  */
final case class Table2Cell(
    method: String,
    dataset: String,
    devMrr: Double,
    trecNdcg: Option[Double],
    aqtMillis: Double,
    buildMillis: Double)

final case class Table2Result(cells: Seq[Table2Cell]) {

  def cell(method: String, dataset: String): Table2Cell =
    cells.find(c => c.method == method && c.dataset == dataset)
      .getOrElse(sys.error(s"missing cell $method/$dataset"))

  /** Paper-shaped quality table (MRR columns then NDCG columns). */
  def render: String = {
    val datasets = cells.map(_.dataset).distinct
    val methods = cells.map(_.method).distinct
    val sb = new StringBuilder
    def fmt(d: Double): String = f"$d%.4f"
    sb.append("== Table 2: retrieval quality ==\n")
    sb.append(("Method" +: datasets.map(d => s"$d MRR@10")).mkString("\t")).append('\n')
    methods.foreach { m =>
      sb.append((m +: datasets.map(d => fmt(cell(m, d).devMrr))).mkString("\t")).append('\n')
    }
    val trecDatasets = datasets.filter(d => cell(methods.head, d).trecNdcg.isDefined)
    sb.append('\n')
    sb.append(("Method" +: trecDatasets.map(d => s"$d NDCG@10")).mkString("\t")).append('\n')
    methods.foreach { m =>
      sb.append((m +: trecDatasets.map(d => fmt(cell(m, d).trecNdcg.get))).mkString("\t")).append('\n')
    }
    sb.append("\n== Figure 4 companion: AQT (ms/query) ==\n")
    sb.append(("Method" +: datasets.map(d => s"$d AQT")).mkString("\t")).append('\n')
    methods.foreach { m =>
      sb.append((m +: datasets.map(d => f"${cell(m, d).aqtMillis}%.3f")).mkString("\t")).append('\n')
    }
    sb.toString
  }
}

object Table2Experiment {

  /** Runs the full grid. Indexes are built once per (method, dataset) and
    * shared between the Dev and TREC tasks (they share the corpus, like
    * the paper's MS MARCO subsets).
    */
  def run(
      datasets: Seq[DatasetSpec] = Scaled.Datasets,
      methods: Seq[String] = Scaled.Methods,
      dim: Int = Scaled.Dim,
      k: Int = Scaled.K,
      log: String => Unit = s => Console.err.println(s)): Table2Result = {
    val cells = Seq.newBuilder[Table2Cell]
    datasets.foreach { spec =>
      log(s"[table2] generating ${spec.label} (n=${spec.n}, dim=$dim)")
      val corpus = RetrievalData.corpus(spec.n, dim, spec.seed)
      val dev = RetrievalData.pointTask(corpus, spec.numQueries, spec.seed + 1)
      val isWiki = spec.label.startsWith("Wiki")
      val trec = if (isWiki) None else Some(RetrievalData.gradedTask(corpus, spec.seed))

      methods.foreach { method =>
        val t0 = System.nanoTime()
        val index = Scaled.buildIndex(method, corpus, spec.label)
        val buildMs = (System.nanoTime() - t0) / 1e6
        val (mrr, aqt) = Eval.pointScore(index, dev, k)
        val ndcg = trec.map(t => Eval.gradedScore(index, t, k)._1)
        log(f"[table2] ${spec.label}%-9s $method%-11s mrr=$mrr%.4f" +
          ndcg.map(n => f" ndcg=$n%.4f").getOrElse("") + f" aqt=$aqt%.3fms build=$buildMs%.0fms")
        cells += Table2Cell(method, spec.label, mrr, ndcg, aqt, buildMs)
      }
    }
    Table2Result(cells.result())
  }
}
