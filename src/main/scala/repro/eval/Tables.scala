package repro.eval

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.{Datasets, StreamGen}
import repro.util.Stats

/** Reproductions of the paper's evaluation tables (DESIGN.md §5). Each
  * `tableN` method runs the experiment and returns the formatted rows;
  * jobs/ entrypoints and bench/ suites both call these.
  */
object Tables {

  /** Experiment scale knobs, env-overridable so benches can run at
    * reduced cost (paper scale: length 500 000, 1000 trials).
    */
  final case class Scale(length: Int, trials: Int, advPerShift: Int, advLength: Int)
  object Scale {
    def fromEnv(): Scale = Scale(
      length = sys.env.get("REPRO_LENGTH").map(_.toInt).getOrElse(500_000),
      trials = sys.env.get("REPRO_TRIALS").map(_.toInt).getOrElse(200),
      advPerShift = sys.env.get("REPRO_ADV_PER_SHIFT").map(_.toInt).getOrElse(4),
      advLength = sys.env.get("REPRO_ADV_LENGTH").map(_.toInt).getOrElse(100_000),
    )
  }

  private def fmt(x: Double): String = f"$x%.4f"

  // ------------------------------------------------------------------
  // Table 2: dataset summary — predicate positivity p and proxy→statistic
  // Pearson r, measured on our synthetic analogues vs the paper's targets.
  // r is measured against the predicate-masked statistic O(x)·f(x), the
  // signal the paper's proxies score (zero-count frames have statistic 0).
  // ------------------------------------------------------------------
  final case class Table2Row(dataset: String, paperP: Double, measuredP: Double,
                             paperR: Double, measuredR: Double)

  def table2(length: Int, seed: Long = 7): Seq[Table2Row] =
    Datasets.specs.map { spec =>
      val ds = Datasets.generate(spec.name, length, seed)
      val p = ds.predicate.count(identity).toDouble / ds.length
      val masked = Array.tabulate(ds.length)(i => if (ds.predicate(i)) ds.statistic(i) else 0.0)
      val r = Stats.pearson(ds.proxy.toSeq, masked.toSeq)
      Table2Row(spec.name, spec.p, p, spec.r, r)
    }

  def renderTable2(rows: Seq[Table2Row]): String = {
    val header = f"${"dataset"}%-18s ${"p(paper)"}%9s ${"p(ours)"}%9s ${"r(paper)"}%9s ${"r(ours)"}%9s"
    (header +: rows.map(r =>
      f"${r.dataset}%-18s ${r.paperP}%9.2f ${r.measuredP}%9.3f ${r.paperR}%9.2f ${r.measuredR}%9.3f"
    )).mkString("\n")
  }

  // ------------------------------------------------------------------
  // Tables 3 & 4: RMSE summaries. For each total budget NT the cell is
  // the geometric mean across datasets of the mean (over trials) of each
  // trial's median segment error; "All" is the geomean over the budget
  // columns. Improvement rows are baseline / InQuest.
  // ------------------------------------------------------------------
  val Budgets: Seq[Int] = Seq(500, 2500, 5000)

  final case class RmseSummary(
      budgets: Seq[Int],
      // algorithm -> (budget -> geomean RMSE across datasets), plus "All"
      rmse: Map[String, Map[String, Double]],
      // per-(dataset, algorithm, budget) detail for EXPERIMENTS.md
      detail: Seq[EvalPoint],
  )

  def rmseSummary(
      spark: SparkSession,
      usePredicate: Boolean,
      scale: Scale,
      seed: Long = 7,
  ): RmseSummary = {
    val segLen = math.max(1, scale.length / 5)
    val detail =
      for {
        name <- Datasets.names
        ds = Datasets.generate(name, scale.length, seed)
        budget <- Budgets
        algo <- Algorithms.All
      } yield {
        val query = QueryConfig(AggFunc.Avg, usePredicate, segLen,
          budgetPerSegment = budget / 5)
        Runner.evaluate(spark, ds, algo, query, scale.trials, baseSeed = seed * 100 + budget)
      }

    val byAlgo = Algorithms.All.map { algo =>
      val perBudget = Budgets.map { b =>
        val cells = detail.filter(p => p.algorithm == algo && p.totalBudget == b)
        b.toString -> Stats.geomean(cells.map(_.meanTrialMedianError))
      }.toMap
      algo -> (perBudget + ("All" -> Stats.geomean(perBudget.values.toSeq)))
    }.toMap
    RmseSummary(Budgets, byAlgo, detail)
  }

  def renderRmseSummary(s: RmseSummary): String = {
    val cols = s.budgets.map(_.toString) :+ "All"
    val header = f"${"algorithm"}%-22s " + cols.map(c => f"${"NT=" + c}%10s").mkString(" ")
    val rmseRows = Algorithms.All.map { a =>
      f"RMSE_$a%-17s " + cols.map(c => f"${fmt(s.rmse(a)(c))}%10s").mkString(" ")
    }
    val improvements = Algorithms.All.filterNot(_ == "inquest").map { a =>
      f"improvement vs $a%-7s " + cols.map { c =>
        f"${s.rmse(a)(c) / s.rmse("inquest")(c)}%9.2fx"
      }.mkString(" ")
    }
    (header +: (rmseRows ++ improvements)).mkString("\n")
  }

  // ------------------------------------------------------------------
  // Adversarial-shift experiment (§5.6 / Figure 11, numeric claims):
  // average median-segment RMSE per algorithm across the synthetic
  // suite, by number of shifts n.
  // ------------------------------------------------------------------
  final case class AdversarialSummary(
      // n -> algorithm -> mean across streams of meanTrialMedianError
      byShift: Map[Int, Map[String, Double]],
  ) {
    def improvementOver(algo: String, n: Int): Double =
      byShift(n)(algo) / byShift(n)("inquest")
  }

  def adversarial(
      spark: SparkSession,
      scale: Scale,
      budgetTotal: Int = 2500,
      trials: Int = 50,
      seed: Long = 11,
  ): AdversarialSummary = {
    val segLen = math.max(1, scale.advLength / 5)
    val suite = Datasets.adversarialSuite(scale.advLength, scale.advPerShift, seed)
    val query = QueryConfig(AggFunc.Avg, usePredicate = true, segLen,
      budgetPerSegment = budgetTotal / 5)
    val points =
      for {
        (n, ds) <- suite
        algo <- Algorithms.All
      } yield (n, Runner.evaluate(spark, ds, algo, query, trials, baseSeed = seed + n))
    val byShift = points.groupBy(_._1).map { case (n, ps) =>
      n -> Algorithms.All.map { a =>
        val xs = ps.collect { case (_, p) if p.algorithm == a => p.meanTrialMedianError }
        a -> xs.sum / xs.size
      }.toMap
    }
    AdversarialSummary(byShift)
  }

  def renderAdversarial(s: AdversarialSummary): String = {
    val ns = s.byShift.keys.toSeq.sorted
    val header = f"${"algorithm"}%-22s " + ns.map(n => f"${"n=" + n}%10s").mkString(" ")
    val rows = Algorithms.All.map { a =>
      f"RMSE_$a%-17s " + ns.map(n => f"${fmt(s.byShift(n)(a))}%10s").mkString(" ")
    }
    val imp = Algorithms.All.filterNot(_ == "inquest").map { a =>
      f"improvement vs $a%-7s " + ns.map(n => f"${s.improvementOver(a, n)}%9.2fx").mkString(" ")
    }
    (header +: (rows ++ imp)).mkString("\n")
  }
}
