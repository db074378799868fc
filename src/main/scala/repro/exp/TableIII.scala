package repro.exp

import org.apache.spark.sql.SparkSession

import repro.core._
import repro.data.NoisyQuery

/** Table III: the user study, reproduced with 18 simulated participants
  * (DESIGN.md substitution 4). Each participant solves one task with Ver's
  * VIEW-PRESENTATION (bandit over question interfaces, over the distilled
  * candidate views) and a different task with FASTTOPK's ranked list
  * (bounded browsing patience). Survey rows Q2-Q5 are deterministic proxies
  * of session outcomes; the claim under reproduction is the Q1 shape (Ver
  * lets most users find the view; ranked browsing does not) and its
  * statistical significance.
  */
object TableIII {

  final case class StudyResult(
      verFound: Int, verNotFound: Int, ftkFound: Int, ftkNotFound: Int,
      preferVer: Int, preferFtk: Int, unsure: Int,
      verConfident: Int, ftkConfident: Int,
      intuitive: Int, notIntuitive: Int,
      easy: Int, difficult: Int,
      pValue: Double,
      verMedianInteractions: Double,
  )

  /** 18 personas: mostly able users with varied interface preferences and
    * low browsing patience (the paper's participants rarely examined long
    * ranked lists end-to-end), two low-engagement users who skip nearly
    * everything, and a few patient browsers.
    */
  def personas: Vector[SimUser] = {
    import Interface._
    def probs(d: Double, a: Double, p: Double, s: Double) =
      Map[Interface, Double](DatasetQ -> d, AttributeQ -> a, PairQ -> p, SummaryQ -> s)
    Vector(
      SimUser("u01", probs(0.9, 0.9, 0.8, 0.7), patience = 6, seed = 101),
      SimUser("u02", probs(0.8, 0.9, 0.7, 0.6), patience = 4, seed = 102),
      SimUser("u03", probs(0.7, 0.8, 0.9, 0.5), patience = 40, seed = 103),
      SimUser("u04", probs(0.9, 0.6, 0.8, 0.8), patience = 5, seed = 104),
      SimUser("u05", probs(0.6, 0.9, 0.6, 0.9), patience = 3, seed = 105),
      SimUser("u06", probs(0.8, 0.8, 0.9, 0.7), patience = 25, seed = 106),
      SimUser("u07", probs(0.9, 0.7, 0.7, 0.6), patience = 4, seed = 107),
      SimUser("u08", probs(0.7, 0.9, 0.8, 0.8), patience = 45, seed = 108),
      SimUser("u09", probs(0.8, 0.6, 0.9, 0.7), patience = 5, seed = 109),
      SimUser("u10", probs(0.9, 0.8, 0.6, 0.9), patience = 45, seed = 110),
      SimUser("u11", probs(0.6, 0.7, 0.8, 0.6), patience = 3, seed = 111),
      SimUser("u12", probs(0.8, 0.9, 0.9, 0.8), patience = 40, seed = 112),
      SimUser("u13", probs(0.9, 0.9, 0.7, 0.7), patience = 38, seed = 113),
      SimUser("u14", probs(0.7, 0.8, 0.8, 0.9), patience = 4, seed = 114),
      SimUser("u15", probs(0.8, 0.7, 0.9, 0.6), patience = 45, seed = 115),
      SimUser("u16", probs(0.5, 0.5, 0.45, 0.4), patience = 6, seed = 116),
      SimUser("u17", probs(0.08, 0.1, 0.05, 0.05), patience = 3, seed = 117),
      SimUser("u18", probs(0.1, 0.05, 0.08, 0.1), patience = 4, seed = 118),
    )
  }

  /** Prepared per-task state shared by the Ver and FASTTOPK conditions. */
  final case class Task(
      nq: NoisyQuery,
      distilled: Vector[MatView],
      report: DistillReport,
      initialScores: Map[String, Double],
      target: MatView,
      ftkRanked: Vector[ViewSpec],
  )

  def prepareTasks(spark: SparkSession, materializeCap: Int = 80): Vector[Task] = {
    val e = TableII.env(spark)
    TableII.queries(e).map { nq =>
      val res = e.ver.searchSpecs(nq.query, ColumnStrategy.ColumnSelection())
      val views = e.ver.materialize(res, materializeCap)
      val report = ViewDistillation.distill(views)
      val scores = views.map(v => v.id -> FastTopK.overlapScore(v.spec, e.index, nq.query).toDouble).toMap
      val target = Materializer.materialize(e.repo, nq.gt.spec, "target")
      val ftk = e.ver.searchSpecs(nq.query, ColumnStrategy.SelectAll)
      val ranked = FastTopK.rank(ftk.specs, e.index, nq.query)
      Task(nq, report.distilled, report, scores, target, ranked)
    }
  }

  /** Task rotation: each participant gets different Ver and FASTTOPK tasks
    * (the paper randomizes order and tasks; our rotation covers all tasks
    * evenly across both conditions).
    */
  def verTaskIndex(i: Int, n: Int): Int = (2 * i + 1) % n
  def ftkTaskIndex(i: Int, n: Int): Int = (i + 2) % n

  def run(spark: SparkSession): StudyResult = {
    val tasks = prepareTasks(spark)
    val users = personas
    var verFound = 0; var ftkFound = 0
    var preferVer = 0; var preferFtk = 0; var unsure = 0
    var verConfident = 0; var ftkConfident = 0
    var intuitive = 0; var easy = 0
    val verInteractions = Vector.newBuilder[Double]

    for ((u, i) <- users.zipWithIndex) {
      val verTask = tasks(verTaskIndex(i, tasks.size))
      val ftkTask = tasks(ftkTaskIndex(i, tasks.size))
      val presenter = new Presenter(verTask.distilled, verTask.report, verTask.initialScores)
      val session = presenter.run(u, verTask.target)
      val (fFound, examined) = FastTopK.browse(ftkTask.ftkRanked,
        s => s.key == ftkTask.nq.gt.spec.key, u.patience)
      if (session.found) { verFound += 1; verInteractions += session.interactions.toDouble }
      if (fFound) ftkFound += 1
      (session.found, fFound) match {
        case (true, false) => preferVer += 1
        case (false, true) => preferFtk += 1
        case (true, true)  => if (session.interactions <= examined) preferVer += 1 else preferFtk += 1
        case _             => unsure += 1
      }
      if (session.found && session.finalSize <= 10) verConfident += 1
      if (fFound) ftkConfident += 1
      val avgProb = u.answerProb.values.sum / u.answerProb.size
      if (avgProb >= 0.45) intuitive += 1
      if (session.found && session.interactions <= 8) easy += 1
    }
    val n = users.size
    StudyResult(
      verFound, n - verFound, ftkFound, n - ftkFound,
      preferVer, preferFtk, unsure,
      verConfident, ftkConfident,
      intuitive, n - intuitive,
      easy, n - easy,
      Stats.fisherExactTwoTailed(verFound, n - verFound, ftkFound, n - ftkFound),
      if (verFound == 0) 0.0 else Stats.median(verInteractions.result()),
    )
  }

  def render(r: StudyResult): String = {
    val rows = Seq(
      Seq("Q1 Found", r.verFound.toString, r.ftkFound.toString),
      Seq("Q1 Not Found", r.verNotFound.toString, r.ftkNotFound.toString),
      Seq("Q2 Prefer", r.preferVer.toString, r.preferFtk.toString + s" (unsure ${r.unsure})"),
      Seq("Q3 Confident", r.verConfident.toString, r.ftkConfident.toString),
      Seq("Q4 Intuitive (Ver)", r.intuitive.toString, "-"),
      Seq("Q5 Easy (Ver)", r.easy.toString, "-"),
      Seq("Fisher p (Q1)", f"${r.pValue}%.4f", "-"),
      Seq("Median interactions", f"${r.verMedianInteractions}%.1f", "-"),
    )
    Fmt.table("Table III: simulated user study", Seq("Measure", "Ver", "FASTTOPK"), rows)
  }
}
