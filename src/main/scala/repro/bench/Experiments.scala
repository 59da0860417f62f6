package repro.bench

import org.apache.spark.sql.SparkSession
import repro.baselines.{EngineRunner, Systems}
import repro.core._
import repro.queries.{Q, Tables, TpchData, TpchLite}
import scala.collection.mutable

/** The paper's evaluation experiments (Figures 6-11 + Table I), computed on
  * the simulated cluster and returned as structured rows. Bench suites
  * assert the paper's qualitative shapes on these numbers and print them as
  * tables; `jobs/` mains print them standalone. Paper-reported aggregates
  * are recorded next to measured values in EXPERIMENTS.md.
  */
object Experiments {

  /** Benchmarks run at SF 0.1 by default (cost-model volumeScale maps this
    * to paper-scale volumes; see CostParams).
    */
  def benchSf: Double = sys.env.getOrElse("REPRO_BENCH_SF", "0.1").toDouble

  def load(spark: SparkSession): Tables = TpchData.load(spark, benchSf)

  // clean-run time cache shared by all experiments in a JVM
  private val cache = mutable.Map.empty[(String, String, Int), RunResult]

  def run(name: String, cfg: EngineConfig, q: Q, t: Tables): RunResult =
    cache.getOrElseUpdate((name, q.id, cfg.workers), EngineRunner.run(cfg, q, t))

  def time(name: String, cfg: EngineConfig, q: Q, t: Tables): Double =
    run(name, cfg, q, t).simSeconds

  def geomean(xs: Seq[Double]): Double = {
    require(xs.nonEmpty)
    math.exp(xs.map(math.log).sum / xs.size)
  }

  // ------------------------------------------------------------ Fig 6 / 11a

  final case class NormalRow(q: Q, quokka: Double, spark: Double, trino: Double) {
    def vsSpark: Double = spark / quokka
    def vsTrino: Double = trino / quokka
  }

  /** Normal-execution comparison: Quokka vs SparkSQL-like vs Trino-like
    * (with spooling FT on, as benchmarked in Fig 6).
    */
  def normalExec(t: Tables, workers: Int): Vector[NormalRow] =
    TpchLite.all.map { q =>
      NormalRow(q,
        time("quokka", Systems.quokka(workers), q, t),
        time("spark", Systems.sparkLike(workers), q, t),
        time("trino", Systems.trinoLike(workers), q, t))
    }

  // ----------------------------------------------------------------- Fig 7

  final case class PipeRow(q: Q, pipelined: Double, stagewise: Double) {
    def speedup: Double = stagewise / pipelined
  }

  def pipelinedVsStagewise(t: Tables, workers: Int): Vector[PipeRow] =
    TpchLite.representative.map { q =>
      PipeRow(q,
        time("quokka", Systems.quokka(workers), q, t),
        time("quokka-stagewise", Systems.quokkaStagewise(workers), q, t))
    }

  // ----------------------------------------------------------------- Fig 8

  final case class StaticRow(q: Q, dynamic: Double, static8: Double, static128: Double)

  def dynamicVsStatic(t: Tables, workers: Int): Vector[StaticRow] =
    TpchLite.representative.map { q =>
      StaticRow(q,
        time("quokka", Systems.quokka(workers), q, t),
        time("static8", Systems.quokkaStatic(workers, 8), q, t),
        time("static128", Systems.quokkaStatic(workers, 128), q, t))
    }

  // ----------------------------------------------------------------- Fig 9

  final case class OverheadRow(
    q: Q, trinoSpool: Double, quokkaSpool: Double, wal: Double, ckptIncr: Double)

  /** FT overhead = runtime with the strategy / runtime with FT off. */
  def ftOverhead(t: Tables, workers: Int): Vector[OverheadRow] =
    TpchLite.representative.map { q =>
      val quokkaNoFt = time("quokka-noft", Systems.quokkaNoFt(workers), q, t)
      val trinoNoFt = time("trino-noft", Systems.trinoNoFt(workers), q, t)
      OverheadRow(q,
        trinoSpool = time("trino", Systems.trinoLike(workers), q, t) / trinoNoFt,
        quokkaSpool = time("quokka-spool", Systems.quokkaSpool(workers), q, t) / quokkaNoFt,
        wal = time("quokka", Systems.quokka(workers), q, t) / quokkaNoFt,
        ckptIncr = time("quokka-ckpt",
          Systems.quokkaCkpt(workers, intervalS = 2.5, incremental = true), q, t) / quokkaNoFt)
    }

  /** §III-A / §IV-B supplementary: lineage vs intermediate data volume. */
  final case class LineageRow(q: Q, lineageKb: Double, shuffleMb: Double, backupMb: Double,
                              gcsTxns: Long)

  def lineageFootprint(t: Tables, workers: Int): Vector[LineageRow] =
    TpchLite.representative.map { q =>
      val rr = run("quokka", Systems.quokka(workers), q, t)
      LineageRow(q, rr.gcsLineageBytes / 1024.0,
        rr.metrics.shuffleBytes * Systems.costFor(workers).volumeScale / 1e6,
        rr.metrics.backupBytes * Systems.costFor(workers).volumeScale / 1e6,
        rr.gcsTxns)
    }

  // ----------------------------------------------------------- Fig 10 / 11b

  final case class RecoveryRow(
    q: Q, quokkaClean: Double, quokkaFail: Double, sparkClean: Double, sparkFail: Double) {
    def quokkaOverhead: Double = quokkaFail / quokkaClean
    def sparkOverhead: Double = sparkFail / sparkClean
    /** Restarting on the surviving workers after a 50% failure. */
    def restartBaseline: Double = 1.5
  }

  /** Kill one worker at `frac` of the clean runtime; overhead = failed
    * runtime / clean runtime, per system (paper Fig 10a / 11b).
    */
  def recovery(t: Tables, workers: Int, frac: Double = 0.5): Vector[RecoveryRow] =
    TpchLite.representative.map { q => recoveryOne(t, workers, q, frac) }

  def recoveryOne(t: Tables, workers: Int, q: Q, frac: Double): RecoveryRow = {
    val qCfg = Systems.quokka(workers)
    val sCfg = Systems.sparkLike(workers)
    val qClean = time("quokka", qCfg, q, t)
    val sClean = time("spark", sCfg, q, t)
    val victim = 1 % workers
    val qFail = EngineRunner.run(qCfg, q, t, failures = Seq((victim, qClean * frac))).simSeconds
    val sFail = EngineRunner.run(sCfg, q, t, failures = Seq((victim, sClean * frac))).simSeconds
    RecoveryRow(q, qClean, qFail, sClean, sFail)
  }

  /** Fig 10b: Q9 killed at varying points. */
  def killSweep(t: Tables, workers: Int,
                fracs: Seq[Double] = Seq(0.25, 0.5, 0.75)): Seq[(Double, RecoveryRow)] =
    fracs.map(f => f -> recoveryOne(t, workers, TpchLite.q9, f))

  // ------------------------------------------------------------- formatting

  def fmt(d: Double): String = f"$d%8.2f"

  def table(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val sb = new StringBuilder
    sb.append(s"\n### $title\n\n")
    sb.append(header.mkString("| ", " | ", " |\n"))
    sb.append(header.map(_ => "---").mkString("| ", " | ", " |\n"))
    rows.foreach(r => sb.append(r.mkString("| ", " | ", " |\n")))
    sb.toString
  }

  def tableOneText: String =
    table("Table I: fault tolerance design choices",
      Seq("System", "Description", "Spooling", "State Checkpoint", "Lineage"),
      repro.ft.Ft.tableOne.map(r => Seq(
        r.system, r.description,
        if (r.spooling) "yes" else "no",
        if (r.stateCheckpoint) "yes" else "no",
        if (r.lineage) "yes" else "no")))
}
