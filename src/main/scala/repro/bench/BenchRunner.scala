package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.SgaExpr
import repro.core.Model.Sge
import repro.engine.{Engine, RunResult}
import repro.physical.Mode
import repro.streams.{GraphStreams, Workloads}

/** Shared benchmark harness behind the `bench/` ScalaTest suites and the
  * `jobs/` spark-submit entrypoints.
  *
  * Metrics follow paper §7.1.2: average throughput (relevant input edges
  * per second) and the 99th-percentile window-slide latency. `scale`
  * multiplies stream sizes (`BENCH_SCALE` env); shapes — which system
  * wins and by roughly what factor — are scale-stable, absolute numbers
  * are not (single-threaded simulation vs. the paper's 32-core server).
  */
object BenchRunner {

  val Day: Long = GraphStreams.SecondsPerDay

  final case class BenchRow(
      graph: String,
      query: String,
      system: String,
      throughputEps: Double,
      tailLatencyMs: Double,
      results: Long,
      stateSize: Long) {
    def pretty: String =
      f"$graph%-5s $query%-4s $system%-4s tput=${throughputEps}%10.0f e/s  " +
      f"tail=${tailLatencyMs}%8.1f ms  results=$results%9d  state=$stateSize%9d"
  }

  def scale: Double = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(0.5)

  /** SO-sim stream for benchmarks (dense, cyclic — stress case). */
  def soStream(spark: SparkSession, scale: Double): Vector[Sge] =
    GraphStreams.soSim(spark,
      nUsers = 300,
      nEdges = (30000 * scale).toLong.max(1000),
      spanDays = 120)

  /** LDBC-sim stream (typed, tree-shaped replyOf). */
  def ldbcStream(spark: SparkSession, scale: Double): Vector[Sge] =
    GraphStreams.ldbcSim(spark,
      nPersons = 300,
      nPosts = (8000 * scale).toLong.max(500),
      nKnows = (6000 * scale).toLong.max(300),
      nLikes = (26000 * scale).toLong.max(1000),
      spanDays = 120)

  /** Table 2 systems: SGA = direct approach, DD = differential baseline;
    * "NT" additionally exposes the authors' earlier negative-tuple RPQ
    * algorithm [62] for comparison (not a paper Table 2 column).
    */
  def modeOf(system: String): Mode = system match {
    case "SGA" => Mode.Direct
    case "DD"  => Mode.Differential
    case "NT"  => Mode.NegativeTuple
    case other => throw new IllegalArgumentException(s"unknown system $other")
  }

  def measure(graph: String, query: String, system: String,
              expr: SgaExpr, stream: Vector[Sge], slide: Long): BenchRow = {
    val run = Engine.run(expr, modeOf(system), stream, slide, keepLog = false)
    row(graph, query, system, run)
  }

  private def row(graph: String, query: String, system: String, run: RunResult): BenchRow =
    BenchRow(graph, query, system, run.throughputEps, run.tailLatencyMs,
             run.totalResults, run.finalStateSize)

  /** Query subset from BENCH_QUERIES (comma-separated), default all. */
  def defaultQueries: Seq[String] =
    sys.env.get("BENCH_QUERIES").map(_.split(",").toSeq.map(_.trim)).getOrElse(Workloads.queryNames)

  /** Table 2: Q1–Q8 × {SO, LDBC} × {SGA, DD}, |W|=30 days, β=1 day. */
  def runTable2(spark: SparkSession, queries: Seq[String] = defaultQueries): Seq[BenchRow] = {
    val window = 30 * Day
    val slide  = 1 * Day
    val so     = soStream(spark, scale)
    val ldbc   = ldbcStream(spark, scale)
    // Q8's co-target self-join inflates the derived stream quadratically
    // (the paper's own slowest query: 262 e/s, 88 s tails on SO); run it
    // on a tenth-scale stream so the sweep completes (EXPERIMENTS.md).
    lazy val soQ8   = soStream(spark, scale * 0.1)
    lazy val ldbcQ8 = ldbcStream(spark, scale * 0.1)
    // Q4's canonical plan closes over a derived 3-chain stream — the
    // second-heaviest config; halve its stream so the sweep completes.
    lazy val soQ4   = soStream(spark, scale * 0.5)
    lazy val ldbcQ4 = ldbcStream(spark, scale * 0.5)
    for {
      (graph, stream, q8Stream, q4Stream, bind) <- Seq(
        ("SO", so, () => soQ8, () => soQ4, Workloads.soBinding _),
        ("LDBC", ldbc, () => ldbcQ8, () => ldbcQ4, Workloads.ldbcBinding _))
      query  <- queries
      system <- Seq("SGA", "DD")
    } yield {
      val s = if (query == "Q8") q8Stream() else if (query == "Q4") q4Stream() else stream
      val r = measure(graph, query, system,
        Workloads.expr(query, bind(query), window, slide), s, slide)
      Console.err.println(s"[table2] ${r.pretty}")
      r
    }
  }

  /** §7.4 plan-space micro-benchmark: Q4 plans SGA/P1/P2/P3 (Fig. 8) and
    * the Q2/Q3 alternative plans (Fig. 9), on both graphs.
    */
  def runPlanSpace(spark: SparkSession): Seq[BenchRow] = {
    val window = 30 * Day
    val slide  = 1 * Day
    // Plan comparisons are relative; a 0.3x stream keeps the sweep short.
    val so     = soStream(spark, scale * 0.3)
    val ldbc   = ldbcStream(spark, scale * 0.3)
    val q4 = for {
      (graph, stream, bind) <- Seq(
        ("SO", so, Workloads.soBinding("Q4")),
        ("LDBC", ldbc, Workloads.ldbcBinding("Q4")))
      (plan, expr) <- Workloads.q4Plans(bind, window, slide).toSeq.sortBy(_._1)
    } yield {
      val r = measure(graph, s"Q4/$plan", "SGA", expr, stream, slide)
      Console.err.println(s"[planspace] ${r.pretty}")
      r
    }
    val alts = for {
      (query, mk) <- Seq[(String, SgaExpr)](
        ("Q2/alt", Workloads.q2AltPlan(Workloads.soBinding("Q2"), window, slide)),
        ("Q3/alt", Workloads.q3AltPlan(Workloads.soBinding("Q3"), window, slide)),
        ("Q2/SGA", Workloads.expr("Q2", Workloads.soBinding("Q2"), window, slide)),
        ("Q3/SGA", Workloads.expr("Q3", Workloads.soBinding("Q3"), window, slide)))
    } yield {
      val r = measure("SO", query, "SGA", mk, so, slide)
      Console.err.println(s"[planspace] ${r.pretty}")
      r
    }
    q4 ++ alts
  }

  /** Fig. 6 analogue: window-size and slide-interval sensitivity on SO. */
  def runSensitivity(spark: SparkSession): Seq[BenchRow] = {
    // Sensitivity trends are relative; a 0.3x stream keeps the sweep short.
    val so = soStream(spark, scale * 0.3)
    val windows = Seq(7L, 15L, 30L, 60L).map(_ * Day)
    val slides  = Seq(1L, 3L, 7L).map(_ * Day)
    val byWindow = for {
      w     <- windows
      query <- Seq("Q1", "Q6")
    } yield {
      val r = measure("SO", s"$query/W=${w / Day}d", "SGA",
        Workloads.expr(query, Workloads.soBinding(query), w, Day), so, Day)
      Console.err.println(s"[sensitivity] ${r.pretty}")
      r
    }
    val bySlide = for {
      b      <- slides
      system <- Seq("SGA", "DD")
    } yield {
      val r = measure("SO", s"Q1/b=${b / Day}d", system,
        Workloads.expr("Q1", Workloads.soBinding("Q1"), 30 * Day, b), so, b)
      Console.err.println(s"[sensitivity] ${r.pretty}")
      r
    }
    byWindow ++ bySlide
  }

  /** Markdown table for EXPERIMENTS.md. */
  def markdown(rows: Seq[BenchRow]): String = {
    val header = "| graph | query | system | throughput (edges/s) | tail latency (ms) | results | state |\n" +
                 "|---|---|---|---:|---:|---:|---:|"
    val body = rows.map(r =>
      f"| ${r.graph} | ${r.query} | ${r.system} | ${r.throughputEps}%.0f | ${r.tailLatencyMs}%.1f | ${r.results} | ${r.stateSize} |")
    (header +: body).mkString("\n")
  }

  def writeResults(name: String, rows: Seq[BenchRow]): java.nio.file.Path = {
    val dir = java.nio.file.Paths.get(sys.env.getOrElse("BENCH_OUT", "bench_results"))
    java.nio.file.Files.createDirectories(dir)
    val f = dir.resolve(s"$name.md")
    java.nio.file.Files.write(f, markdown(rows).getBytes("UTF-8"))
    f
  }
}
