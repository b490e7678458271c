package repro.core

import org.apache.spark.sql.SparkSession

import repro.baselines.Baselines
import repro.discovery.JoinDiscovery
import repro.lake.Scenario
import repro.profile.{Profiler, Profiles}

/** End-to-end orchestration of one scenario: discovery → profiling →
  * prefetch → run METAM and the baselines under a shared query budget.
  * The augment engine (and its memoised Γ materialisations) is shared
  * across methods — a query's *count* is per-method, its join is paid
  * once, exactly as one server-side cache would serve all competitors.
  */
object Runner {

  val DefaultMethods: Vector[String] = Vector("METAM", "MW", "Overlap", "Uniform")

  /** Full outcome of one scenario run. */
  final case class ScenarioRun(
      scenario: Scenario,
      candidates: Vector[Candidate],
      profiles: Profiles,
      results: Map[String, SearchResult],
  )

  /** Discover and profile candidates for `scenario` (no querying yet). */
  def prepare(spark: SparkSession, scenario: Scenario,
              minContainment: Double = 0.03, maxHops: Int = 1,
             ): (AugmentEngine, Vector[Candidate], Profiles) = {
    val engine = new AugmentEngine(spark, scenario.input, scenario.lake)
    val candidates = JoinDiscovery.candidatesFor(spark, scenario.input, scenario.lake, minContainment, maxHops)
    require(candidates.nonEmpty, s"discovery produced no candidates for ${scenario.spec.name}")
    val profiles = Profiler.profileAll(spark, engine, candidates, scenario.profileTargetCol)
    engine.prefetch(candidates)
    (engine, candidates, profiles)
  }

  /** Run the named methods with a fresh budget each over one scenario. */
  def run(
      spark: SparkSession,
      scenario: Scenario,
      theta: Double,
      budget: Int,
      methods: Seq[String] = DefaultMethods,
      metamCfg: MetamConfig = MetamConfig(),
      minContainment: Double = 0.03,
      maxHops: Int = 1,
      seed: Long = 4242,
  ): ScenarioRun = {
    val (engine, candidates, profiles) = prepare(spark, scenario, minContainment, maxHops)
    val results = methods.map { m =>
      val util = new CountingUtility(engine, scenario.task, budget)
      val res = m match {
        case "METAM" => Metam.run(candidates, profiles, util, metamCfg.copy(theta = theta))
        case "MW" => Baselines.multiplicativeWeights(candidates, profiles, util, theta, seed = seed)
        case "Overlap" => Baselines.overlapRanking(candidates, profiles, util, theta)
        case "Uniform" => Baselines.uniformSampling(candidates, util, theta, seed)
        case "iARDA" => Baselines.iArda(candidates, profiles, util, theta)
        case "JoinEverything" => Baselines.joinEverything(candidates, util)
        case other => sys.error(s"unknown method $other")
      }
      m -> res
    }.toMap
    ScenarioRun(scenario, candidates, profiles, results)
  }
}
