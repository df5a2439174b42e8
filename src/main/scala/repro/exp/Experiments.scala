package repro.exp

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.MoleculeGen
import repro.dist.{DistTed, GraphFrames}
import repro.graph.GraphDb

/** Shared harness behind the per-table jobs and bench suites. All scales
  * are parameters so unit tests run the same code paths on tiny inputs
  * while benches run the EXPERIMENTS.md configuration.
  *
  * Scale note (DESIGN.md §4): the paper's dataset sizes (10K–1M graphs, a
  * 32 GB desktop, 10000 s INF limit) are scaled to container-size DBs and
  * a shorter INF deadline; EXPERIMENTS.md records paper vs measured shape.
  */
object Experiments {

  final case class Scale(
      aidsSmall: Int, aidsLarge: Int,
      eMolSmall: Int, eMolLarge: Int,
      pubSmall: Int, pubLarge: Int,
      k: Int, eMax: Int,
      supMin: Double,
      timeoutMillis: Long,
  )

  /** Bench configuration — graph counts scaled ~1:12 from the paper. */
  val bench: Scale = Scale(
    aidsSmall = 800, aidsLarge = 3200,
    eMolSmall = 400, eMolLarge = 800,
    pubSmall = 800, pubLarge = 1800,
    k = 5, eMax = 10, supMin = 0.1,
    timeoutMillis = 120000L,
  )

  /** Tiny configuration exercising identical code paths in unit tests. */
  val tiny: Scale = Scale(
    aidsSmall = 30, aidsLarge = 60,
    eMolSmall = 20, eMolLarge = 40,
    pubSmall = 20, pubLarge = 40,
    k = 3, eMax = 4, supMin = 0.2,
    timeoutMillis = 60000L,
  )

  def fmt(d: Double): String = f"$d%.2f"

  // ------------------------------------------------------------------
  // Table 2 — dataset statistics.
  // ------------------------------------------------------------------

  final case class DatasetStats(name: String, eMax: Long, vMax: Long,
                                eAvg: Double, vAvg: Double, d: Long)

  def table2(spark: SparkSession, scale: Scale): Seq[DatasetStats] = {
    val presets = Seq(
      MoleculeGen.aidsLike(scale.aidsLarge),
      MoleculeGen.eMolLike(scale.eMolLarge),
      MoleculeGen.pubChemLike(scale.pubLarge),
    )
    presets.map { p =>
      val ds = GraphFrames.generateDS(spark, p)
      val row = GraphFrames.stats(spark, ds).collect()(0)
      DatasetStats(p.name, row.getLong(0), row.getLong(1),
        row.getDouble(2), row.getDouble(3), row.getLong(4))
    }
  }

  // ------------------------------------------------------------------
  // Tables 3 & 4 — PES-Index size and maintenance time, from full TED
  // runs over six dataset variants.
  // ------------------------------------------------------------------

  final case class PesRow(dataset: String, indexKB: Double, indexPctOfData: Double,
                          indexTimeS: Double, indexPctOfTotal: Double,
                          totalS: Double, coverageRate: Double, timedOut: Boolean)

  def pesDatasets(scale: Scale): Seq[(String, MoleculeGen.Params)] = Seq(
    s"AIDS${scale.aidsSmall}"  -> MoleculeGen.aidsLike(scale.aidsSmall),
    s"AIDS${scale.aidsLarge}"  -> MoleculeGen.aidsLike(scale.aidsLarge),
    s"eMol${scale.eMolSmall}"  -> MoleculeGen.eMolLike(scale.eMolSmall),
    s"eMol${scale.eMolLarge}"  -> MoleculeGen.eMolLike(scale.eMolLarge),
    s"PubChem${scale.pubSmall}" -> MoleculeGen.pubChemLike(scale.pubSmall),
    s"PubChem${scale.pubLarge}" -> MoleculeGen.pubChemLike(scale.pubLarge),
  )

  def tables34(scale: Scale): Seq[PesRow] =
    pesDatasets(scale).map { case (name, params) =>
      val db = MoleculeGen.db(params)
      val res = Ted.full(db, TedConfig(k = scale.k, eMax = scale.eMax,
        timeoutMillis = scale.timeoutMillis))
      PesRow(
        dataset = name,
        indexKB = res.indexBytes / 1024.0,
        indexPctOfData = 100.0 * res.indexBytes / db.sizeBytesEstimate,
        indexTimeS = res.indexNanos / 1e9,
        indexPctOfTotal = 100.0 * (res.indexNanos / 1e6) / math.max(1.0, res.millis.toDouble),
        totalS = res.millis / 1000.0,
        coverageRate = res.coverageRate,
        timedOut = res.timedOut,
      )
    }

  // ------------------------------------------------------------------
  // Tables 5 & 6 — VQF queries and patterns-used-per-query.
  // ------------------------------------------------------------------

  final case class VqfRow(query: String, queryEdges: Int,
                          fsUsed: Int, catapultUsed: Int, tedUsed: Int,
                          fsSteps: Int, catapultSteps: Int, tedSteps: Int,
                          tedUsesInfrequent: Boolean)

  /** `minEdges` is the MinE pattern budget of the TED Explorer (Section
    * 6.2): VQF pattern sets carry a minimum pattern size so that a drag
    * places a multi-edge fragment, exactly as canned-pattern systems do.
    * Applied to all three compared pattern sets for fairness.
    */
  def tables56(dbName: String, db: GraphDb, k: Int, eMax: Int, supMin: Double,
               nQueries: Int = 5, minE: Int = 30, maxE: Int = 62, minEdges: Int = 3,
               timeoutMillis: Long = Long.MaxValue, seed: Long = 17): Seq[VqfRow] = {
    val ted = Ted.full(db, TedConfig(k = k, eMax = eMax, minEdges = minEdges,
      timeoutMillis = timeoutMillis)).patterns
    val fs  = Baselines.topKFrequent(db, k, eMax, supMin, minEdges)
    val cat = Vqf.catapultProxy(db, k, eMax, supMin, minEdges)
    val queries = Vqf.sampleQueries(db, nQueries, minE, maxE, seed)
    // The paper's Table-6 "Yes" marker flags usage of a sup_min < 0.2
    // pattern, independent of the mining support threshold.
    val markerSupMin = 0.2
    queries.zipWithIndex.map { case (q, i) =>
      val fFs  = Vqf.formulate(q, fs, db, markerSupMin)
      val fCat = Vqf.formulate(q, cat, db, markerSupMin)
      val fTed = Vqf.formulate(q, ted, db, markerSupMin)
      VqfRow(s"${dbName}_Q${i + 1}", q.numEdges,
        fFs.patternsUsed, fCat.patternsUsed, fTed.patternsUsed,
        fFs.steps, fCat.steps, fTed.steps, fTed.usedInfrequent)
    }
  }

  // ------------------------------------------------------------------
  // Exp 7 / Figure 17 — RR between TED and FS as the fraction rho of
  // infrequent queries grows. Queries are small (rare structure dominates
  // them); infrequent ones are grown from rare-atom regions.
  // ------------------------------------------------------------------

  final case class RrRow(rho: Double, stepsFs: Int, stepsTed: Int, rr: Double)

  def fig17(db: GraphDb, k: Int, eMax: Int, supMin: Double, rhos: Seq[Double],
            nQueries: Int = 40, minQE: Int = 8, maxQE: Int = 16, minEdges: Int = 3,
            timeoutMillis: Long = Long.MaxValue, seed: Long = 23): Seq[RrRow] = {
    val ted = Ted.full(db, TedConfig(k = k, eMax = eMax, minEdges = minEdges,
      timeoutMillis = timeoutMillis)).patterns
    val fs = Baselines.topKFrequent(db, k, eMax, supMin, minEdges)
    rhos.map { rho =>
      val rng = new scala.util.Random(seed)
      val nRare = math.round(rho * nQueries).toInt
      val queries = (1 to nQueries).map { i =>
        val target = minQE + rng.nextInt(maxQE - minQE + 1)
        if (i <= nRare) Vqf.sampleRareQuery(db, target, rng)
        else Vqf.sampleQuery(db, target, rng)
      }
      val stepsFs = queries.map(q => Vqf.formulate(q, fs, db, supMin).steps).sum
      val stepsTed = queries.map(q => Vqf.formulate(q, ted, db, supMin).steps).sum
      RrRow(rho, stepsFs, stepsTed, Vqf.reductionRatio(stepsFs, stepsTed))
    }
  }

  // ------------------------------------------------------------------
  // Table 7 — patterns with "biological importance".
  // ------------------------------------------------------------------

  final case class BioRow(method: String, important: Int, total: Int)

  /** Table 7 with a caller-supplied repository (exact-compound codes or
    * frequent-fragment codes — see Vqf.exactRepository/buildRepository).
    */
  def table7(db: GraphDb, repository: Set[String], k: Int, eMax: Int, supMin: Double,
             minEdges: Int = 3, timeoutMillis: Long = Long.MaxValue): Seq[BioRow] = {
    val repo = repository
    val ted = Ted.full(db, TedConfig(k = k, eMax = eMax, minEdges = minEdges,
      timeoutMillis = timeoutMillis)).patterns
    val fs  = Baselines.topKFrequent(db, k, eMax, supMin, minEdges)
    val cat = Vqf.catapultProxy(db, k, eMax, supMin, minEdges)
    Seq(
      BioRow("FS", Vqf.bioImportance(fs, repo), fs.size),
      BioRow("CATAPULT", Vqf.bioImportance(cat, repo), cat.size),
      BioRow("TED", Vqf.bioImportance(ted, repo), ted.size),
    )
  }

  // ------------------------------------------------------------------
  // Supplementary: the Figures 9–15 method comparison (coverage rate and
  // processing time per method), also the source of Table 3/4 context.
  // ------------------------------------------------------------------

  def methodComparison(db: GraphDb, k: Int, eMax: Int, supMin: Double,
                       timeoutMillis: Long, alpha: Double = 1.0): Seq[RunResult] = {
    val cfg = TedConfig(k = k, eMax = eMax, alpha = alpha, timeoutMillis = timeoutMillis)
    Seq(
      Baselines.allG(db, k, eMax, timeoutMillis),
      Baselines.allT(db, k, eMax, alpha, timeoutMillis),
      Baselines.fsgG(db, k, eMax, supMin, timeoutMillis),
      Baselines.fsgT(db, k, eMax, supMin, alpha, timeoutMillis),
      Ted.base(db, cfg),
      Ted.prm(db, cfg),
      Ted.full(db, cfg),
    )
  }

  def distComparison(spark: SparkSession, db: GraphDb, k: Int, eMax: Int,
                     timeoutMillis: Long, partitions: Int = 8): RunResult = {
    val ds = GraphFrames.toDS(spark, db).repartition(partitions)
    DistTed.run(spark, ds, TedConfig(k = k, eMax = eMax,
      timeoutMillis = timeoutMillis)).result
  }

  def renderResult(r: RunResult): String = {
    val time = if (r.timedOut) "INF" else f"${r.millis / 1000.0}%.2f s"
    f"${r.method}%-8s coverageRate=${r.coverageRate}%.4f coverage=${r.coverage}%6d/${r.totalEdges}%d time=$time enumerated=${r.enumerated}%d"
  }
}
