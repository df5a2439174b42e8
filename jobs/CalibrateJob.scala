package repro.jobs

import repro.core.{Ted, TedConfig}
import repro.data.MoleculeGen
import repro.exp.Experiments

/** Scratch entrypoint for calibrating bench-scale dataset sizes: run TED
  * on one dataset and print timing. Usage:
  *   sbt "runMain repro.jobs.CalibrateJob <preset> <nGraphs> <eMax> <timeoutMs>"
  */
object CalibrateJob {
  def main(args: Array[String]): Unit = {
    val preset = if (args.length > 0) args(0) else "aids"
    val n = if (args.length > 1) args(1).toInt else 800
    val eMax = if (args.length > 2) args(2).toInt else 10
    val timeout = if (args.length > 3) args(3).toLong else 120000L
    val params = preset match {
      case "aids" => MoleculeGen.aidsLike(n)
      case "emol" => MoleculeGen.eMolLike(n)
      case "pub"  => MoleculeGen.pubChemLike(n)
    }
    val method = if (args.length > 4) args(4) else "ted"
    val t0 = System.currentTimeMillis()
    val db = MoleculeGen.db(params)
    println(s"generated ${db.numGraphs} graphs, ${db.totalEdges} edges in ${System.currentTimeMillis() - t0} ms")
    val res = method match {
      case "ted"  => Ted.full(db, TedConfig(k = 5, eMax = eMax, timeoutMillis = timeout))
      case "base" => Ted.base(db, TedConfig(k = 5, eMax = eMax, timeoutMillis = timeout))
      case "allg" => repro.core.Baselines.allG(db, 5, eMax, timeout)
      case "fsgg" => repro.core.Baselines.fsgG(db, 5, eMax, 0.1, timeout)
    }
    println(Experiments.renderResult(res))
    println(f"indexTime=${res.indexNanos / 1e9}%.2f s indexKB=${res.indexBytes / 1024.0}%.1f")
  }
}
