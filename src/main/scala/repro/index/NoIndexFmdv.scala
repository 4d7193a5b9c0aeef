package repro.index

import org.apache.spark.sql.Dataset
import org.apache.spark.sql.functions._
import repro.core.{Enumerate, Fmdv, FmdvConfig, Solution}
import repro.lake.LakeColumn

/** "FMDV (no-index)" reference point of Fig. 14: solve FMDV by re-scanning
  * the corpus for every query column instead of using the offline index.
  * Functionally identical to [[repro.core.Fmdv]] over an index restricted to
  * H(C); many orders of magnitude slower per query, which is the point.
  */
object NoIndexFmdv {

  def solve(values: Seq[String], corpus: Dataset[LakeColumn],
            cfg: FmdvConfig = FmdvConfig(),
            idxCfg: OfflineIndexer.IndexConfig = OfflineIndexer.IndexConfig()): Option[Solution] = {
    val hs = Enumerate.hypothesis(values, cfg.tau, cfg.cap)
    if (hs.isEmpty) return None
    val spark = corpus.sparkSession
    import spark.implicits._
    val wanted = spark.sparkContext.broadcast(hs.map(_.key).toSet)
    val statsDf = corpus
      .flatMap(c => OfflineIndexer.localEvidence(c.values, idxCfg)
        .filter { case (k, _) => wanted.value.contains(k) })
      .toDF("pattern", "imp")
      .groupBy($"pattern")
      .agg(avg($"imp").as("fpr"), count(lit(1)).as("cov"))
    val mini = OfflineIndexer.collectIndex(statsDf)
    Fmdv.best(hs, mini, cfg)
  }
}
