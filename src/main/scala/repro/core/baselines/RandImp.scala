package repro.core.baselines

import org.apache.spark.sql.DataFrame
import repro.core._
import repro.ml.LocalMatrix

/** The paper's two ablation baselines (§V-A1). Both share SAFE's full
  * selection pipeline and differ only in how generation pairs are chosen:
  *
  *  - RAND: γ uniformly random pairs over the current features;
  *  - IMP ("SAFE-Important"): γ random pairs drawn from the *split features*
  *    of the trained GBDT (tests assumption 1/2 of §IV-B1 in isolation).
  */
object RandImp {

  def fitRandLocal(m: LocalMatrix, cfg: SafeConfig = SafeConfig()): SafeResult =
    Safe.fitLocal(m, cfg, RandomCombos)

  def fitImpLocal(m: LocalMatrix, cfg: SafeConfig = SafeConfig()): SafeResult =
    Safe.fitLocal(m, cfg, ImportantCombos)

  def fitRandSpark(df: DataFrame, labelCol: String = "label",
                   cfg: SafeConfig = SafeConfig()): SafeResult =
    Safe.fitSpark(df, labelCol, cfg, RandomCombos)

  def fitImpSpark(df: DataFrame, labelCol: String = "label",
                  cfg: SafeConfig = SafeConfig()): SafeResult =
    Safe.fitSpark(df, labelCol, cfg, ImportantCombos)
}
