package repro.bench

import repro.SparkSpec
import repro.exp.Experiments
import repro.nlp.{NerModel, NerTrainer}

/** One paper-scale NER model shared by all bench suites (trained once per
  * JVM on 8800 cluster-selected phrases, the paper's 6612+2188).
  */
object BenchModel {
  lazy val trained: (NerModel, Double, Seq[NerTrainer.Labeled]) =
    Experiments.trainNer(SparkSpec.shared, nPhrases = 8800, epochs = 8, seed = 99)

  def model: NerModel = trained._1
  def holdoutF1: Double = trained._2
  def corpus: Seq[NerTrainer.Labeled] = trained._3
}
