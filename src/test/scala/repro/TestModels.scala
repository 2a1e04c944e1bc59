package repro

import repro.data.RecipeData
import repro.nlp.{NerModel, NerTrainer}

/** Shared trained NER model for test suites (one training per JVM). */
object TestModels {
  /** Trained on ~1.5k synthetic labeled phrases — small but representative. */
  lazy val ner: NerModel = {
    val spark = SparkSpec.shared
    val labeled = RecipeData.labeledCorpus(spark, 1500, seed = 99).collect().toSeq
      .map(l => NerTrainer.Labeled(l.tokens.toIndexedSeq, l.tags.toIndexedSeq))
    NerTrainer.train(labeled, epochs = 6, seed = 42)
  }
}
