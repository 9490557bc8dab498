package repro.model

import repro.params.SparkParams

/** Untrained (random-weight, deterministic) models with correct feature
  * widths — cheap fixtures for solver tests that need an objective surface
  * but not a calibrated one.
  */
object TestModels {
  def untrained(seed: Long = 1): Models = {
    val emb = new GraphEmbedder()
    val subQIn = emb.outDim + Features.ndDim + SparkParams.dAll + Features.hintDim
    val qsIn = emb.outDim + Features.ndDim + SparkParams.dC + SparkParams.dS + Features.hintDim
    val lqpIn = subQIn + 1
    def reg(in: Int, s: Long) =
      RegModel(new Mlp(Array(in, 16, 2), s), Array(0.0, 0.0), Array(1.0, 1.0))
    Models(emb, reg(subQIn, seed), reg(qsIn, seed + 1), reg(lqpIn, seed + 2))
  }
}
