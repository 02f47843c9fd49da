package repro.core

/** System parameters (paper Table 1) plus engineering knobs.
  *
  * Names mirror the paper's λ parameters; defaults follow Table 1 where it
  * gives one. `selAttrCount` corresponds to λ_#sel-attr = 3 ("#attributes
  * returned by feature selection") and is applied per attribute kind
  * (categorical / numeric) so both pattern stages have material to work
  * with — Table 4's explanations mix both kinds.
  */
final case class Params(
    maxEdges: Int = 3,              // λ_#edges — max edges per join graph
    selAttrCount: Int = 3,          // λ_#sel-attr — attrs kept per kind by feature selection
    maxNumericPreds: Int = 3,       // λ_attrNum — numeric predicates per pattern
    patSampleRate: Double = 0.1,    // λ_pat-samp — LCA candidate-generation sample rate
    patSampleCap: Int = 1000,       // row cap for the LCA sample (Section 5.4)
    f1SampleRate: Double = 0.3,     // λ_F1-samp — F-score calculation sample rate
    nFragments: Int = 4,            // λ_#frag — numeric domain fragments
    recallThreshold: Double = 0.2,  // λ_recall — prune patterns below this recall
    kCat: Int = 12,                 // k_cat — categorical patterns promoted to refinement
    topK: Int = 10,                 // k — patterns returned per join graph
    maxCatPreds: Int = 3,           // categorical predicates per LCA pattern
    corrThreshold: Double = 0.92,   // attribute-clustering association threshold
    maxFrontier: Int = 128,         // refinement beam width per level
    qCostThreshold: Double = 5e7,   // λ_qCost — estimated APT rows above which mining is skipped
    maxJoinGraphs: Int = 200,       // enumeration safety cap
    featureSelection: Boolean = true,
    seed: Long = 42,
)

object Params {
  val default: Params = Params()
}
