package repro.serving

import repro.device.{InputSource, StorageDevice}

/** Simulated TensorFlow serving baseline (Tables 3 and 8; DESIGN.md §2).
  *
  * TensorFlow is compute-focused: every model, the input batch, and the
  * intermediates must fit in device memory simultaneously — otherwise the
  * run fails, reproducing the paper's `Failed` cells. When it fits, latency
  * is model load (from file, once) + input load (from the configured
  * source) + compute.
  *
  * @param memoryBytes   host RAM (CPU) or GPU memory
  * @param computeFactor multiplier on per-model compute (GPU FP64 on a T4 is
  *                      slower than CPU for the paper's matmul workload,
  *                      faster for the FFNN — the harness sets this per
  *                      scenario from the paper's own measurements)
  */
final case class TfConfig(memoryBytes: Long, loadDevice: StorageDevice,
                          source: InputSource, computeFactor: Double = 1.0)

object TfBaseline {

  /** Either "Failed" (working set exceeds memory) or latency in seconds.
    * Models are assumed resident (steady-state serving, as the paper
    * measures); only the input load and compute are charged.
    *
    * @param inputResident whether the input batch occupies device memory
    *                      (false on GPU, where TF streams the input in)
    */
  def serve(cfg: TfConfig, modelBytes: Seq[Long], inputBytes: Long,
            intermediateBytes: Long, computeSecondsPerModel: Double,
            inputResident: Boolean = true): Either[String, Double] = {
    val workingSet = modelBytes.sum + (if (inputResident) inputBytes else 0L) + intermediateBytes
    if (workingSet > cfg.memoryBytes) Left("Failed")
    else {
      val inputLoad = cfg.source match {
        case InputSource.Memory => StorageDevice.Ram.readSeconds(inputBytes)
        case s => cfg.loadDevice.readSeconds(inputBytes) * s.overheadFactor
      }
      Right(inputLoad + computeSecondsPerModel * cfg.computeFactor * modelBytes.size)
    }
  }

  /** Formatted cell for the comparison tables. */
  def cell(result: Either[String, Double]): String = result match {
    case Left(s) => s
    case Right(sec) => f"$sec%.0f"
  }
}
