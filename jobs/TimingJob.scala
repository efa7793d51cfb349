package repro.jobs

import repro.exp.TimingExp

/** Entrypoint for the Figure-10-shaped timing comparison (local kernel;
  * Spark is not involved so the variant timings are clean).
  * Env: REPRO_SCALE, REPRO_DATASETS.
  */
object TimingJob {
  def main(args: Array[String]): Unit = {
    TimingExp.runAndEmit()
  }
}
