package repro.baselines

import repro.core.{Cumulative, GreedyDM, Instance}

/** GED-T baseline (§VIII-A): the greedy opinion-maximization algorithm of
  * Gionis et al. [25], adapted to a finite time horizon. The paper notes
  * (§VII, App A) that with this adaptation it coincides with DM greedy on
  * the cumulative score — it always maximizes aggregate opinion, regardless
  * of which voting score the seeds are later evaluated on. That mismatch is
  * exactly why it underperforms on plurality/Copeland (Figs 6–8).
  */
object GedT {
  def select(inst: Instance, k: Int): Seq[Long] =
    GreedyDM.select(inst, Cumulative, k, celf = true).seeds
}
