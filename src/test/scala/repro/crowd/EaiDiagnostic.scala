package repro.crowd

import org.scalatest.funsuite.AnyFunSuite
import repro.assign.{Assigner, EaiAssigner, QascaAssigner}
import repro.baselines.{TdhInference, TruthInference}
import repro.data.{AnswerLog, TruthDataGen}

/** Diagnostic (not a regression suite): where does each assigner spend the
  * crowd budget on Heritages, and which objects stay wrong?
  */
class EaiDiagnostic extends AnyFunSuite {

  ignore("budget breakdown EAI vs QASCA on Heritages") {
    val ds = TruthDataGen.heritages()
    def runWith(asg: Assigner, inf: TruthInference): Unit = {
      val workers = SimWorkers.uniform(10, 0.75, 123)
      val answers = new AnswerLog(ds.numObjects)
      var state = inf.infer(ds.views, answers)
      for (_ <- 1 to 50) {
        val tasks = asg.assign(state, answers, workers.ids, 5)
        tasks.foreach { case (w, o) => answers.add(o, w, workers.answer(ds, w, o)) }
        state = inf.infer(ds.views, answers)
      }
      val est = state.truthValues
      val wrong = (0 until ds.numObjects).filter(o => est(o) != ds.mappedGold(o))
      val answered = (0 until ds.numObjects).map(answers.count)
      val goldClaimable = (0 until ds.numObjects).count(o => ds.views(o).candIndex(ds.mappedGold(o)) >= 0)
      println(s"--- ${asg.name} ---")
      println(s"accuracy=${1.0 - wrong.size.toDouble / ds.numObjects} wrong=${wrong.size}")
      println(s"gold claimable objects: $goldClaimable / ${ds.numObjects}")
      println(s"answers: total=${answered.sum} objectsWithAnswers=${answered.count(_ > 0)} " +
        s"maxPerObject=${answered.max}")
      val wrongAnswered = wrong.count(o => answers.count(o) > 0)
      println(s"wrong objects: ${wrong.size}, of which answered=$wrongAnswered, " +
        s"unclaimableGold=${wrong.count(o => ds.views(o).candIndex(ds.mappedGold(o)) < 0)}")
      val hist = answered.groupBy(identity).view.mapValues(_.size).toSeq.sortBy(_._1)
      println(s"answers/object histogram: ${hist.map { case (k, v) => s"$k:$v" }.mkString(" ")}")
      val wrongByRecords = wrong.groupBy(o => ds.views(o).nRecords).view.mapValues(_.size).toSeq.sortBy(_._1)
      println(s"wrong objects by #records: ${wrongByRecords.map { case (k, v) => s"$k:$v" }.mkString(" ")}")
      // saturated objects: what do they look like?
      val sat = (0 until ds.numObjects).filter(o => answers.count(o) >= 9)
      if (sat.nonEmpty) {
        val inOh = sat.count(ds.views(_).inOH)
        val correct = sat.count(o => est(o) == ds.mappedGold(o))
        val muMax = sat.map(o => state.mu(o).max)
        println(f"saturated(>=9 ans): n=${sat.size} inOH=$inOh correct=$correct " +
          f"muMaxAvg=${muMax.sum / muMax.size}%.3f muMaxMin=${muMax.min}%.3f")
        sat.take(5).foreach { o =>
          val v = ds.views(o)
          println(s"  obj=$o nRec=${v.nRecords} cands=${v.cands.toSeq} depths=${v.candDepth.toSeq} " +
            s"srcCnt=${v.srcCount.toSeq} mu=${state.mu(o).map(x => f"$x%.2f").toSeq} " +
            s"gold=${ds.mappedGold(o)} est=${est(o)} answers=${answers.answersFor(o).map(_._2)}")
        }
      }
    }
    runWith(new EaiAssigner(), new TdhInference())
    runWith(new QascaAssigner(), new TdhInference())
  }
}
