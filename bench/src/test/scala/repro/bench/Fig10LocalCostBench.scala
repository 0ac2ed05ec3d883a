package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.exp.{CostEfficiencyExp, TableFmt}

/** Figure 10 of the paper: running time of local cost estimation — LC
  * (pattern tables, Alg. 2, O(1) per BMC) vs NLC (curve-segment scan,
  * O(V) per query). Paper claim: LC wins by up to five orders of
  * magnitude.
  */
class Fig10LocalCostBench extends AnyFunSuite {

  private def show(caption: String, labels: Seq[String], rows: Seq[CostEfficiencyExp.Row]): Unit =
    println(TableFmt.render(caption,
      Seq("param", "LC (µs/eval)", "NLC (ms/eval)", "gain"),
      labels.zip(rows).map { case (l, r) =>
        Seq(l, TableFmt.micros(r.fastNanosPerEval), TableFmt.ms(r.naiveNanosPerEval),
          f"${r.gain}%.0fx")
      }))

  test("Fig 10a: varying the number of queries n") {
    val exps = Seq(0, 2, 4, 6, 8)
    val rows = exps.map(e => CostEfficiencyExp.local(n = 1 << e, mNaive = 1))
    show("Fig 10a: local cost vs n", exps.map(e => s"n=2^$e"), rows)
    assert(rows.last.gain > 1000.0, s"gain ${rows.last.gain}")
    assert(rows.last.gain > rows.head.gain, s"gains: ${rows.map(_.gain)}")
  }

  test("Fig 10b: varying the query edge length δ") {
    val deltas = Seq(16L, 32L, 64L, 128L, 256L)
    val rows = CostEfficiencyExp.sweepDelta("local", deltas)
    show("Fig 10b: local cost vs δ", deltas.map(d => s"δ=$d"), rows)
    // NLC scans V = δ² cells per query: it must grow steeply with δ while
    // LC stays flat.
    assert(rows.last.naiveNanosPerEval > rows.head.naiveNanosPerEval * 16,
      s"NLC: ${rows.map(_.naiveNanosPerEval)}")
    val lc = rows.map(_.fastNanosPerEval)
    assert(lc.max < math.max(lc.min, 1000.0) * 50, s"LC should be flat-ish in δ: $lc")
  }

  test("Fig 10c: varying the number of bits ℓ") {
    val bitsSeq = Seq(10, 12, 14)
    val rows = CostEfficiencyExp.sweepBits("local", bitsSeq)
    show("Fig 10c: local cost vs ℓ", bitsSeq.map(b => s"ℓ=$b"), rows)
    // The scan volume grows 4× per ℓ step — NLC explodes, LC does not;
    // this is why the paper cannot run NLC beyond ℓ=18.
    assert(rows.last.naiveNanosPerEval > rows.head.naiveNanosPerEval * 8,
      s"NLC: ${rows.map(_.naiveNanosPerEval)}")
    assert(rows.forall(_.gain > 100.0), rows.map(_.gain).toString)
  }

  test("Fig 10d: varying the dimensionality d") {
    val rows = CostEfficiencyExp.sweepD("local", Seq(2, 3, 4))
    show("Fig 10d: local cost vs d (gain column = paper's y-axis)",
      Seq(2, 3, 4).map(d => s"d=$d"), rows)
    assert(rows.forall(_.gain > 10.0), rows.map(_.gain).toString)
  }
}
