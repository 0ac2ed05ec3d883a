package repro.learn

import java.util.Random
import repro.core.{BMC, WorkloadCost}
import scala.collection.mutable.ArrayBuffer

/** Configuration for the LBMC learner (Algorithm 3).
  *
  * @param episodes    M — number of learning episodes
  * @param steps       T — bit swaps per episode
  * @param exploitStart ε at the first step (probability of exploiting)
  * @param exploitEnd   ε at the last step (linear schedule)
  * @param gamma       discount factor of the Q target
  * @param hidden      hidden width of the DQN
  * @param batch       replay minibatch size
  * @param replay      replay-memory capacity N_MQ
  * @param targetSync  steps between target-network syncs
  */
final case class LBMCConfig(
    episodes: Int = 30,
    steps: Int = 40,
    exploitStart: Double = 0.5,
    exploitEnd: Double = 0.95,
    gamma: Double = 0.9,
    hidden: Int = 64,
    batch: Int = 32,
    replay: Int = 2048,
    targetSync: Int = 50,
    lr: Double = 1e-3,
    seed: Long = 42)

/** Result of an LBMC run. */
final case class LBMCResult(
    best: BMC,
    bestCost: BigInt,
    costTrace: Vector[Double], // C_t / C_1 per step, the paper's Fig. 8e
    rewardNanos: Long,         // time spent in cost estimation (reward calc)
    totalNanos: Long)

/** LBMC: reinforcement-learning search for a query-efficient BMC
  * (Section 5, Algorithm 3).
  *
  * State = the current BMC σ_t (one-hot encoded), action = the rank of a
  * bit to swap with its upper neighbour, reward = the relative cost
  * reduction `(C_t − C_{t+1}) / C_1` where C is the O(1) combined cost
  * model (Eq. 4/6 + Algorithm 2). A deep Q-network with experience replay
  * and a target network selects swaps ε-greedily.
  */
final class LBMC(cost: WorkloadCost, cfg: LBMCConfig = LBMCConfig()) {

  private val d = cost.d
  private val L = cost.bitsPerDim.sum
  private val stateSize = L * d
  private val nActions = L - 1

  /** φ(σ): one-hot encoding of the dimension owning each rank. */
  def encode(sigma: BMC): Array[Double] = {
    val x = new Array[Double](stateSize)
    var r = 0
    while (r < L) { x(r * d + sigma.dims(r)) = 1.0; r += 1 }
    x
  }

  /** Actions that change σ (swapping two same-dimension bits is a no-op). */
  private def validActions(sigma: BMC): Array[Int] =
    (0 until nActions).filter(a => sigma.dims(a) != sigma.dims(a + 1)).toArray

  /** Run Algorithm 3 from `init` and return the best BMC encountered. */
  def learn(init: BMC): LBMCResult = {
    require(init.d == d && java.util.Arrays.equals(init.bitsPerDim, cost.bitsPerDim),
      "initial BMC shape does not match the cost model")
    val t0 = System.nanoTime()
    var rewardNanos = 0L
    def timedCost(s: BMC): Double = {
      val c0 = System.nanoTime()
      val c = cost.costD(s)
      rewardNanos += System.nanoTime() - c0
      c
    }

    val rng = new Random(cfg.seed)
    val qNet = new MLP(Array(stateSize, cfg.hidden, nActions), cfg.seed + 1, cfg.lr)
    val target = new MLP(Array(stateSize, cfg.hidden, nActions), cfg.seed + 1, cfg.lr)
    target.copyWeightsFrom(qNet)

    // Replay memory MQ: (state, action, reward, nextState, nextValidActions).
    val mq = new ArrayBuffer[(Array[Double], Int, Double, Array[Double], Array[Int])]
    val trace = Vector.newBuilder[Double]

    val c1 = timedCost(init)
    var best = init
    var bestCost = c1
    var globalStep = 0
    val totalSteps = cfg.episodes * cfg.steps

    for (_ <- 1 to cfg.episodes) {
      var sigma = init
      var curCost = c1
      var state = encode(sigma)
      for (_ <- 1 to cfg.steps) {
        val valid = validActions(sigma)
        val exploit = cfg.exploitStart +
          (cfg.exploitEnd - cfg.exploitStart) * globalStep / math.max(1, totalSteps - 1)
        val action =
          if (rng.nextDouble() >= exploit) valid(rng.nextInt(valid.length))
          else {
            val q = qNet.forward(state)
            valid.maxBy(q(_))
          }
        val next = sigma.swap(action)
        val nextCost = timedCost(next)
        val reward = (curCost - nextCost) / c1
        val nextState = encode(next)
        val nextValid = validActions(next)

        if (mq.size >= cfg.replay) mq.remove(0)
        mq += ((state, action, reward, nextState, nextValid))

        if (mq.size >= cfg.batch) {
          val batch = Seq.fill(cfg.batch)(mq(rng.nextInt(mq.size)))
          val samples = batch.map { case (s, a, r, s2, v2) =>
            val q2 = target.forward(s2)
            val maxQ = if (v2.isEmpty) 0.0 else v2.map(q2(_)).max
            (s, a, r + cfg.gamma * maxQ)
          }
          qNet.trainBatch(samples)
        }
        globalStep += 1
        if (globalStep % cfg.targetSync == 0) target.copyWeightsFrom(qNet)

        sigma = next
        curCost = nextCost
        state = nextState
        trace += curCost / c1
        if (curCost < bestCost) { bestCost = curCost; best = sigma }
      }
    }
    LBMCResult(best, cost.cost(best), trace.result(), rewardNanos, System.nanoTime() - t0)
  }
}
