package repro.woodblock

import org.scalatest.funsuite.AnyFunSuite

class PpoSpec extends AnyFunSuite {

  /** Two-armed bandit: a single state, arm 0 pays 1.0, arm 1 pays 0.0.
    * PPO must concentrate probability on arm 0.
    */
  test("PPO converges on a two-armed bandit") {
    val net = new PolicyValueNet(inputDim = 1, hidden = 8, nActions = 2, seed = 7)
    val ppo = new Ppo(net, PpoConfig(lr = 0.01, entropyCoef = 0.001, minibatch = 64), seed = 8)
    val rng = new java.util.Random(9)
    val x = Array(1.0)
    val legal = Array(true, true)

    for (_ <- 0 until 30) {
      val batch = (0 until 64).map { _ =>
        val c = net.forward(x)
        val lp = Nn.maskedLogSoftmax(c.logits, legal)
        val a = Nn.sample(Nn.probsFromLogProbs(lp), rng)
        Experience(x, a, lp(a), legal, reward = if (a == 0) 1.0 else 0.0, valueOld = c.value)
      }
      ppo.update(batch)
    }
    val p = Nn.probsFromLogProbs(Nn.maskedLogSoftmax(net.forward(x).logits, legal))
    assert(p(0) > 0.9, s"p(arm0)=${p(0)}")
  }

  test("PPO respects action masking during updates") {
    val net = new PolicyValueNet(inputDim = 1, hidden = 8, nActions = 3, seed = 17)
    val ppo = new Ppo(net, PpoConfig(lr = 0.01), seed = 18)
    val rng = new java.util.Random(19)
    val x = Array(1.0)
    val legal = Array(true, false, true) // action 1 never legal
    for (_ <- 0 until 10) {
      val batch = (0 until 32).map { _ =>
        val c = net.forward(x)
        val lp = Nn.maskedLogSoftmax(c.logits, legal)
        val a = Nn.sample(Nn.probsFromLogProbs(lp), rng)
        Experience(x, a, lp(a), legal, reward = if (a == 2) 1.0 else 0.0, valueOld = c.value)
      }
      val sampled = batch.map(_.action).toSet
      assert(!sampled.contains(1))
      ppo.update(batch)
    }
    val p = Nn.probsFromLogProbs(Nn.maskedLogSoftmax(net.forward(x).logits, legal))
    assert(p(1) == 0.0)
    assert(p(2) > 0.8, s"p=${p.mkString(",")}")
  }

  test("value head learns the expected reward") {
    val net = new PolicyValueNet(inputDim = 1, hidden = 8, nActions = 2, seed = 27)
    val ppo = new Ppo(net, PpoConfig(lr = 0.01, valueCoef = 1.0), seed = 28)
    val rng = new java.util.Random(29)
    val x = Array(1.0)
    val legal = Array(true, true)
    for (_ <- 0 until 40) {
      val batch = (0 until 64).map { _ =>
        val c = net.forward(x)
        val lp = Nn.maskedLogSoftmax(c.logits, legal)
        val a = Nn.sample(Nn.probsFromLogProbs(lp), rng)
        Experience(x, a, lp(a), legal, reward = 0.7, valueOld = c.value)
      }
      ppo.update(batch)
    }
    assert(math.abs(net.forward(x).value - 0.7) < 0.1)
  }

  test("update on empty batch is a no-op") {
    val net = new PolicyValueNet(1, 4, 2, seed = 1)
    val ppo = new Ppo(net, PpoConfig())
    val (p, v, h) = ppo.update(IndexedSeq.empty)
    assert(p == 0.0 && v == 0.0 && h == 0.0)
  }
}
