package repro.rl

import repro.SparkSpec

/** Tests of the replay memory and the DQN learner. */
class DqnSpec extends SparkSpec {

  private def tr(r: Double, done: Boolean = true): Transition =
    Transition(Array(0.0), 0, r, Array(0.0), Array(true), done)

  test("replay memory grows to capacity then overwrites") {
    val m = new ReplayMemory(4)
    (1 to 3).foreach(i => m.add(tr(i)))
    assert(m.size === 3)
    (4 to 9).foreach(i => m.add(tr(i)))
    assert(m.size === 4)
    // oldest entries overwritten: all sampled rewards are from {6,7,8,9}
    val rewards = m.sample(100).map(_.reward).toSet
    assert(rewards.subsetOf(Set(6.0, 7.0, 8.0, 9.0)))
  }

  test("sample of an empty memory is empty") {
    assert(new ReplayMemory(4).sample(10).isEmpty)
  }

  test("sample size is capped by fill level") {
    val m = new ReplayMemory(10)
    m.add(tr(1)); m.add(tr(2))
    assert(m.sample(5).size === 2)
  }

  test("selectAction respects the mask in greedy mode") {
    val dqn = new DQN(2, 3, seed = 41)
    val s = Array(0.5, 0.5)
    val a = dqn.selectAction(s, Array(false, true, false), explore = false)
    assert(a === 1)
  }

  test("selectAction respects the mask under exploration") {
    val dqn = new DQN(2, 4, seed = 43)
    dqn.epsilon = 1.0
    val picks = (0 until 50).map(_ =>
      dqn.selectAction(Array(0.1, 0.2), Array(true, false, true, false), explore = true)).toSet
    assert(picks.subsetOf(Set(0, 2)))
    assert(picks.size === 2) // both valid actions get explored
  }

  test("selectAction with no valid action throws") {
    val dqn = new DQN(2, 3)
    intercept[IllegalArgumentException] {
      dqn.selectAction(Array(0.0, 0.0), Array(false, false, false), explore = false)
    }
  }

  test("trainStep is a no-op until the batch fills") {
    val dqn = new DQN(1, 2, seed = 47)
    assert(dqn.trainStep() === 0.0)
    dqn.remember(tr(1.0))
    assert(dqn.trainStep() === 0.0)
  }

  test("epsilon decays to the floor") {
    val dqn = new DQN(1, 2, epsMin = 0.1, epsDecay = 0.5)
    dqn.decayEpsilon(); dqn.decayEpsilon(); dqn.decayEpsilon(); dqn.decayEpsilon()
    assert(math.abs(dqn.epsilon - 0.1) < 1e-12)
    dqn.decayEpsilon()
    assert(math.abs(dqn.epsilon - 0.1) < 1e-12)
  }

  test("DQN learns a two-armed bandit (action 1 pays more)") {
    val dqn = new DQN(1, 2, lr = 0.02, seed = 53)
    val s = Array(1.0)
    for (_ <- 0 until 300) {
      dqn.remember(Transition(s, 0, 0.0, s, Array(true, true), done = true))
      dqn.remember(Transition(s, 1, 1.0, s, Array(true, true), done = true))
      dqn.trainStep()
    }
    val q = dqn.online.forward(s)
    assert(q(1) > q(0), s"q=${q.toSeq}")
    assert(dqn.selectAction(s, Array(true, true), explore = false) === 1)
  }

  test("DQN bootstraps through non-terminal transitions (two-step chain)") {
    // s0 --a0--> s1 (r 0), s1 --a0--> done (r 1); gamma=0.9 => Q(s0,a0) -> ~0.9
    val dqn = new DQN(1, 1, gamma = 0.9, lr = 0.02, targetSyncEvery = 20, seed = 59)
    val s0 = Array(0.0); val s1 = Array(1.0)
    for (_ <- 0 until 600) {
      dqn.remember(Transition(s0, 0, 0.0, s1, Array(true), done = false))
      dqn.remember(Transition(s1, 0, 1.0, s1, Array(true), done = true))
      dqn.trainStep()
    }
    assert(math.abs(dqn.online.forward(s1)(0) - 1.0) < 0.2)
    assert(math.abs(dqn.online.forward(s0)(0) - 0.9) < 0.25)
  }

  test("masked next-state actions are excluded from the bootstrap max") {
    // next state has a huge Q for action 1, but the mask forbids it
    val dqn = new DQN(1, 2, gamma = 1.0, lr = 0.05, targetSyncEvery = 10, seed = 61)
    val s0 = Array(0.0); val s1 = Array(1.0)
    // teach Q(s1,1) = 10 and Q(s1,0) = 0
    for (_ <- 0 until 400) {
      dqn.remember(Transition(s1, 1, 10.0, s1, Array(true, true), done = true))
      dqn.remember(Transition(s1, 0, 0.0, s1, Array(true, true), done = true))
      dqn.trainStep()
    }
    // now teach s0 with next state s1 but action 1 masked: target = 0 + max(Q(s1,0)) ≈ 0
    val dqn2 = new DQN(1, 2, gamma = 1.0, lr = 0.05, targetSyncEvery = 10, seed = 61)
    for (_ <- 0 until 400) {
      dqn2.remember(Transition(s1, 1, 10.0, s1, Array(true, true), done = true))
      dqn2.remember(Transition(s1, 0, 0.0, s1, Array(true, true), done = true))
      dqn2.remember(Transition(s0, 0, 0.0, s1, Array(true, false), done = false))
      dqn2.trainStep()
    }
    assert(dqn2.online.forward(s0)(0) < 5.0, "bootstrap leaked through the mask")
  }

  test("target network sync copies online weights") {
    val dqn = new DQN(1, 2, targetSyncEvery = 1, seed = 67)
    for (i <- 0 until 40) { dqn.remember(tr(i)); }
    dqn.trainStep() // syncs because targetSyncEvery = 1
    val x = Array(0.3)
    assert(dqn.online.forward(x).toSeq === dqn.target.forward(x).toSeq)
  }
}
