package repro.engine

import org.scalatest.funsuite.AnyFunSuite
import scala.collection.mutable.ArrayBuffer

class ClusterSpec extends AnyFunSuite {
  private val c = TestRig.costs

  private final class FakeTicker(var work: Double) extends Ticker {
    val received = ArrayBuffer[Double]()
    def runnable: Boolean = work > 0
    def done: Boolean = work <= 0
    def advance(cpu: Double): Double = {
      received += cpu
      val used = math.min(cpu, work)
      work -= used
      used
    }
  }

  test("a lone driver gets at most one core's worth of a tick") {
    val n = new Node(0, 4, c)
    val t = new FakeTicker(100.0)
    n.register(t)
    n.resetTick(0.1)
    n.tick(0.1)
    assert(t.received == ArrayBuffer(0.1)) // dt, not cores*dt
  }

  test("fair share splits cores*dt when drivers exceed cores") {
    val n = new Node(0, 2, c)
    val ts = (1 to 8).map(_ => new FakeTicker(100.0))
    ts.foreach(n.register)
    n.tick(0.1)
    // 2 cores * 0.1s over 8 runnable = 0.025 each
    ts.foreach(t => assert(math.abs(t.received.head - 0.025) < 1e-12))
  }

  test("busyCoreSeconds accumulates actual usage") {
    val n = new Node(0, 4, c)
    val t = new FakeTicker(0.03)
    n.register(t)
    n.tick(0.1)
    assert(math.abs(n.busyCoreSeconds - 0.03) < 1e-12)
  }

  test("finished tickers are deregistered after the tick") {
    val n = new Node(0, 4, c)
    val t = new FakeTicker(0.01)
    n.register(t)
    assert(n.tickerCount == 1)
    n.tick(1.0)
    assert(t.done && n.tickerCount == 0)
  }

  test("NIC charge requires positive budget on both nodes") {
    val a = new Node(0, 4, c); val b = new Node(1, 4, c)
    a.netBudget = 10; b.netBudget = 10
    assert(Node.chargeNet(a, b, 6))
    assert(Node.chargeNet(a, b, 6)) // drives slightly negative
    assert(!Node.chargeNet(a, b, 1))
    assert(Node.chargeNet(a, a, 1e18)) // same node: free
  }

  test("default cluster has data+compute split with distinct ids") {
    val cl = Cluster.default(c, dataN = 3, computeN = 2, cores = 8)
    assert(cl.dataNodes.map(_.id) == Vector(0, 1, 2))
    assert(cl.computeNodes.map(_.id) == Vector(3, 4))
    assert(cl.totalCores == 40)
    assert(cl.node(4).id == 4)
    intercept[IllegalArgumentException](cl.node(99))
  }

  test("round-robin compute placement cycles") {
    val cl = Cluster.default(c, dataN = 1, computeN = 3, cores = 2)
    val picks = (1 to 6).map(_ => cl.nextComputeNode().id)
    assert(picks == Vector(1, 2, 3, 1, 2, 3))
  }

  test("resetTick refills NIC budgets") {
    val cl = Cluster.default(c, dataN = 1, computeN = 1, cores = 2)
    cl.resetTick(0.5)
    cl.nodes.foreach(n => assert(n.netBudget == c.netBytesPerSec * 0.5))
  }
}
