package repro.store

import org.scalatest.funsuite.AnyFunSuite

/** Tests for the simulated provisioned-bandwidth disk. Always restores the
  * disabled state so other suites are unaffected.
  */
class DiskThrottleSpec extends AnyFunSuite {

  test("disabled throttle does not block") {
    DiskThrottle.setBandwidthMiBps(0)
    val t0 = System.nanoTime()
    DiskThrottle.acquire(100L * 1024 * 1024)
    assert((System.nanoTime() - t0) < 50_000_000L, "acquire must be a no-op when disabled")
    assert(!DiskThrottle.isEnabled)
  }

  test("enabled throttle delivers approximately the configured bandwidth") {
    DiskThrottle.setBandwidthMiBps(200)
    try {
      val t0 = System.nanoTime()
      // 20 MiB at 200 MiB/s ⇒ ≈100 ms.
      (0 until 20).foreach(_ => DiskThrottle.acquire(1024 * 1024))
      val ms = (System.nanoTime() - t0) / 1_000_000
      assert(ms >= 80 && ms <= 400, s"expected ~100 ms, got $ms ms")
    } finally DiskThrottle.setBandwidthMiBps(0)
  }

  test("bandwidth is shared across threads (a single simulated disk)") {
    DiskThrottle.setBandwidthMiBps(200)
    try {
      val t0 = System.nanoTime()
      val threads = (0 until 4).map { _ =>
        new Thread(() => (0 until 5).foreach(_ => DiskThrottle.acquire(1024 * 1024)))
      }
      threads.foreach(_.start()); threads.foreach(_.join())
      val ms = (System.nanoTime() - t0) / 1_000_000
      // 20 MiB total through one shared 200 MiB/s disk ⇒ ≈100 ms, not ~25 ms.
      assert(ms >= 80, s"4 threads finished in $ms ms — bandwidth not shared")
    } finally DiskThrottle.setBandwidthMiBps(0)
  }

  test("setBandwidthMiBps toggles isEnabled") {
    DiskThrottle.setBandwidthMiBps(10)
    assert(DiskThrottle.isEnabled)
    DiskThrottle.setBandwidthMiBps(0)
    assert(!DiskThrottle.isEnabled)
  }
}
