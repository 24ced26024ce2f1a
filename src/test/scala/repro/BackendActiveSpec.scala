package repro
import repro.runtime.JavaBackend
class BackendActiveSpec extends SparkSpec {
  test("Java codegen backend is active") {
    assert(JavaBackend.available, "system Java compiler must be available in the forked test JVM")
  }
}
