"""T3 benchmark (Fig. 6): effect of the size threshold τ_s on the
global-bounds algorithms (Student dataset; runtime should fall as τ_s
rises)."""
import pytest

from benchmarks._bench_common import bench_detection


@pytest.mark.parametrize("tau", [10, 50, 100])
@pytest.mark.parametrize("algo", ["baseline", "optimized"])
def test_tau_global(benchmark, student_full, tau, algo):
    bench_detection(benchmark, student_full, "global", algo, tau=tau)
