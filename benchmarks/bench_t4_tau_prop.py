"""T4 benchmark (Fig. 7): effect of τ_s on the proportional algorithms
(Student dataset)."""
import pytest

from benchmarks._bench_common import bench_detection


@pytest.mark.parametrize("tau", [10, 50, 100])
@pytest.mark.parametrize("algo", ["baseline", "optimized"])
def test_tau_prop(benchmark, student_full, tau, algo):
    bench_detection(benchmark, student_full, "prop", algo, tau=tau)
