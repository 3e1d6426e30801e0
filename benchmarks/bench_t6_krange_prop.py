"""T6 benchmark (Fig. 9): effect of the k range on the proportional
algorithms (German Credit)."""
import pytest

from benchmarks._bench_common import bench_detection


@pytest.mark.parametrize("k_max", [49, 150])
@pytest.mark.parametrize("algo", ["baseline", "optimized"])
def test_krange_prop(benchmark, german_full, k_max, algo):
    bench_detection(
        benchmark, german_full, "prop", algo, k_min=10, k_max=k_max
    )
