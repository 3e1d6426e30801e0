"""T1 benchmark (Fig. 4): global-bounds detection at the default
parameters, baseline (ITERTD) vs optimized (GLOBALBOUNDS), per dataset."""
import pytest

from benchmarks._bench_common import bench_detection


@pytest.mark.parametrize("dataset", ["student", "compas", "german"])
@pytest.mark.parametrize("algo", ["baseline", "optimized"])
def test_global_detection(benchmark, datasets, dataset, algo):
    bench_detection(benchmark, datasets[dataset], "global", algo)
