"""T2 benchmark (Fig. 5): proportional-representation detection at the
default parameters, ITERTD vs PROPBOUNDS, per dataset."""
import pytest

from benchmarks._bench_common import bench_detection


@pytest.mark.parametrize("dataset", ["student", "compas", "german"])
@pytest.mark.parametrize("algo", ["baseline", "optimized"])
def test_prop_detection(benchmark, datasets, dataset, algo):
    bench_detection(benchmark, datasets[dataset], "prop", algo)
