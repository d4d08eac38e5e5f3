"""Bench for Fig. 9: Scratch vs Scratch-Landmark SPSP."""
import pytest

from repro.landmark.index import run_landmark_experiment


@pytest.mark.benchmark(group="fig9")
def test_landmark_experiment(benchmark, spark, sssp_wl):
    def work():
        res = run_landmark_experiment(
            spark, sssp_wl.initial, sssp_wl.batches[:2],
            sssp_wl.spec.sources, sssp_wl.spec.targets, n_landmarks=5,
        )
        return res.scratch_s, res.landmark_s

    s, l = benchmark.pedantic(work, rounds=1, iterations=1)
    assert s > 0 and l > 0
