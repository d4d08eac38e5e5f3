"""Runner tests: system configurations produce consistent metrics (§6.1.3)."""
import numpy as np
import pytest

from repro.graphs.generators import skitter_like
from repro.harness.runner import build_engine, run_config
from repro.harness.workloads import make_workload


@pytest.fixture(scope="module")
def wl():
    return make_workload(
        skitter_like(scale=0.05), "sssp", n_queries=2, n_batches=3, seed=1
    )


class TestScratch:
    def test_runs(self, spark, wl):
        out = run_config(spark, wl, "scratch")
        assert len(out["batch_times"]) == 3
        assert out["peak_bytes"] == 0 and not out["oom"]


class TestDifferentialSystems:
    @pytest.mark.parametrize("system", ["vdc", "jod"])
    def test_runs_and_counts(self, spark, wl, system):
        out = run_config(spark, wl, system)
        assert out["n_d_diffs"] > 0
        if system == "vdc":
            assert out["n_j_diffs"] > 0
        else:
            assert out["n_j_diffs"] == 0
        assert out["peak_bytes"] > 0

    def test_jod_uses_less_memory_than_vdc(self, spark, wl):
        """The headline JOD claim (§6.3): dropping δJ shrinks memory."""
        v = run_config(spark, wl, "vdc")
        j = run_config(spark, wl, "jod")
        assert j["peak_bytes"] < v["peak_bytes"]

    def test_same_answers_across_systems(self, spark, wl):
        outs = [run_config(spark, wl, s) for s in ("scratch", "vdc", "jod")]
        base = outs[0]["final"].sort_values(["qid", "v"]).reset_index(drop=True)
        for o in outs[1:]:
            got = o["final"].sort_values(["qid", "v"]).reset_index(drop=True)
            m = base.merge(got, on=["qid", "v"], how="outer", suffixes=("_a", "_b"))
            assert not m.isna().any().any()
            assert (m["val_a"] == m["val_b"]).all()


class TestDropping:
    @pytest.mark.parametrize("system", ["det", "prob"])
    def test_drop_reduces_stored_diffs(self, spark, wl, system):
        full = run_config(spark, wl, "jod")
        dropped = run_config(spark, wl, system, p=0.8, policy="random")
        assert dropped["n_d_diffs"] < full["n_d_diffs"]
        assert dropped["n_dropped"] > 0

    def test_det_memory_grows_with_droppedvt(self, spark, wl):
        out = run_config(spark, wl, "det", p=0.8, policy="random")
        # n_dropped counts tracked VT pairs, each 12 bytes in DroppedVT
        assert out["dropped_struct_bytes"] == out["n_dropped"] * 12
        assert out["n_dropped"] > 0

    def test_prob_struct_is_fixed_bloom(self, spark, wl):
        o1 = run_config(spark, wl, "prob", p=0.3, policy="random", bloom_capacity=4096)
        o2 = run_config(spark, wl, "prob", p=0.9, policy="random", bloom_capacity=4096)
        assert o1["dropped_struct_bytes"] == o2["dropped_struct_bytes"]


class TestBudget:
    def test_oom_flag(self, spark, wl):
        out = run_config(spark, wl, "vdc", budget_bytes=10)
        assert out["oom"]

    def test_generous_budget_ok(self, spark, wl):
        out = run_config(spark, wl, "jod", budget_bytes=10**9)
        assert not out["oom"]


class TestBuildEngine:
    def test_unknown_system(self, spark, wl):
        with pytest.raises(ValueError):
            build_engine(spark, wl, "nope")
