"""Smoke tests: every jobs/ entrypoint runs end-to-end at --tiny scale.

These are the same mains that spark-submit runs at bench scale; the tests
assert the table rows they return are structurally sound.
"""
import importlib.util
import os
import sys

import pytest

JOBS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.abspath(__file__))), "jobs")


def _load(name: str):
    if JOBS_DIR not in sys.path:
        sys.path.insert(0, JOBS_DIR)
    spec = importlib.util.spec_from_file_location(name, os.path.join(JOBS_DIR, f"{name}.py"))
    mod = importlib.util.module_from_spec(spec)
    spec.loader.exec_module(mod)
    return mod


ARGS = ["--tiny", "--seed", "13"]


@pytest.mark.usefixtures("spark")
class TestJobs:
    def test_table1(self, spark):
        got = _load("table1_benchmark_stats").main(ARGS)
        assert got["Query"]["overall"] > 0
        assert got["Repository"]["overall"] > got["Query"]["overall"]
        assert sum(got["Query"][b] for b in ("1", "2-4", "5-7", ">7")) == got["Query"]["overall"]

    def test_table2(self, spark):
        got = _load("table2_overall").main(ARGS)
        key = ("Overall", "prec")
        assert set(got[key]) == {"CML", "DE-LN", "Opt-LN", "Qetch*", "FCM"}
        assert all(0.0 <= v <= 1.0 for v in got[key].values())

    def test_table3(self, spark):
        got = _load("table3_multiline").main(ARGS)
        assert any(k[1] == "prec" for k in got)
        for (_bucket, _metric), row in got.items():
            assert all(0.0 <= v <= 1.0 for v in row.values())

    def test_table4(self, spark):
        got = _load("table4_da_breakdown").main(ARGS)
        assert got
        for (op, bucket), v in got.items():
            assert op in ("avg", "sum", "max", "min")
            assert 0.0 <= v <= 1.0

    def test_table5(self, spark):
        got = _load("table5_hcman_ablation").main(ARGS)
        assert got[("FCM", "Overall")]["prec"] >= 0.0
        assert ("FCM-HCMAN", "Overall") in got

    def test_table6(self, spark):
        got = _load("table6_da_ablation").main(ARGS)
        for name in ("FCM", "FCM-DA"):
            assert ("Overall" in [p for (n, p) in got if n == name])

    def test_table7(self, spark):
        got = _load("table7_segment_sizes").main(ARGS)
        assert len(got) == 4  # tiny: 2x2 sweep
        assert all(0.0 <= v <= 1.0 for v in got.values())

    def test_table8(self, spark):
        got = _load("table8_indexing").main(ARGS)
        assert set(got) == {"none", "interval", "lsh", "hybrid"}
        # candidate counts must be nested: hybrid <= interval <= none
        assert got["hybrid"]["n_pairs"] <= got["interval"]["n_pairs"] <= got["none"]["n_pairs"]
        assert got["hybrid"]["n_pairs"] <= got["lsh"]["n_pairs"]
        # interval pruning is lossless
        assert got["interval"]["prec"] == pytest.approx(got["none"]["prec"])

    def test_table9(self, spark):
        got = _load("table9_negatives").main(ARGS)
        assert set(got["n_neg"]) == {1, 3}
        assert set(got["strategy"]) == {"random", "semihard"}
        for m in got["n_neg"].values():
            assert m["converged_epoch"] >= 1
