"""Smoke tests for the T1–T9 experiment definitions at tiny scale.

These check row structure and the paper's qualitative *shape* claims
(who wins, monotonicity); the full-scale numbers live in benchmarks/
and EXPERIMENTS.md.
"""
import pytest

from repro.experiments import tables


def by(rows, **kv):
    out = [r for r in rows if all(r[k] == v for k, v in kv.items())]
    assert out, f"no row matching {kv}"
    return out


class TestT1Similarity:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return tables.t1_similarity(
            spark, n_frags=4, tuples_per_frag=400, jaccards=(0.0, 1.0)
        )

    def test_all_algorithms_present(self, rows):
        algos = {r["algorithm"] for r in rows}
        assert algos == {"repart", "preagg_repart", "loom", "grasp"}

    def test_grasp_improves_with_similarity(self, rows):
        lo = by(rows, algorithm="grasp", jaccard=0.0)[0]["speedup"]
        hi = by(rows, algorithm="grasp", jaccard=1.0)[0]["speedup"]
        assert hi > lo

    def test_repart_flat_across_similarity(self, rows):
        lo = by(rows, algorithm="preagg_repart", jaccard=0.0)[0]["speedup"]
        hi = by(rows, algorithm="preagg_repart", jaccard=1.0)[0]["speedup"]
        assert hi == pytest.approx(lo, rel=0.05)

    def test_grasp_beats_baselines_at_full_similarity(self, rows):
        g = by(rows, algorithm="grasp", jaccard=1.0)[0]["speedup"]
        p = by(rows, algorithm="preagg_repart", jaccard=1.0)[0]["speedup"]
        l = by(rows, algorithm="loom", jaccard=1.0)[0]["speedup"]
        assert g > p and g >= l


class TestT3Imbalance:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return tables.t3_imbalance(
            spark, n_frags=4, total_tuples=4000, frac0_levels=(1 / 4, 1 / 2)
        )

    def test_no_loom(self, rows):
        assert "loom" not in {r["algorithm"] for r in rows}

    def test_grasp_degrades_no_faster_than_repart(self, rows):
        g_lo = by(rows, algorithm="grasp")[0]["speedup"]
        g_hi = by(rows, algorithm="grasp")[-1]["speedup"]
        p_lo = by(rows, algorithm="preagg_repart")[0]["speedup"]
        p_hi = by(rows, algorithm="preagg_repart")[-1]["speedup"]
        assert (g_hi / g_lo) > (p_hi / p_lo) * 0.9

    def test_both_degrade_with_imbalance(self, rows):
        for algo in ("preagg_repart", "grasp"):
            sp = [r["speedup"] for r in by(rows, algorithm=algo)]
            assert sp[-1] < sp[0]

    def test_grasp_tracks_repart_under_downlink_bound(self, rows):
        # With globally-unique keys every plan is pinned to the
        # destination-downlink bound, so GRASP ~= Preagg+Repart under the
        # paper's fluid cost model (the paper's 3x gap is a receiver-side
        # system effect — see EXPERIMENTS.md T3 notes).
        g = by(rows, algorithm="grasp")[-1]["speedup"]
        p = by(rows, algorithm="preagg_repart")[-1]["speedup"]
        assert g > 0.75 * p


class TestT4Bandwidth:
    def test_rows(self):
        rows = tables.t4_bandwidth_estimation(n_machines=2, frags_per_machine=3)
        assert {r["link_type"] for r in rows} == {
            "within_machine",
            "across_machines",
        }
        for r in rows:
            assert r["error_pct"] <= 20.0 + 1e-9


class TestT6Nonuniform:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return tables.t6_nonuniform(
            spark, n_machines=2, frags_per_machine=2, tuples_per_frag=400
        )

    def test_modes_present(self, rows):
        assert {r["mode"] for r in rows} == {"all_to_one", "all_to_all"}

    def test_grasp_wins_all_to_one(self, rows):
        g = by(rows, algorithm="grasp", mode="all_to_one")[0]["speedup"]
        assert g > 1.0

    def test_grasp_at_least_matches_all_to_all(self, rows):
        g = by(rows, algorithm="grasp", mode="all_to_all")[0]["speedup"]
        assert g > 0.9


class TestT9Ec2:
    @pytest.fixture(scope="class")
    def rows(self, spark):
        return tables.t9_ec2(
            spark, n_machines=2, frags_per_machine=2, n_files=8, tuples_per_file=500
        )

    def test_preagg_beats_repart_when_compute_bound(self, rows):
        rep = by(rows, algorithm="repart")[0]["speedup"]
        pre = by(rows, algorithm="preagg_repart")[0]["speedup"]
        assert pre > rep

    def test_grasp_competitive_at_tiny_scale(self, rows):
        # At this smoke-test scale (4 fragments) GRASP's extra phases
        # can offset the merge gains; it must stay within 25% of the
        # baseline here. The bench-scale run (benchmarks/bench_t9) is
        # where the paper's 2.2x shows up.
        g = by(rows, algorithm="grasp")[0]["speedup"]
        pre = by(rows, algorithm="preagg_repart")[0]["speedup"]
        assert g >= 0.75 * pre
