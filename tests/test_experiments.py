"""Tests for the experiment harness (one function per paper artifact)."""
import pytest

from repro import experiments as ex


class TestTable1:
    def test_rows_and_columns(self):
        df = ex.table1_network_stats()
        assert len(df) == 7
        assert {"dataset", "V", "E", "density", "max_deg", "paper_V"} <= set(df.columns)

    def test_density_definition(self):
        df = ex.table1_network_stats()
        for _, r in df.iterrows():
            assert abs(r.density - r.E / r.V) < 0.01


class TestTable2:
    @pytest.fixture(scope="class")
    def t2(self):
        return ex.table2_sweep_rules(datasets=("dblp", "nd"), ks=(8, 10))

    def test_proportions_sum_to_one(self, t2):
        for _, r in t2.iterrows():
            assert abs(r["NS_1"] + r["NS_2"] + r["GS"] + r["Non-Pru"] - 1.0) < 0.01

    def test_sweeps_prune_majority_on_dense(self, t2):
        r = t2.set_index("dataset").loc["dblp"]
        assert r["Non-Pru"] < 0.5  # paper: 8% on DBLP; ours is also small


class TestEffectiveness:
    @pytest.fixture(scope="class")
    def eff(self):
        return ex.effectiveness_metrics(datasets=("youtube",), ks=(10, 12))

    def test_models_present(self, eff):
        assert set(eff.model) == {"k-VCC", "k-ECC", "k-core"}

    def test_kvcc_most_cohesive(self, eff):
        # the paper's headline: k-VCCs have the smallest diameter and the
        # largest density / clustering of the three models
        for k in (10, 12):
            sub = eff[(eff.k == k) & (eff["count"] > 0)].set_index("model")
            if len(sub) < 3:
                continue
            assert sub.loc["k-VCC", "density"] >= sub.loc["k-core", "density"]
            assert sub.loc["k-VCC", "diameter"] <= sub.loc["k-core", "diameter"]
            assert sub.loc["k-VCC", "clustering"] >= sub.loc["k-core", "clustering"]


class TestProcessingTime:
    def test_variants_and_counts(self):
        df = ex.processing_time(datasets=("youtube",), ks=(8,))
        assert set(df.variant) == {"vcce", "vcce-n", "vcce-g", "vcce-star"}
        by = df.set_index("variant")
        # VCCE* never does more flow tests than the basic algorithm
        assert by.loc["vcce-star", "loc_cut_calls"] <= by.loc["vcce", "loc_cut_calls"]
        # identical outputs
        assert by.n_vccs.nunique() == 1


class TestCounts:
    def test_counts_nonincreasing_in_k(self):
        df = ex.kvcc_counts(None, datasets=("dblp",), ks=(8, 12, 16))
        counts = df.sort_values("k").n_vccs.tolist()
        assert counts[0] >= counts[-1]  # paper Fig. 11 trend


class TestMemory:
    def test_memory_rows(self):
        df = ex.memory_usage(datasets=("youtube",), ks=(8, 12))
        assert len(df) == 2
        assert (df.peak_mb > 0).all()


class TestScalability:
    def test_time_grows_with_fraction(self):
        df = ex.scalability(
            datasets=("youtube",), ks=(8,), fracs=(0.3, 1.0), variants=("vcce",)
        )
        v = df[df.axis == "V"].sort_values("frac")
        assert v.iloc[0].seconds <= v.iloc[-1].seconds * 1.5 + 0.2  # noisy but ordered-ish
        assert set(df.axis) == {"V", "E"}
