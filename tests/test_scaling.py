"""Tests for the §7.2 verification-effort scaling study
(repro.bench.scaling)."""
import pytest

from repro.bench.scaling import growth_ratios, phone_task, run_point, run_study


class TestPhoneTask:
    def test_sizes(self):
        ins, outs = phone_task(100, 4)
        assert len(ins) == len(outs) == 100

    def test_deterministic(self):
        assert phone_task(50, 3) == phone_task(50, 3)

    def test_target_format(self):
        _, outs = phone_task(20, 2)
        import re

        assert all(re.fullmatch(r"\d{3}-\d{3}-\d{4}", o) for o in outs)

    def test_heterogeneity_grows_with_formats(self):
        from repro.core.cluster import build_hierarchy

        ins2, _ = phone_task(200, 2)
        ins6, _ = phone_task(200, 6)
        assert len(build_hierarchy(ins6).leaves) > len(
            build_hierarchy(ins2).leaves
        )


class TestStudy:
    @pytest.fixture(scope="class")
    def points(self):
        return run_study()

    def test_three_points(self, points):
        assert [p.label for p in points] == ["10(2)", "100(4)", "300(6)"]

    def test_pattern_counts(self, points):
        assert [p.n_patterns for p in points] == [2, 4, 6]

    def test_clx_interactions_stay_flat(self, points):
        """CLX interactions track pattern count, not record count."""
        assert points[-1].clx_interactions <= points[-1].n_patterns + 2

    def test_ff_verification_grows_much_faster(self, points):
        """The paper's headline: 30x data -> FlashFill verification grows
        an order of magnitude faster than CLX's (paper: 11.4x vs 1.3x
        wall-clock; our unitless cost model: ~25x vs ~4x)."""
        g = growth_ratios(points)
        assert g["ff_growth"] >= 3 * g["clx_growth"]

    def test_clx_cost_scales_with_patterns_not_records(self, points):
        big = points[-1]
        assert big.clx_verification_cost < big.n
        assert big.ff_verification_cost > big.n

    def test_run_point_fields(self):
        p = run_point("10(2)", 10, 2)
        assert p.n == 10 and p.n_patterns == 2
        assert p.clx_verification_cost > 0 and p.ff_verification_cost > 0
