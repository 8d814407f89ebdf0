"""Unit tests for speedup-score estimation (repro.core.speedup)."""
import pytest

from repro.core.speedup import NodeStats, speedup_score, stats_from_bandwidth


class TestSpeedupScore:
    def test_paper_formula(self):
        st = NodeStats(
            out_bytes=1e6, compute_s=1.0, write_s=2.0, read_s=0.5,
            mem_read_s=0.1,
        )
        # 3 children * (0.5-0.1) read saving + 2.0 write saving
        assert speedup_score(st, 3) == pytest.approx(3 * 0.4 + 2.0)

    def test_childless_node_write_only(self):
        st = NodeStats(out_bytes=1e6, compute_s=1.0, write_s=2.0, read_s=0.5)
        assert speedup_score(st, 0) == pytest.approx(2.0)

    def test_overlap_penalty_reduces_write_saving(self):
        st = NodeStats(
            out_bytes=1e6, compute_s=1.0, write_s=2.0, read_s=0.5,
            overlap_penalty_s=0.5,
        )
        assert speedup_score(st, 0) == pytest.approx(1.5)

    def test_never_negative(self):
        st = NodeStats(
            out_bytes=1e6, compute_s=1.0, write_s=1.0, read_s=0.1,
            mem_read_s=0.5, overlap_penalty_s=5.0,
        )
        assert speedup_score(st, 2) == 0.0

    def test_more_children_more_savings(self):
        st = NodeStats(out_bytes=1e6, compute_s=1.0, write_s=1.0, read_s=0.5)
        assert speedup_score(st, 5) > speedup_score(st, 1)

    def test_negative_write_term_scores_zero(self):
        # caching costs more than writing, no readers -> flagging is a
        # pure loss -> score 0 (excluded from the MKP)
        st = NodeStats(out_bytes=1e4, compute_s=1.0, write_s=-0.3, read_s=0.05)
        assert speedup_score(st, 0) == 0.0

    def test_read_savings_offset_negative_write(self):
        st = NodeStats(out_bytes=1e6, compute_s=1.0, write_s=-0.2, read_s=0.5)
        assert speedup_score(st, 2) == pytest.approx(2 * 0.5 - 0.2)


class TestStatsFromBandwidth:
    def test_paper_environment_bandwidths(self):
        # paper §VI-A: 519.8 MB/s read, 358.9 MB/s write
        st = stats_from_bandwidth(
            1024**3, 10.0, read_bw=519.8e6, write_bw=358.9e6
        )
        assert st.read_s == pytest.approx(1024**3 / 519.8e6)
        assert st.write_s == pytest.approx(1024**3 / 358.9e6)
        assert st.mem_read_s == 0.0

    def test_finite_memory_bandwidth(self):
        st = stats_from_bandwidth(
            1e9, 1.0, read_bw=5e8, write_bw=4e8, mem_bw=1e10
        )
        assert st.mem_read_s == pytest.approx(0.1)
        assert st.read_s > st.mem_read_s

    def test_write_slower_than_read(self):
        st = stats_from_bandwidth(1e9, 1.0, read_bw=5e8, write_bw=3.5e8)
        assert st.write_s > st.read_s
