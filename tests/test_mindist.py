"""Unit tests for the SAX lower-bounding distances."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.distance import euclidean
from repro.core.mindist import mindist_paa_sax, mindist_sax_sax
from repro.core.paa import paa
from repro.core.sax import sax


def _series(seed, n=64):
    g = np.random.default_rng(seed)
    x = np.cumsum(g.standard_normal(n))
    return (x - x.mean()) / max(x.std(), 1e-12)


class TestMindistPaaSax:
    @pytest.mark.parametrize("seed", range(10))
    def test_lower_bounds_true_distance(self, seed):
        a, b = _series(seed), _series(seed + 100)
        md = mindist_paa_sax(paa(a, 8), sax(b, 8, 4), 64, 4)
        assert md <= euclidean(a, b) + 1e-9

    def test_zero_when_same_region(self):
        a = _series(1)
        md = mindist_paa_sax(paa(a, 8), sax(a, 8, 4), 64, 4)
        assert md == 0.0

    def test_batch_shape(self):
        a = _series(2)
        cands = np.stack([sax(_series(i), 8, 4) for i in range(5)])
        md = mindist_paa_sax(paa(a, 8), cands, 64, 4)
        assert md.shape == (5,)

    def test_batch_matches_single(self):
        a = _series(3)
        cands = np.stack([sax(_series(i + 50), 8, 4) for i in range(4)])
        md = mindist_paa_sax(paa(a, 8), cands, 64, 4)
        for i in range(4):
            assert md[i] == pytest.approx(
                float(mindist_paa_sax(paa(a, 8), cands[i], 64, 4))
            )

    def test_higher_cardinality_tightens(self):
        """More bits -> smaller regions -> larger (tighter) lower bound."""
        a, b = _series(4), _series(104)
        md2 = mindist_paa_sax(paa(a, 8), sax(b, 8, 2), 64, 2)
        md4 = mindist_paa_sax(paa(a, 8), sax(b, 8, 4), 64, 4)
        assert md4 >= md2 - 1e-12

    def test_scaling_with_length(self):
        """The sqrt(n/w) factor: doubling n at the same symbols scales
        the bound by sqrt(2)."""
        a, b = _series(5), _series(105)
        qp, cs = paa(a, 8), sax(b, 8, 4)
        m64 = mindist_paa_sax(qp, cs, 64, 4)
        m128 = mindist_paa_sax(qp, cs, 128, 4)
        assert m128 == pytest.approx(m64 * np.sqrt(2))

    def test_segment_mismatch_raises(self):
        with pytest.raises(ValueError, match="segment mismatch"):
            mindist_paa_sax(np.zeros(8), np.zeros(4, dtype=int), 64, 4)

    @given(st.integers(0, 1000), st.integers(0, 1000))
    @settings(max_examples=40, deadline=None)
    def test_lower_bound_property_hypothesis(self, s1, s2):
        a, b = _series(s1), _series(s2)
        md = mindist_paa_sax(paa(a, 8), sax(b, 8, 4), 64, 4)
        assert md <= euclidean(a, b) + 1e-9


class TestMindistSaxSax:
    @pytest.mark.parametrize("seed", range(8))
    def test_lower_bounds_paa_version(self, seed):
        a, b = _series(seed), _series(seed + 200)
        sa, sb = sax(a, 8, 4), sax(b, 8, 4)
        m_ss = mindist_sax_sax(sa, sb, 64, 4)
        m_ps = mindist_paa_sax(paa(a, 8), sb, 64, 4)
        assert m_ss <= m_ps + 1e-9

    def test_symmetric(self):
        sa, sb = sax(_series(1), 8, 4), sax(_series(2), 8, 4)
        assert mindist_sax_sax(sa, sb, 64, 4) == pytest.approx(
            float(mindist_sax_sax(sb, sa, 64, 4))
        )

    def test_zero_for_same_word(self):
        sa = sax(_series(3), 8, 4)
        assert mindist_sax_sax(sa, sa, 64, 4) == 0.0

    def test_zero_for_adjacent_regions(self):
        """Touching regions have zero gap."""
        a = np.array([3], dtype=np.uint32)
        b = np.array([4], dtype=np.uint32)
        assert mindist_sax_sax(a, b, 8, 3) == 0.0

    def test_lower_bounds_true_distance(self):
        for seed in range(8):
            a, b = _series(seed), _series(seed + 300)
            md = mindist_sax_sax(sax(a, 8, 4), sax(b, 8, 4), 64, 4)
            assert md <= euclidean(a, b) + 1e-9
