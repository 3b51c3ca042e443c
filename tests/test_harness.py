"""Evaluation harness helpers."""
import numpy as np
import pandas as pd
import pytest

from repro.core.types import Explanation
from repro.eval.harness import (
    explain_fixed_cuts,
    render_table,
    run_baseline,
    segments_table,
)


def _series(n=40, seed=0):
    rng = np.random.default_rng(seed)
    a = np.concatenate([np.linspace(0, 80, n // 2), np.linspace(80, 20, n - n // 2)])
    b = np.linspace(5, 15, n)
    S = np.vstack([a, b]) + rng.normal(0, 0.2, (2, n))
    labels = [Explanation.of(k="a"), Explanation.of(k="b")]
    return S, labels


class TestExplainFixedCuts:
    def test_segments_cover_domain(self):
        S, labels = _series()
        segs = explain_fixed_cuts(S, labels, ["k"], [20], m=2)
        assert len(segs) == 2
        assert segs[0].start == 0 and segs[-1].end == 39
        assert segs[0].end == segs[1].start == 20

    def test_explanations_signed(self):
        S, labels = _series()
        segs = explain_fixed_cuts(S, labels, ["k"], [20], m=2)
        assert segs[0].explanations[0] == pytest.approx(
            ("k=a", 1, abs(S[0, 20] - S[0, 0])), abs=1e-9
        )
        assert segs[1].explanations[0][1] == -1

    def test_no_cuts_single_segment(self):
        S, labels = _series()
        segs = explain_fixed_cuts(S, labels, ["k"], [], m=2)
        assert len(segs) == 1


class TestRunBaseline:
    @pytest.mark.parametrize("name", ["Bottom-Up", "FLUSS", "NNSegment"])
    def test_returns_cuts_and_time(self, name):
        S, _ = _series(80)
        cuts, secs = run_baseline(name, S.sum(axis=0), 3)
        assert len(cuts) == 2
        assert secs >= 0

    def test_unknown_baseline(self):
        with pytest.raises(KeyError):
            run_baseline("nope", np.arange(10.0), 2)


class TestTables:
    def test_segments_table_columns(self):
        S, labels = _series()
        segs = explain_fixed_cuts(S, labels, ["k"], [20], m=2)
        tab = segments_table(segs)
        assert "segment" in tab.columns
        assert "Top-1 Expl" in tab.columns
        assert len(tab) == 2
        assert tab["Top-1 Expl"].str.endswith(("+", "-")).all()

    def test_render_table(self):
        df = pd.DataFrame({"a": [1, 2]})
        out = render_table(df, "demo")
        assert "demo" in out and "1" in out
