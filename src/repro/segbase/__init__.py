"""Explanation-agnostic segmentation baselines (paper Sec. 7.2).

All baselines take the aggregated series and a segment count K and return
sorted interior cut indices; explanations are attached afterwards with the
Cascading Analysts algorithm (as the paper does for the e2e comparison).
"""
from repro.segbase.bottom_up import bottom_up  # noqa: F401
from repro.segbase.fluss import fluss  # noqa: F401
from repro.segbase.nnsegment import nnsegment  # noqa: F401

BASELINES = {
    "Bottom-Up": bottom_up,
    "FLUSS": fluss,
    "NNSegment": nnsegment,
}
