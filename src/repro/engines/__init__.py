"""Engines: the three simulated baselines plus the shared superstep base.

The SLFE engine itself lives in :mod:`repro.core.slfe` (it is the paper's
contribution, not a substrate).
"""

from repro.engines.base import AppSpec, Engine, RunResult
from repro.engines.gemini import GeminiEngine
from repro.engines.powergraph import PowerGraphEngine
from repro.engines.powerlyra import PowerLyraEngine

__all__ = [
    "AppSpec",
    "Engine",
    "RunResult",
    "GeminiEngine",
    "PowerGraphEngine",
    "PowerLyraEngine",
]
