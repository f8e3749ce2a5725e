"""The paper's contribution: RRG preprocessing, the SLFE engine, and APIs."""

from repro.core.api import SlfeProgram
from repro.core.rrg import RRG, generate_rrg
from repro.core.slfe import SlfeEngine

__all__ = ["RRG", "generate_rrg", "SlfeEngine", "SlfeProgram"]
