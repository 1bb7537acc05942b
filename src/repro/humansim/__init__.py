"""Human-matcher simulation substrate (see DESIGN.md §2 for why).

Generates the observable artifacts the paper records for real humans:
decision histories, mouse movement maps, warm-up phases, and
self-reported personal information — at cohort scale (106 PO + 34 OAEI
matchers, ~7.7k decisions like the paper's dataset).
"""
from repro.humansim.cohort import Cohort, build_cohort
from repro.humansim.matcher_gen import Traits, generate_matcher, sample_traits
from repro.humansim.schema_gen import MatchingTask, make_task

__all__ = [
    "Cohort",
    "build_cohort",
    "Traits",
    "generate_matcher",
    "sample_traits",
    "MatchingTask",
    "make_task",
]
