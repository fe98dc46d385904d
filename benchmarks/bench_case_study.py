"""T7 — Fig. 11 case study: machine time per scripted question.

The paper reports human operator time (mostly thinking); the machine
component we can reproduce is how long the engine takes to execute each
question's action script. Shape to reproduce: every question resolves
in interactive time (well under the paper's human times).

Regenerate: pytest benchmarks/bench_case_study.py --benchmark-only
"""
import pytest

from repro.engine.cache import ComputationCache
from repro.workload import Spreadsheet
from repro.workload import questions as Q

QUESTIONS = {f"Q{i}": fn for i, fn in enumerate(Q.ALL_QUESTIONS, start=1)}


@pytest.mark.parametrize("name", list(QUESTIONS))
def test_question(benchmark, fl_table_bench, name):
    fn = QUESTIONS[name]
    result = benchmark.pedantic(
        lambda: fn(Spreadsheet(fl_table_bench, cache=ComputationCache(), seed=0)),
        rounds=1,
        warmup_rounds=0,
    )
    benchmark.extra_info["actions"] = result.actions
    benchmark.extra_info["paper_actions"] = result.paper_actions
    benchmark.extra_info["satisfactory"] = result.satisfactory
