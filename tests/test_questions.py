"""Case-study questions (Fig. 10/11): every question runs, planted
structure is recovered, and action counts match the scripted sequences."""
import pytest

from repro.engine.cache import ComputationCache
from repro.workload import Spreadsheet
from repro.workload import questions as Q


@pytest.fixture(scope="module")
def sheet(fl_table):
    return Spreadsheet(fl_table, cache=ComputationCache(), fanout=4, seed=1)


@pytest.fixture(scope="module")
def all_results(sheet):
    return {r.name: r for r in Q.run_all(sheet)}


class TestAllQuestionsRun:
    @pytest.mark.parametrize("name", [f"Q{i}" for i in range(1, 21)])
    def test_question_answers(self, all_results, name):
        r = all_results[name]
        assert r.actions >= 1
        assert r.machine_time > 0
        assert r.answer  # non-empty

    def test_action_counts_close_to_paper(self, all_results):
        """Fig. 11 shape: every question resolves in a handful of
        actions. Our scripts never need more than paper+2 (a script may
        be *more* direct than the paper's human operator, e.g. Q13)."""
        for r in all_results.values():
            if r.paper_actions is not None:
                assert 1 <= r.actions <= r.paper_actions + 2, r.name

    def test_unsatisfactory_set_matches_paper(self, all_results):
        flagged = {n for n, r in all_results.items() if not r.satisfactory}
        # Q3 can be unsatisfiable at tiny SF if AA flight 11 is absent.
        assert flagged - {"Q3"} == {"Q4", "Q6", "Q10", "Q20"}


class TestPlantedStructure:
    def test_q2_best_airline_is_low_delay_carrier(self, all_results):
        # Generator gives HA and AS the lowest mean delays.
        assert all_results["Q2"].answer in {"HA", "AS"}

    def test_q7_best_hour_is_early(self, all_results):
        hour = int(all_results["Q7"].answer.split(":")[0])
        assert hour <= 6  # delays grow through the day

    def test_q13_worst_weather_city_is_planted(self, all_results):
        answer = all_results["Q13"].answer
        worst = answer.split("worst ")[1].split(",")[0]
        assert worst in {"Chicago", "Denver", "Boston", "Detroit"}

    def test_q14_regional_carriers_do_not_fly_to_hawaii(self, all_results):
        airlines = {a.strip() for a in all_results["Q14"].answer.split(",")}
        assert "HA" in airlines
        assert airlines.isdisjoint({"EV", "MQ", "OO"})

    def test_q19_finds_defunct_carriers(self, all_results):
        answer = all_results["Q19"].answer
        assert "NW" in answer and "US" in answer

    def test_q11_longest_flight_is_long_haul(self, all_results):
        # Hawaii/mainland routes are the planted long-haul flights.
        assert "mi" in all_results["Q11"].answer

    def test_q9_worst_canceller_is_high_cancel_carrier(self, all_results):
        # EV/MQ/AA/OO have the highest cancel probabilities.
        assert all_results["Q9"].answer in {"EV", "MQ", "AA", "OO", "UA", "WN"}
