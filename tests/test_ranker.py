"""Heuristic candidate ranker (§3.5)."""
from repro.core.edits import EditProgram, EditStep
from repro.core.ranker import Candidate, rank, score_candidate


def _prog(*steps):
    return EditProgram(tuple(steps))


def _cand(original, repaired, coverage=0.8, program=None):
    if program is None:
        program = _prog(EditStep("M", char=original[0], emit=original[0]))
    return Candidate(original, repaired, program, coverage)


class TestScore:
    def test_smaller_edit_distance_wins(self):
        a = _cand("c3", "c-3")
        b = _cand("c3", "x-9-z")
        ranked = rank([a, b], ["c-1", "c-2"])
        assert ranked[0].repaired == "c-3"

    def test_higher_coverage_wins_on_tied_distance(self):
        a = _cand("ab", "ab1", coverage=0.9)
        b = _cand("ab", "ab2", coverage=0.2)
        ranked = rank([a, b], [])
        assert ranked[0] is a

    def test_closeness_to_column_values_matters(self):
        a = _cand("q1", "qx")
        b = _cand("q1", "q9")
        ranked = rank([a, b], ["q9", "q9", "q8"])
        assert ranked[0].repaired == "q9"

    def test_edit_distance_only_mode(self):
        a = _cand("ab", "abc", coverage=0.1)
        b = _cand("ab", "abcd", coverage=1.0)
        s_a = score_candidate(a, [], edit_distance_only=True)
        s_b = score_candidate(b, [], edit_distance_only=True)
        assert (s_a, s_b) == (1.0, 2.0)

    def test_alnum_edits_penalized(self):
        delim = _cand(
            "a1", "a-1", program=_prog(EditStep("I", emit="-"))
        )
        alnum = _cand(
            "a1", "ab1", program=_prog(EditStep("I", emit="b"))
        )
        ranked = rank([delim, alnum], [])
        assert ranked[0] is delim

    def test_deterministic_tiebreak(self):
        a = _cand("x", "xa")
        b = _cand("x", "xb")
        assert rank([b, a], [])[0].repaired == "xa"

    def test_scores_stored_on_candidates(self):
        c = _cand("ab", "abc")
        rank([c], ["abc"])
        assert c.score > 0
