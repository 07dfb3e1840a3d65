"""Precision/recall/F1 semantics, duplication split, overall records."""
import pandas as pd
import pytest

from repro.evalx.metrics import (
    duplication_split,
    evaluate_repairs,
    overall_record_metrics,
)


def base_pdf():
    """6 records: 1,2 erroneous (2 is null), 3 erroneous, 4..6 clean."""
    return pd.DataFrame(
        {
            "rid": [1, 2, 3, 4, 5, 6],
            "lat": [1.0, 2.0, 3.0, 4.0, 5.0, 6.0],
            "lon": [1.0, 2.0, 3.0, 4.0, 5.0, 6.0],
            "ward": ["B", None, "C", "A", "A", "B"],
            "ward__truth": ["A", "A", "A", "A", "A", "B"],
        }
    )


def rep(rows):
    return pd.DataFrame(rows, columns=["rid", "new_value"])


class TestEvaluateRepairs:
    def test_perfect_cleaning(self):
        m = evaluate_repairs(
            base_pdf(), rep([(1, "A"), (2, "A"), (3, "A")]), attribute="ward"
        )
        assert (m.precision, m.recall, m.f1) == (1.0, 1.0, 1.0)
        assert m.n_errors == 3 and m.n_repairs == 3 and m.n_correct_repairs == 3

    def test_no_repairs(self):
        m = evaluate_repairs(base_pdf(), rep([]), attribute="ward")
        assert (m.precision, m.recall, m.f1) == (0.0, 0.0, 0.0)
        assert m.n_errors == 3

    def test_wrong_repair_hurts_precision_not_recall_numerator(self):
        m = evaluate_repairs(base_pdf(), rep([(1, "C"), (2, "A")]), attribute="ward")
        assert m.n_repairs == 2 and m.n_correct_repairs == 1
        assert m.precision == pytest.approx(0.5)
        assert m.recall == pytest.approx(1 / 3)

    def test_corrupting_clean_cell_counts_as_incorrect_repair(self):
        m = evaluate_repairs(base_pdf(), rep([(4, "B")]), attribute="ward")
        assert m.n_repairs == 1 and m.n_correct_repairs == 0
        assert m.precision == 0.0

    def test_filling_null_is_a_repair(self):
        m = evaluate_repairs(base_pdf(), rep([(2, "A")]), attribute="ward")
        assert m.n_repairs == 1 and m.n_correct_repairs == 1

    def test_noop_same_value_not_a_repair(self):
        m = evaluate_repairs(base_pdf(), rep([(4, "A")]), attribute="ward")
        assert m.n_repairs == 0

    def test_repairing_error_to_same_wrong_value_not_counted(self):
        m = evaluate_repairs(base_pdf(), rep([(1, "B")]), attribute="ward")
        assert m.n_repairs == 0 and m.n_correct_repairs == 0

    def test_f1_harmonic_mean(self):
        m = evaluate_repairs(
            base_pdf(), rep([(1, "A"), (4, "C")]), attribute="ward"
        )
        p, r = m.precision, m.recall
        assert m.f1 == pytest.approx(2 * p * r / (p + r))


class TestDuplicationSplit:
    @staticmethod
    def _pdf():
        """Errors 10 (at clean record 1's exact location) and 11 (new loc)."""
        return pd.DataFrame(
            {
                "rid": [1, 2, 10, 11],
                "lat": [1.0, 2.0, 1.0, 9.0],
                "lon": [1.0, 2.0, 1.0, 9.0],
                "ward": ["A", "B", "B", "B"],
                "ward__truth": ["A", "B", "A", "A"],
            }
        )

    def test_counts(self):
        s = duplication_split(self._pdf(), rep([]), attribute="ward")
        assert s.n_duplicated == 1 and s.n_new == 1

    def test_only_duplicated_fixed(self):
        s = duplication_split(self._pdf(), rep([(10, "A")]), attribute="ward")
        assert s.duplicated_recall == 1.0
        assert s.new_location_recall == 0.0
        assert s.total_recall == pytest.approx(0.5)

    def test_all_fixed(self):
        s = duplication_split(
            self._pdf(), rep([(10, "A"), (11, "A")]), attribute="ward"
        )
        assert s.total_recall == 1.0
        assert s.duplicated_recall == 1.0 and s.new_location_recall == 1.0


class TestOverallRecordMetrics:
    @staticmethod
    def _pdf():
        return pd.DataFrame(
            {
                "rid": [1, 2, 3],
                "lat": [1.0, 2.0, 3.0],
                "lon": [1.0, 2.0, 3.0],
                "a": ["X", "Y", "X"],  # record 2 wrong in a
                "a__truth": ["X", "X", "X"],
                "b": ["P", "Q", "Q"],  # records 2 and 3 wrong in b
                "b__truth": ["P", "P", "P"],
            }
        )

    def test_fully_corrected_record_counts(self):
        m = overall_record_metrics(
            self._pdf(),
            {"a": rep([(2, "X")]), "b": rep([(2, "P"), (3, "P")])},
        )
        assert m.n_errors == 2 and m.n_repairs == 2 and m.n_correct_repairs == 2
        assert (m.precision, m.recall) == (1.0, 1.0)

    def test_partially_corrected_record_not_counted(self):
        # Record 2 fixed only in a, still wrong in b.
        m = overall_record_metrics(
            self._pdf(), {"a": rep([(2, "X")]), "b": rep([(3, "P")])}
        )
        assert m.n_correct_repairs == 1  # only record 3 fully corrected
        assert m.recall == pytest.approx(0.5)

    def test_corrupting_clean_record_hurts_overall_precision(self):
        m = overall_record_metrics(
            self._pdf(), {"a": rep([(1, "Y")]), "b": rep([])}
        )
        assert m.n_repairs == 1 and m.n_correct_repairs == 0
        assert m.precision == 0.0
