"""Dataset-generator tests: determinism, schema properties, and the
heterogeneity the paper's experiments rely on (DESIGN.md §4)."""
import json

import pandas as pd
import pytest

from repro import synth_data


class TestConfusion:
    def test_deterministic(self):
        a = synth_data.confusion_pandas(500, seed=3)
        b = synth_data.confusion_pandas(500, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_schema(self):
        pdf = synth_data.confusion_pandas(100)
        assert list(pdf.columns) == [
            "guess", "target", "country", "choices", "sample", "date",
        ]

    def test_choices_contains_target(self):
        pdf = synth_data.confusion_pandas(200)
        assert all(t in c for t, c in zip(pdf.target, pdf.choices))

    def test_filter_selectivity_near_half(self):
        pdf = synth_data.confusion_pandas(5_000)
        frac = (pdf.guess == pdf.target).mean()
        assert 0.4 < frac < 0.6

    def test_write_confusion_jsonlines(self, tmp_path):
        p = synth_data.write_confusion(str(tmp_path / "c.json"), 250, chunk=100)
        lines = open(p).read().splitlines()
        assert len(lines) == 250
        obj = json.loads(lines[0])
        assert {"guess", "target", "country", "choices", "sample", "date"} == set(obj)

    def test_dates_are_iso_strings(self):
        pdf = synth_data.confusion_pandas(50)
        assert pdf.date.str.match(r"\d{4}-\d{2}-\d{2}").all()


class TestReddit:
    @pytest.fixture(scope="class")
    def objs(self):
        return synth_data.reddit_pandas(3_000)["obj"].tolist()

    def test_deterministic(self):
        a = synth_data.reddit_pandas(200)["obj"].tolist()
        b = synth_data.reddit_pandas(200)["obj"].tolist()
        assert a == b

    def test_edited_type_drifts_by_year(self, objs):
        pre = [o for o in objs if o["year"] < 2010]
        post = [o for o in objs if o["year"] >= 2010]
        assert all(isinstance(o["edited"], bool) for o in pre)
        assert any(isinstance(o["edited"], int) and not isinstance(o["edited"], bool)
                   for o in post)

    def test_gilded_missing_before_2012(self, objs):
        assert all("gilded" not in o for o in objs if o["year"] < 2012)
        assert all("gilded" in o for o in objs if o["year"] >= 2012)

    def test_score_occasionally_string(self, objs):
        kinds = {type(o["score"]).__name__ for o in objs}
        assert "str" in kinds and "int" in kinds

    def test_distinguished_null_or_string(self, objs):
        vals = {o["distinguished"] for o in objs}
        assert None in vals and "moderator" in vals

    def test_write_reddit(self, tmp_path):
        p = synth_data.write_reddit(str(tmp_path / "r.json"), 120, chunk=50)
        lines = open(p).read().splitlines()
        assert len(lines) == 120
        json.loads(lines[0])


class TestMess:
    def test_matches_paper_figure5(self):
        rows = synth_data.mess_rows()
        assert rows[0] == {"foo": "1", "bar": 2, "foobar": True}
        assert rows[1]["bar"] == [4]
        assert "foobar" not in rows[2]


class TestHelpers:
    def test_replicated_path(self):
        assert synth_data.replicated_path("/x.json", 3) == "/x.json,/x.json,/x.json"

    def test_write_jsonlines_append(self, tmp_path):
        p = str(tmp_path / "a.json")
        synth_data.write_jsonlines(p, [{"a": 1}])
        synth_data.write_jsonlines(p, [{"a": 2}], append=True)
        assert len(open(p).read().splitlines()) == 2

    def test_spark_reads_generated_files(self, spark, tmp_path):
        p = synth_data.write_confusion(str(tmp_path / "c.json"), 100)
        assert spark.read.json(p).count() == 100
