"""RDD execution path tests (paper §4.1, §5.6–§5.7): expression
push-down to Spark transformations, actions for aggregations, seamless
local/RDD switching, input functions."""
import warnings

import pytest

from repro.core import Rumble, RumbleConfig


class TestInputFunctions:
    def test_json_file_reads_rdd(self, rumble, mess_path):
        got = rumble.run(f'json-file("{mess_path}")')
        assert len(got) == 3
        assert got[0]["foo"] == "1"

    def test_json_file_partitions_arg(self, rumble, mess_path):
        rdd = rumble.run_rdd(f'json-file("{mess_path}", 2)')
        assert rdd.getNumPartitions() <= 2

    def test_json_file_comma_paths_replicate(self, rumble, mess_path):
        got = rumble.run(f'count(json-file("{mess_path},{mess_path}"))')
        assert got == [6]

    def test_parallelize(self, rumble):
        assert sorted(rumble.run("parallelize((1, 2, 3))")) == [1, 2, 3]

    def test_parallelize_num_slices(self, rumble):
        rdd = rumble.run_rdd("parallelize((1, 2, 3, 4), 2)")
        assert rdd.getNumPartitions() == 2

    def test_json_file_is_rdd(self, rumble, mess_path):
        it = rumble.compile(f'json-file("{mess_path}")')
        assert it.supports_rdd(rumble._ctx())

    def test_force_local_disables_rdd(self, mess_path):
        eng = Rumble(None, RumbleConfig(force_local=True))
        it = eng.compile(f'json-file("{mess_path}")')
        assert not it.supports_rdd(eng._ctx())
        # ... but the local streaming read still works.
        assert len(eng.run(f'json-file("{mess_path}")')) == 3


class TestExpressionPushdown:
    """§5.7: queries like json-file(...).foo[].bar[...] are detected as
    fully runnable on Spark; no intermediate is materialized."""

    def test_object_lookup_pushdown(self, rumble, mess_path):
        it = rumble.compile(f'json-file("{mess_path}").foo')
        assert it.supports_rdd(rumble._ctx())
        assert sorted(rumble.run(f'json-file("{mess_path}").foo')) == ["1", "2", "3"]

    def test_array_unbox_pushdown(self, rumble, mess_path):
        it = rumble.compile(f'json-file("{mess_path}").bar[]')
        assert it.supports_rdd(rumble._ctx())
        assert rumble.run(f'json-file("{mess_path}").bar[]') == [4]

    def test_predicate_pushdown(self, rumble, mess_path):
        q = f'json-file("{mess_path}")[$$.foobar eq true].foo'
        assert rumble.compile(q).supports_rdd(rumble._ctx())
        assert rumble.run(q) == ["1"]

    def test_paper_chain_query(self, rumble, tmp_path):
        import json

        p = tmp_path / "chain.json"
        rows = [
            {"foo": [{"bar": [{"foobar": "a"}, {"foobar": "b"}]}]},
            {"foo": [{"bar": [{"foobar": "a"}]}]},
            {"other": 1},
        ]
        p.write_text("\n".join(json.dumps(r) for r in rows))
        q = f'json-file("{p}").foo[].bar[][$$.foobar eq "a"]'
        it = rumble.compile(q)
        assert it.supports_rdd(rumble._ctx())
        assert rumble.run(q) == [{"foobar": "a"}, {"foobar": "a"}]

    def test_array_lookup_pushdown(self, rumble):
        got = rumble.run("parallelize(([1, 2], [3, 4], 5))[[2]]")
        assert got == [2, 4]

    def test_positional_literal_predicate_on_rdd(self, rumble):
        q = "parallelize((10, 20, 30, 40), 2)[3]"
        assert rumble.compile(q).supports_rdd(rumble._ctx())
        assert rumble.run(q) == [30]

    def test_dynamic_positional_predicate_on_rdd_raises(self, rumble):
        from py4j.protocol import Py4JJavaError

        with pytest.raises(Py4JJavaError, match="positional"):
            rumble.run("parallelize((10, 20, 30))[1 + 1]")

    def test_distinct_values_stays_distributed(self, rumble):
        q = "distinct-values(parallelize((1, 2, 2, 3, 3, 3)))"
        it = rumble.compile(q)
        assert it.supports_rdd(rumble._ctx())
        assert sorted(rumble.run(q)) == [1, 2, 3]


class TestAggregationActions:
    """§5.5: aggregating iterators invoke Spark actions on child RDDs."""

    def test_count_action(self, rumble):
        assert rumble.run("count(parallelize(1 to 100))") == [100]

    def test_sum_action(self, rumble):
        assert rumble.run("sum(parallelize(1 to 10))") == [55]

    def test_avg_action(self, rumble):
        assert rumble.run("avg(parallelize((2, 4)))") == [3.0]

    def test_min_max_actions(self, rumble):
        assert rumble.run("min(parallelize((3, 1, 2)))") == [1]
        assert rumble.run("max(parallelize((3, 1, 2)))") == [3]

    def test_count_of_filtered_rdd(self, rumble):
        assert rumble.run("count(parallelize(1 to 100)[$$ gt 90])") == [10]


class TestSeamlessSwitching:
    """§5.5: local API over an RDD-backed child materializes, capped."""

    def test_local_consumption_of_rdd(self, rumble):
        # string-join has no RDD support: it pulls the child locally.
        got = rumble.run('string-join(parallelize(("a", "b", "c")), "-")')
        assert got == ["a-b-c"]

    def test_materialization_cap_warns_and_truncates(self, spark):
        eng = Rumble(spark, RumbleConfig(materialization_cap=5))
        with warnings.catch_warnings(record=True) as w:
            warnings.simplefilter("always")
            got = eng.run("string-join(parallelize(1 to 100))")
        assert any("truncated" in str(x.message) for x in w)
        assert got == ["12345"]

    def test_materialization_cap_raise_mode(self, spark):
        from repro.jsoniq.errors import MaterializationCapExceeded

        eng = Rumble(
            spark, RumbleConfig(materialization_cap=5, warn_on_cap=False)
        )
        with pytest.raises(MaterializationCapExceeded):
            eng.run("string-join(parallelize(1 to 100))")

    def test_run_rdd_returns_none_for_local(self, rumble):
        assert rumble.run_rdd("1 + 1") is None

    def test_run_cap(self, rumble):
        got = rumble.run("parallelize(1 to 1000)", cap=7)
        assert len(got) == 7
