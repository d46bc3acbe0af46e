"""Differential testing: the same FLWOR query run on the local path and
on the Spark DataFrame path must produce identical results (the paper's
"seamless switching" guarantee, §5.8). The local engine is the oracle
for heterogeneous semantics that SQL engines cannot express."""
import json

import pytest

from repro.core import Rumble, RumbleConfig

# Each case is a query template with {src} as the for-source. The local
# run uses the inline sequence; the Spark run wraps it in parallelize().
# ``v`` is scalar/null/missing (a valid grouping/ordering key);
# ``w`` is an array field (navigation and quantifier tests).
SRC = (
    '({"g": "a", "t": "a", "v": 1, "w": [7]}, {"g": "a", "t": "b", "v": 2}, '
    '{"g": "b", "t": "b", "v": 3}, {"g": "c", "t": "c", "v": null}, '
    '{"g": "c", "t": "c"}, {"g": "a", "t": "a", "v": 4, "w": [8, 9]})'
)

QUERIES = [
    "for $o in {src} return $o.v",
    "for $o in {src} where $o.g eq $o.t return $o",
    "for $o in {src} where exists($o.v) return $o.v",
    "for $o in {src} let $s := ($o.v, 0) return count($s)",
    'for $o in {src} group by $k := $o.g return {{"k": $k, "n": count($o)}}',
    "for $o in {src} group by $k := $o.g return sum($o.v[$$ ge 0])",
    'for $o in {src} group by $k := $o.v return count($o)',  # mixed-type keys
    "for $o in {src} order by $o.g, $o.t descending return $o.g || $o.t",
    "for $o in {src} order by $o.v empty greatest, $o.g return count($o.v)",
    "for $o in {src} count $c return $c * 10",
    "for $o in {src} where $o.g ne $o.t count $c return $c",
    'for $o in {src} let $k := $o.g group by $k order by $k return {{"k": $k}}',
    "for $o in {src} return [ $o.v ]",
    "for $o in {src} return (if (exists($o.v)) then 1 else 0)",
    'for $o in {src} where some $x in $o.w[] satisfies $x gt 8 return $o.w',
    "count(for $o in {src} where $o.g eq $o.t return $o)",
    "sum(for $o in {src} return 1)",
    'for $o in {src} group by $k := $o.g let $n := count($o) '
    "order by $n descending, $k return ($k, $n)",
    "for $o in {src} for $m in $o.w[] return $m",
    "for $o in {src} for $m allowing empty in $o.w[] return count($m)",
]


def canonical(items):
    return sorted(json.dumps(i, sort_keys=True) for i in items)


@pytest.fixture(scope="module")
def local_eng():
    return Rumble(None, RumbleConfig(force_local=True))


@pytest.mark.parametrize("template", QUERIES, ids=[q[:60] for q in QUERIES])
def test_local_vs_dataframe(template, spark, local_eng):
    q_local = template.format(src=SRC)
    q_spark = template.format(src=f"parallelize({SRC})")
    expected = local_eng.run(q_local)
    got = Rumble(spark).run(q_spark)
    if "order by" in template or "count $c" in template:
        # order-sensitive queries must match exactly
        assert got == expected
    else:
        assert canonical(got) == canonical(expected)


@pytest.mark.parametrize(
    "template",
    [
        "for $o in {src} order by $o.w return $o",     # array sort key
        "for $o in {src} group by $k := ($o.g, $o.t) return $k",  # multi-item key
    ],
    ids=["order-nonatomic", "group-multi-item"],
)
def test_error_parity(template, spark, local_eng):
    """Both paths raise the same error class for illegal keys."""
    from repro.jsoniq.errors import NonAtomicKeyError

    q_local = template.format(src=SRC)
    q_spark = template.format(src=f"parallelize({SRC})")
    with pytest.raises(Exception) as e_local:
        local_eng.run(q_local)
    assert isinstance(e_local.value, NonAtomicKeyError)
    with pytest.raises(Exception):
        Rumble(spark).run(q_spark)
