"""Unit tests for repro.text.tokenize."""
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.text.tokenize import CROP_SIZE, sim_uni, tokenize


@pytest.mark.parametrize(
    "value,expected",
    [
        ("Hello World", ["hello", "world"]),
        ("  spaced   out  ", ["spaced", "out"]),
        ("Paul McCartney", ["paul", "mccartney"]),
        ("vx2458-mhd", ["vx2458", "mhd"]),
        ("UPPER lower MiXeD", ["upper", "lower", "mixed"]),
        ("with,punct;and.dots", ["with", "punct", "and", "dots"]),
        ("24\" LED", ["24", "led"]),
        ("a-b_c", ["a", "b", "c"]),
        ("123 456", ["123", "456"]),
        ("", []),
        ("   ", []),
        ("!!!", []),
        (None, []),
        ("héllo wörld", ["h", "llo", "w", "rld"]),  # non-ascii splits
        ("remix (2020)", ["remix", "2020"]),
    ],
)
def test_tokenize_cases(value, expected):
    assert tokenize(value) == expected


def test_tokenize_crops_to_crop_size():
    long = " ".join(f"w{i}" for i in range(3 * CROP_SIZE))
    assert len(tokenize(long)) == CROP_SIZE


def test_tokenize_custom_crop():
    assert tokenize("a b c d e", crop=3) == ["a", "b", "c"]


def test_tokenize_crop_keeps_prefix():
    toks = tokenize(" ".join(f"w{i}" for i in range(30)))
    assert toks[0] == "w0" and toks[-1] == "w19"


@pytest.mark.parametrize(
    "a,b,sim,uni",
    [
        (["x", "y"], ["y", "z"], ["y"], ["x", "z"]),
        (["a"], ["a"], ["a"], []),
        ([], ["a"], [], ["a"]),
        ([], [], [], []),
        (["a", "b"], ["c", "d"], [], ["a", "b", "c", "d"]),
        (["a", "a", "b"], ["a"], ["a"], ["b"]),  # set semantics
    ],
)
def test_sim_uni_cases(a, b, sim, uni):
    s, u = sim_uni(a, b)
    assert s == sim
    assert u == uni


@given(
    st.lists(st.text(alphabet="abc", min_size=1, max_size=3), max_size=8),
    st.lists(st.text(alphabet="abc", min_size=1, max_size=3), max_size=8),
)
def test_sim_uni_partition_property(a, b):
    """sim ∪ uni == union of token sets; sim ∩ uni == ∅; symmetric."""
    s, u = sim_uni(a, b)
    assert set(s) | set(u) == set(a) | set(b)
    assert set(s) & set(u) == set()
    s2, u2 = sim_uni(b, a)
    assert s == s2 and u == u2


@given(st.lists(st.text(alphabet="ab", min_size=1, max_size=2), max_size=6))
def test_sim_uni_self_is_all_shared(a):
    s, u = sim_uni(a, a)
    assert set(s) == set(a) and u == []


def test_sim_uni_sorted_deterministic():
    s, u = sim_uni(["z", "m", "a"], ["m", "q", "a"])
    assert s == sorted(s) and u == sorted(u)
