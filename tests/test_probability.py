"""Unit tests for exact lineage probability valuation."""
import pytest
from hypothesis import given, settings, strategies as st

from repro.lineage.formula import parse
from repro.lineage.probability import (
    is_read_once,
    negation_probability,
    probability,
    probability_enumerate,
)

PROBS = {"a": 0.7, "b": 0.6, "c": 0.9, "d": 0.25}


@pytest.mark.parametrize(
    "text, expected",
    [
        ("a", 0.7),
        ("~a", 0.3),
        ("a & b", 0.42),
        ("a | b", 1 - 0.3 * 0.4),
        ("a & ~b", 0.7 * 0.4),
        ("a & ~(b | c)", 0.7 * 0.4 * 0.1),
        ("(a | b) & ~c", (1 - 0.3 * 0.4) * 0.1),
    ],
)
def test_read_once_closed_forms(text, expected):
    assert probability(text, PROBS) == pytest.approx(expected)


@pytest.mark.parametrize(
    "text",
    ["a", "~a", "a & b", "a | b", "a & ~(b | c)", "(a | b) & (c | d)", "~(a & b) | c"],
)
def test_read_once_matches_enumeration(text):
    assert probability(text, PROBS) == pytest.approx(
        probability_enumerate(text, PROBS)
    )


@pytest.mark.parametrize(
    "text, ro", [("a & b", True), ("a & a", False), ("a | (a & b)", False), ("a & ~(b | c)", True)]
)
def test_is_read_once(text, ro):
    assert is_read_once(parse(text)) is ro


def test_probability_rejects_repeated_variables():
    with pytest.raises(ValueError, match="read-once"):
        probability("a & a", PROBS)


def test_probability_rejects_unknown_variable():
    with pytest.raises(ValueError, match="no probability"):
        probability("z", PROBS)


def test_enumeration_handles_repeated_variables():
    # a & ~a is unsatisfiable; a | a has probability p(a)
    assert probability_enumerate("a & ~a", PROBS) == pytest.approx(0.0)
    assert probability_enumerate("a | a", PROBS) == pytest.approx(0.7)


@pytest.mark.parametrize(
    "p_r, s_ps, expected",
    [
        (0.7, [], 0.7),
        (0.7, [0.7], 0.21),
        (0.7, [0.7, 0.6], 0.084),
        (0.7, [0.6], 0.28),
        (0.5, [1.0], 0.0),  # a matching tuple with p=1 forces probability 0
    ],
)
def test_negation_probability_closed_form(p_r, s_ps, expected):
    # the paper's Fig. 3 probabilities are the first four cases
    assert negation_probability(p_r, s_ps) == pytest.approx(expected)


@settings(max_examples=60, deadline=None)
@given(
    ps=st.lists(st.floats(min_value=0.01, max_value=1.0), min_size=1, max_size=5),
    p_r=st.floats(min_value=0.01, max_value=1.0),
)
def test_negation_probability_equals_formula_valuation(ps, p_r):
    probs = {"r": p_r, **{f"s{i}": p for i, p in enumerate(ps)}}
    if len(ps) == 1:
        text = "r & ~s0"
    else:
        text = "r & ~(" + " | ".join(f"s{i}" for i in range(len(ps))) + ")"
    assert negation_probability(p_r, ps) == pytest.approx(
        probability_enumerate(text, probs)
    )


@settings(max_examples=60, deadline=None)
@given(st.data())
def test_random_read_once_formula_matches_enumeration(data):
    """Build a random read-once tree and check both evaluators agree."""
    counter = [0]

    def fresh():
        counter[0] += 1
        return f"v{counter[0]}"

    def build(depth):
        kind = data.draw(
            st.sampled_from(["var"] if depth >= 3 else ["var", "not", "and", "or"])
        )
        if kind == "var":
            return fresh()
        if kind == "not":
            return f"~({build(depth + 1)})"
        op = " & " if kind == "and" else " | "
        return "(" + op.join(build(depth + 1) for _ in range(2)) + ")"

    text = build(0)
    probs = {
        f"v{i}": data.draw(st.floats(min_value=0.01, max_value=0.99))
        for i in range(1, counter[0] + 1)
    }
    assert probability(text, probs) == pytest.approx(
        probability_enumerate(text, probs)
    )
