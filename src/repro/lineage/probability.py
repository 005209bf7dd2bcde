"""Exact probability valuation of lineage expressions.

Base-tuple identifiers are independent Boolean random variables (paper
Section III). Two evaluators are provided:

- :func:`probability` — exact, linear-time, for *read-once* formulas
  (each variable occurs at most once). Every lineage produced by the
  TP join operators in this repo is read-once because λr and λs draw
  from disjoint relations and each base tuple contributes once per
  window, so this is the production path. Compositional rules:
  ``P(~f) = 1 - P(f)``, ``P(f & g) = P(f)·P(g)``,
  ``P(f | g) = 1 - (1-P(f))·(1-P(g))``.
- :func:`probability_enumerate` — exact for *any* formula by summing
  over all possible worlds (2^n assignments). Exponential; used in
  tests to cross-check the read-once path and by the snapshot
  reference implementation on small inputs.
"""
from __future__ import annotations

from itertools import product as _cartesian

from .formula import And, Formula, Not, Or, Var, parse


def is_read_once(f: Formula) -> bool:
    """True iff every variable occurs at most once in ``f``."""
    count: dict[str, int] = {}

    def walk(node: Formula) -> None:
        if isinstance(node, Var):
            count[node.name] = count.get(node.name, 0) + 1
        elif isinstance(node, Not):
            walk(node.child)
        elif isinstance(node, (And, Or)):
            for c in node.children:
                walk(c)

    walk(f)
    return all(v == 1 for v in count.values())


def probability(f: Formula | str, probs: dict[str, float]) -> float:
    """Exact probability of a read-once formula under independence.

    Raises ``ValueError`` if ``f`` is not read-once (the compositional
    rules are unsound for repeated variables) or if a variable has no
    probability in ``probs``.
    """
    if isinstance(f, str):
        f = parse(f)
    if not is_read_once(f):
        raise ValueError(
            f"formula is not read-once: {f}; use probability_enumerate"
        )
    return _prob(f, probs)


def _prob(f: Formula, probs: dict[str, float]) -> float:
    if isinstance(f, Var):
        try:
            return probs[f.name]
        except KeyError:
            raise ValueError(f"no probability for base tuple {f.name!r}")
    if isinstance(f, Not):
        return 1.0 - _prob(f.child, probs)
    if isinstance(f, And):
        out = 1.0
        for c in f.children:
            out *= _prob(c, probs)
        return out
    if isinstance(f, Or):
        out = 1.0
        for c in f.children:
            out *= 1.0 - _prob(c, probs)
        return 1.0 - out
    raise TypeError(f"not a Formula: {f!r}")


def probability_enumerate(f: Formula | str, probs: dict[str, float]) -> float:
    """Exact probability of an arbitrary formula by possible-worlds sum.

    Exponential in the number of variables — test/reference use only.
    """
    if isinstance(f, str):
        f = parse(f)
    names = sorted(f.variables())
    total = 0.0
    for values in _cartesian((True, False), repeat=len(names)):
        assignment = dict(zip(names, values))
        if f.evaluate(assignment):
            w = 1.0
            for name, value in assignment.items():
                p = probs[name]
                w *= p if value else (1.0 - p)
            total += w
    return total


def negation_probability(p_r: float, s_ps: list[float]) -> float:
    """Probability of a negating window: ``p_r · Π(1 − p_si)``.

    Closed form of ``P(r & ~(s1 | ... | sk))`` under independence —
    the hot path used when finalizing windows into output tuples, so
    it avoids building a formula object per row.
    """
    out = p_r
    for p in s_ps:
        out *= 1.0 - p
    return out
