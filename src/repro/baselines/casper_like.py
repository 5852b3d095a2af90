"""CASPER-like baseline translator (paper [2], Table 1 comparison).

CASPER lifts sequential Java loops to MapReduce by *program synthesis*:
it enumerates candidate "program summaries" (map/filter/reduce
sketches) over a grammar and discharges each candidate to a verifier
(Sketch + Dafny). Its compile times are dominated by search and
verification, and it fails whenever the summary grammar cannot express
the loop — the DIABLO paper reports failures on Matrix Multiplication,
KMeans and PCA and a >19 h abort on Linear Regression.

This reproduction rebuilds the mechanism with the same cost profile:

* synthesis targets are the accumulators of ``for-in`` loops; candidate
  summaries ``reduce(⊕, map(f, filter(p, coll)))`` (or keyed variants)
  are enumerated from a grammar built out of the program's literals and
  record/tuple fields;
* each candidate is *verified by testing* against the literal loop
  interpreter on random inputs — the stand-in for Sketch/Dafny, which
  are unavailable offline (every candidate pays the verification cost,
  like the original's validator calls);
* programs outside the flat-loop grammar (range loops over arrays,
  multi-phase computations, while fixpoints) exhaust the candidate
  space before failing, so failures are the most expensive outcomes.
"""
from __future__ import annotations

import itertools
import random
import time
from dataclasses import dataclass

from repro.core import ast as A
from repro.core.interp import interpret
from repro.core.parser import parse


class CasperFail(Exception):
    """Synthesis failed: no candidate summary verified."""


class CasperTimeout(CasperFail):
    """Synthesis exceeded its time budget."""


_IDENT = {"+": 0, "*": 1, "min": float("inf"), "max": float("-inf"),
          "&&": True, "||": False}
_COMBINE = {
    "+": lambda a, b: a + b,
    "*": lambda a, b: a * b,
    "min": min,
    "max": max,
    "&&": lambda a, b: a and b,
    "||": lambda a, b: a or b,
}


def _field(v, f):
    """Project a record dict or a tuple (fields ``_1.._n``)."""
    if isinstance(v, dict):
        return v[f]
    return v[int(f.lstrip("_")) - 1]


@dataclass(frozen=True)
class Summary:
    """``out := reduce(⊕, map(fn, filter(pred, coll)))``, optionally
    grouped by ``key``. ``fn``/``pred``/``key`` are (name, callable)
    pairs; the sentinel callable ``"__eq_first__"`` compares with the
    collection's first element (Equal's summary)."""

    out: str
    coll: str
    pred: object
    fn: object
    monoid: str
    keyed: bool = False
    key: object = None

    def evaluate(self, env):
        coll = env[self.coll]
        vals = list(coll.values())
        fn = self.fn[1]
        if fn == "__eq_first__":
            first = vals[0] if vals else None
            fn = lambda v: v == first  # noqa: E731
        if self.pred is not None:
            vals = [v for v in vals if self.pred[1](v)]
        if not self.keyed:
            acc = _IDENT[self.monoid]
            for v in vals:
                acc = _COMBINE[self.monoid](acc, fn(v))
            return acc
        out = {}
        for v in vals:
            k = self.key[1](v)
            out[k] = _COMBINE[self.monoid](out.get(k, _IDENT[self.monoid]), fn(v))
        return out

    def __str__(self):
        p = f".filter(v => {self.pred[0]})" if self.pred else ""
        if self.keyed:
            return (
                f"{self.out} = {self.coll}{p}.map(v => ({self.key[0]}, {self.fn[0]}))"
                f".reduceByKey(_{self.monoid}_)"
            )
        return f"{self.out} = {self.coll}{p}.map(v => {self.fn[0]}).reduce(_{self.monoid}_)"


# ------------------------------------------------------ program facts
def _scan_expr(e, acc):
    if isinstance(e, A.EConst):
        (acc["strings"] if isinstance(e.value, str) else acc["consts"]).add(e.value)
    elif isinstance(e, A.EProj):
        acc["fields"].add(e.field)
        _scan_expr(e.expr, acc)
    elif isinstance(e, A.EBin):
        _scan_expr(e.left, acc)
        _scan_expr(e.right, acc)
    elif isinstance(e, A.EUn):
        _scan_expr(e.expr, acc)
    elif isinstance(e, (A.ETuple, A.ECall)):
        for x in (e.items if isinstance(e, A.ETuple) else e.args):
            _scan_expr(x, acc)
    elif isinstance(e, A.EIndex):
        acc["indexed"] = True
        for x in e.indexes:
            _scan_expr(x, acc)


def _walk(stmt, acc, in_forin):
    if isinstance(stmt, A.SBlock):
        for s in stmt.stmts:
            _walk(s, acc, in_forin)
        return
    if isinstance(stmt, A.SForIn):
        if isinstance(stmt.coll, A.EVar):
            acc["colls"].add(stmt.coll.name)
        _walk(stmt.body, acc, True)
        return
    if isinstance(stmt, (A.SFor, A.SWhile)):
        acc["flat"] = False
        _walk(stmt.body, acc, in_forin)
        return
    if isinstance(stmt, A.SIf):
        _scan_expr(stmt.cond, acc)
        _walk(stmt.then, acc, in_forin)
        if stmt.els is not None:
            _walk(stmt.els, acc, in_forin)
        return
    if isinstance(stmt, A.SIncr):
        if in_forin:
            if isinstance(stmt.dest, A.DVar):
                acc["targets"].append((stmt.dest.name, False))
            else:
                acc["targets"].append((stmt.dest.array, True))
                for ix in stmt.dest.indexes:
                    _scan_expr(ix, acc)
        _scan_expr(stmt.expr, acc)
        return
    if isinstance(stmt, A.SAssign):
        _scan_expr(stmt.expr, acc)
        if in_forin and isinstance(stmt.dest, A.DVar):
            acc["flat"] = False
        return
    if isinstance(stmt, A.SDecl) and stmt.init is not None:
        _scan_expr(stmt.init, acc)


def _facts(prog):
    acc = {
        "consts": set(), "strings": set(), "fields": set(), "colls": set(),
        "targets": [], "flat": True, "indexed": False,
    }
    _walk(prog, acc, False)
    acc["consts"] = {
        c for c in acc["consts"] if isinstance(c, (int, float)) and abs(c) < 1e6
    }
    # targets iterating an intermediate (non-input) collection cannot be
    # summarized over inputs; detected by the verifier crashing
    seen, targets = set(), []
    for t in acc["targets"]:
        if t not in seen:
            seen.add(t)
            targets.append(t)
    acc["targets"] = targets
    return acc


# ------------------------------------------------------------ grammar
def _grammar(facts):
    fields = sorted(facts["fields"])
    fns = [("v", lambda v: v), ("1", lambda v: 1),
           ("v == first(coll)", "__eq_first__")]
    keys = [("v", lambda v: v)]
    for f in fields:
        fns.append((f"v.{f}", lambda v, f=f: _field(v, f)))
        keys.append((f"v.{f}", lambda v, f=f: _field(v, f)))
    preds = [None]
    for c in sorted(facts["consts"]):
        preds.append((f"v < {c}", lambda v, c=c: isinstance(v, (int, float)) and v < c))
        preds.append((f"v > {c}", lambda v, c=c: isinstance(v, (int, float)) and v > c))
    for s in sorted(facts["strings"]):
        preds.append((f'v == "{s}"', lambda v, s=s: v == s))
    return fns, preds, keys


# ----------------------------------------------------------- verifier
def _input_gen(facts):
    """One input shape per program, inferred from the grammar facts."""
    fields = sorted(facts["fields"])
    strings = sorted(facts["strings"])
    named = [f for f in fields if not f.startswith("_")]
    tup_n = max((int(f[1:]) for f in fields if f.startswith("_") and f[1:].isdigit()),
                default=0)

    def gen(rng):
        n = rng.randint(3, 8)
        if named:
            return {i: {f: float(rng.randint(0, 9)) for f in named} for i in range(n)}
        if tup_n:
            return {
                i: tuple(float(rng.randint(0, 9)) for _ in range(tup_n))
                for i in range(n)
            }
        if strings:
            # a small pool with guaranteed duplicates: rejects summaries
            # that are only right on duplicate-free samples
            pool = (strings + ["aaa"])[: max(2, len(strings))]
            n = rng.randint(5, 10)
            return {i: rng.choice(pool) for i in range(n)}
        # small numeric pool, duplicate-heavy, straddling the typical
        # filter constants — separates candidate predicates and rejects
        # summaries that only hold on duplicate-free data
        pool_f = [7.0, 120.0, -50.0]
        n = rng.randint(8, 14)
        return {i: rng.choice(pool_f) for i in range(n)}

    return {c: gen for c in facts["colls"]}


def _verify(cand, src, input_specs, trials, seed):
    rng = random.Random(seed)
    for _ in range(trials):
        env = {name: gen(rng) for name, gen in input_specs.items()}
        try:
            ref = interpret(src, env)
            got = cand.evaluate(env)
        except Exception:
            return False
        want = ref.get(cand.out)
        if isinstance(want, float) and isinstance(got, (int, float)):
            if abs(got - want) > 1e-9 * max(1.0, abs(want)):
                return False
        elif got != want:
            return False
    return True


# ---------------------------------------------------------- synthesis
def translate(src: str, budget_s: float = 60.0, max_candidates: int = 500_000):
    """Synthesize map/reduce summaries for a loop program; returns one
    verified ``Summary`` per loop accumulator or raises
    ``CasperFail``/``CasperTimeout``."""
    prog = parse(src)
    facts = _facts(prog)
    fns, preds, keys = _grammar(facts)
    input_specs = _input_gen(facts)
    t0 = time.perf_counter()
    tried = 0
    solution = []

    if not facts["targets"]:
        raise CasperFail("no loop accumulators to summarize")

    for out, keyed in facts["targets"]:
        found = None
        space = itertools.product(
            sorted(facts["colls"]) or ["<none>"],
            preds,
            fns,
            ["+", "min", "max", "&&", "||", "*"],
            keys if keyed else [None],
        )
        for coll, pred, fn, monoid, key in space:
            tried += 1
            if time.perf_counter() - t0 > budget_s:
                raise CasperTimeout(f"time budget exhausted after {tried} candidates")
            if tried > max_candidates:
                raise CasperFail(f"candidate space exhausted ({tried})")
            if coll == "<none>" or not facts["flat"] or facts["indexed"] and keyed:
                continue
            cand = Summary(out, coll, pred, fn, monoid, keyed, key)
            if _verify(cand, src, input_specs, trials=2, seed=0):
                # the original re-runs its expensive validator on the
                # accepted candidate; mirror with extra trials
                if _verify(cand, src, input_specs, trials=4, seed=1):
                    found = cand
                    break
        if found is None:
            raise CasperFail(
                f"no summary verified for {out!r} ({tried} candidates tried)"
            )
        solution.append(found)
    return solution
