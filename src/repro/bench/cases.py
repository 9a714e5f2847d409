"""The 47-case benchmark suite (paper §7.4, Table 6).

The paper's suite mixes SyGuS-COMP 2017 tasks (27), FlashFill paper
examples (10), BlinkFill (4), PredProg (3) and Microsoft PROSE (3); none
are downloadable offline, so each is re-created synthetically with the
same *source mix*, *data types*, and approximate size/length statistics
(DESIGN.md §4). Every case carries row-aligned ground truth and — as the
paper's prototype requires — at least one record already in the target
format (rows where ``input == output``).

Cases designed to exercise the paper's failure analysis:

- ``ff_ex13_conditional`` — output depends on a keyword, not on syntax
  (FlashFill "Example 13" analog): inexpressible in UniFi;
- ``ff_name_mcmillan`` — a camel-case last name whose target-pattern
  form has no representative among the clean rows ("McMillan");
- ``prose_popl13`` — heterogeneous name/affiliation/country rows
  (PROSE "popl-13.ecr" analog), CLX's worst case in Appendix E;
- assorted swap/reorder tasks where syntactic alignment is ambiguous and
  the default MDL plan is wrong ~half the time (§6.4), forcing repairs.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Dict, List, Sequence, Tuple

import numpy as np

from .. import synth_data as sd


@dataclass(frozen=True)
class Case:
    """One benchmark task: row-aligned inputs and expected outputs."""

    name: str
    source: str  # sygus | flashfill | blinkfill | predprog | prose
    datatype: str
    inputs: Tuple[str, ...]
    outputs: Tuple[str, ...]

    def __post_init__(self) -> None:
        assert len(self.inputs) == len(self.outputs), self.name
        assert any(i == o for i, o in zip(self.inputs, self.outputs)), (
            f"{self.name}: needs >=1 record already in target format"
        )

    @property
    def size(self) -> int:
        return len(self.inputs)


Row = Dict[str, str]
Fmt = Callable[[Row], str]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _mk(
    name: str,
    source: str,
    datatype: str,
    n: int,
    seed: int,
    row_gen: Callable[[np.random.Generator], Row],
    in_formats: Sequence[Fmt],
    out_format: Fmt,
    *,
    target_share: float = 0.3,
    exemplar_formats: Sequence[Fmt] | None = None,
) -> Case:
    """Build a case: each row gets random components, an input rendering
    drawn from ``in_formats``, and the ground-truth output rendering.

    A ``target_share`` fraction of rows is emitted *already clean*
    (input = output). When ``exemplar_formats`` is given, only rows it
    renders identically to ``out_format`` are eligible to be exemplars —
    the hook for "missing representative target pattern" cases.
    """
    g = _rng(seed)
    inputs: List[str] = []
    outputs: List[str] = []
    n_clean = max(2, int(round(n * target_share)))
    for k in range(n):
        row = row_gen(g)
        out = out_format(row)
        if k < n_clean:
            if exemplar_formats is not None:
                # regenerate until the exemplar form equals the target form
                tries = 0
                while exemplar_formats[0](row) != out and tries < 50:
                    row = row_gen(g)
                    out = out_format(row)
                    tries += 1
            inputs.append(out)
            outputs.append(out)
        else:
            fmt = in_formats[int(g.integers(0, len(in_formats)))]
            inputs.append(fmt(row))
            outputs.append(out)
    order = g.permutation(n)
    return Case(
        name,
        source,
        datatype,
        tuple(inputs[i] for i in order),
        tuple(outputs[i] for i in order),
    )


# ---------------------------------------------------------------------------
# Component row generators.
# ---------------------------------------------------------------------------

def _phone_row(g: np.random.Generator) -> Row:
    return {"a": sd.digits(g, 3), "b": sd.digits(g, 3), "c": sd.digits(g, 4)}


def _phone3_row(g: np.random.Generator) -> Row:
    return {"a": sd.digits(g, 3), "b": sd.digits(g, 3), "c": sd.digits(g, 3)}


def _name_row(g: np.random.Generator) -> Row:
    return {
        "first": sd.FIRST_NAMES[int(g.integers(0, len(sd.FIRST_NAMES)))],
        "last": sd.LAST_NAMES[int(g.integers(0, len(sd.LAST_NAMES)))],
    }


def _date_row(g: np.random.Generator) -> Row:
    # month/day always 2 digits and month != day so swap mistakes show.
    m = int(g.integers(10, 13))
    d = int(g.integers(13, 29))
    y = int(g.integers(1980, 2020))
    return {"m": str(m), "d": str(d), "y": str(y)}


def _addr_row(g: np.random.Generator) -> Row:
    return {
        "num": sd.digits(g, int(g.integers(2, 5))),
        "street": sd.STREET_NAMES[int(g.integers(0, len(sd.STREET_NAMES)))],
        "kind": sd.STREET_KINDS[int(g.integers(0, len(sd.STREET_KINDS)))],
        "city": sd.CITIES[int(g.integers(0, len(sd.CITIES)))],
        "state": sd.STATES[int(g.integers(0, len(sd.STATES)))],
        "zip": sd.digits(g, 5),
    }


def _word_row(g: np.random.Generator) -> Row:
    w = lambda: sd.WORDS[int(g.integers(0, len(sd.WORDS)))]  # noqa: E731
    return {"w1": w(), "w2": w(), "w3": w(), "d": sd.digits(g, 3)}


# ---------------------------------------------------------------------------
# The 47 cases.
# ---------------------------------------------------------------------------

def _sygus_cases() -> List[Case]:
    cs: List[Case] = []
    P = _phone_row
    # -- phones (6) ---------------------------------------------------------
    cs.append(_mk(
        "sygus_phone_std", "sygus", "phone number", 60, 101, P,
        [lambda r: f"({r['a']}) {r['b']}-{r['c']}",
         lambda r: f"{r['a']}.{r['b']}.{r['c']}"],
        lambda r: f"{r['a']}-{r['b']}-{r['c']}",
    ))
    cs.append(_mk(
        "sygus_phone_parens", "sygus", "phone number", 60, 102, P,
        [lambda r: f"{r['a']}-{r['b']}-{r['c']}",
         lambda r: f"{r['a']}.{r['b']}.{r['c']}",
         lambda r: f"{r['a']} {r['b']} {r['c']}"],
        lambda r: f"({r['a']}) {r['b']}-{r['c']}",
    ))
    cs.append(_mk(
        "sygus_phone_dots", "sygus", "phone number", 50, 103, P,
        [lambda r: f"{r['a']}-{r['b']}-{r['c']}",
         lambda r: f"({r['a']}){r['b']}-{r['c']}"],
        lambda r: f"{r['a']}.{r['b']}.{r['c']}",
    ))
    cs.append(_mk(
        "sygus_phone_compact", "sygus", "phone number", 50, 104, P,
        [lambda r: f"{r['a']} {r['b']} {r['c']}",
         lambda r: f"{r['a']}-{r['b']}-{r['c']}"],
        lambda r: f"({r['a']}){r['b']}-{r['c']}",
    ))
    cs.append(_mk(
        "sygus_phone_plus", "sygus", "phone number", 50, 105, P,
        [lambda r: f"+1 {r['a']}-{r['b']}-{r['c']}"],
        lambda r: f"{r['a']}-{r['b']}-{r['c']}",
    ))
    cs.append(_mk(
        "sygus_phone_10_long", "sygus", "phone number", 100, 106, _phone3_row,
        [lambda r: f"{r['a']}.{r['b']}.{r['c']}",
         lambda r: f"+1 {r['a']}-{r['b']}-{r['c']}",
         lambda r: f"({r['a']}) {r['b']}-{r['c']}"],
        lambda r: f"+1 ({r['a']}) {r['b']}-{r['c']}",
        target_share=0.25,
    ))
    # -- human names (8) ----------------------------------------------------
    N = _name_row
    cs.append(_mk(
        "sygus_name_initial", "sygus", "human name", 40, 111, N,
        [lambda r: f"{r['first']} {r['last']}"],
        lambda r: f"{r['last']}, {r['first'][0]}.",
    ))
    cs.append(_mk(
        "sygus_name_swap", "sygus", "human name", 40, 112, N,
        [lambda r: f"{r['last']}, {r['first']}"],
        lambda r: f"{r['first']} {r['last']}",
    ))
    cs.append(_mk(
        "sygus_name_title", "sygus", "human name", 40, 113, N,
        [lambda r: f"Dr. {r['first']} {r['last']}"],
        lambda r: f"{r['first']} {r['last']}",
    ))
    cs.append(_mk(
        "sygus_name_last", "sygus", "human name", 40, 114, N,
        [lambda r: f"{r['first']} {r['last']}"],
        lambda r: f"{r['last']}",
    ))
    cs.append(_mk(
        "sygus_name_first", "sygus", "human name", 40, 115, N,
        [lambda r: f"{r['first']} {r['last']}"],
        lambda r: f"{r['first']}",
    ))
    cs.append(_mk(
        "sygus_name_multi", "sygus", "human name", 70, 116, N,
        [lambda r: f"{r['last']}, {r['first']}",
         lambda r: f"Dr. {r['first']} {r['last']}",
         lambda r: f"{r['first']}  {r['last']}"],
        lambda r: f"{r['first']} {r['last']}",
    ))
    cs.append(_mk(
        "sygus_name_comma_multi", "sygus", "human name", 80, 117, N,
        [lambda r: f"{r['first']} {r['last']}",
         lambda r: f"Dr. {r['first']} {r['last']}",
         lambda r: f"{r['first']}.{r['last']}",
         lambda r: f"{r['first']}_{r['last']}"],
        lambda r: f"{r['last']}, {r['first']}",
    ))
    cs.append(_mk(
        "sygus_name_underscore", "sygus", "human name", 50, 118, N,
        [lambda r: f"{r['first']}_{r['last']}",
         lambda r: f"{r['first']}.{r['last']}"],
        lambda r: f"{r['first']} {r['last']}",
    ))
    # -- university names (4) ----------------------------------------------
    # Two level-1 name shapes ("<X> University" and "University of <X>")
    # so the hierarchy collapses the many leaf patterns into two source
    # shapes — the long-string workload of the SyGuS set.
    _UNIV_SHAPES = [
        "Stanford University", "Cornell University", "Princeton University",
        "University of Michigan", "University of Washington",
        "University of Pennsylvania",
    ]

    def _univ_row(g: np.random.Generator) -> Row:
        return {
            "univ": _UNIV_SHAPES[int(g.integers(0, len(_UNIV_SHAPES)))],
            "city": sd.CITIES[int(g.integers(0, len(sd.CITIES)))],
            "state": sd.STATES[int(g.integers(0, len(sd.STATES)))],
            "zip": sd.digits(g, 5),
        }

    cs.append(_mk(
        "sygus_univ_extract", "sygus", "university name", 60, 121, _univ_row,
        [lambda r: f"{r['univ']}, {r['city']}, {r['state']} {r['zip']}"],
        lambda r: f"{r['univ']}",
        target_share=0.35,
    ))
    cs.append(_mk(
        "sygus_univ_state", "sygus", "university name", 60, 122, _univ_row,
        [lambda r: f"{r['univ']}, {r['state']}, USA"],
        lambda r: f"{r['univ']} ({r['state']})",
        target_share=0.35,
    ))
    cs.append(_mk(
        "sygus_univ_comma", "sygus", "university name", 55, 123, _univ_row,
        [lambda r: f"{r['univ']} - {r['state']}"],
        lambda r: f"{r['univ']}, {r['state']}",
        target_share=0.35,
    ))
    cs.append(_mk(
        "sygus_univ_city", "sygus", "university name", 55, 124, _univ_row,
        [lambda r: f"{r['univ']}, {r['city']}",
         lambda r: f"{r['univ']} / {r['city']}"],
        lambda r: f"{r['city']}: {r['univ']}",
        target_share=0.35,
    ))
    # -- car model ids (3) --------------------------------------------------
    def _car_row(g: np.random.Generator) -> Row:
        return {
            "make": sd.CAR_MAKES[int(g.integers(0, len(sd.CAR_MAKES)))],
            "model": sd.CAR_MODELS[int(g.integers(0, len(sd.CAR_MODELS)))],
            "year": str(int(g.integers(1995, 2020))),
        }

    cs.append(_mk(
        "sygus_car_normalize", "sygus", "car model ids", 70, 131, _car_row,
        [lambda r: f"{r['make']} {r['model']} {r['year']}",
         lambda r: f"{r['make']}/{r['model']}/{r['year']}"],
        lambda r: f"{r['make']}-{r['model']}-{r['year']}",
    ))
    cs.append(_mk(
        "sygus_car_year", "sygus", "car model ids", 65, 132, _car_row,
        [lambda r: f"{r['make']} {r['model']} ({r['year']})"],
        lambda r: f"{r['year']}",
    ))
    cs.append(_mk(
        "sygus_car_model", "sygus", "car model ids", 65, 133, _car_row,
        [lambda r: f"{r['year']} {r['make']} {r['model']}",
         lambda r: f"{r['make']}, {r['model']}, {r['year']}"],
        lambda r: f"{r['make']} {r['model']}",
    ))
    # -- dates (3) ----------------------------------------------------------
    D = _date_row
    cs.append(_mk(
        "sygus_date_sep", "sygus", "date", 60, 141, D,
        [lambda r: f"{r['m']}.{r['d']}.{r['y']}",
         lambda r: f"{r['m']} {r['d']} {r['y']}"],
        lambda r: f"{r['m']}/{r['d']}/{r['y']}",
    ))
    cs.append(_mk(
        "sygus_date_iso", "sygus", "date", 60, 142, D,
        [lambda r: f"{r['m']}/{r['d']}/{r['y']}"],
        lambda r: f"{r['y']}-{r['m']}-{r['d']}",
    ))
    cs.append(_mk(
        "sygus_date_swap", "sygus", "date", 60, 143, D,
        [lambda r: f"{r['y']}/{r['m']}/{r['d']}"],
        lambda r: f"{r['d']}-{r['m']}-{r['y']}",
    ))
    # -- misc (3) -----------------------------------------------------------
    cs.append(_mk(
        "sygus_zip_trim", "sygus", "address", 60, 151, _addr_row,
        [lambda r: f"{r['zip']}-{sd.digits(_rng(int(r['zip'])), 4)}"],
        lambda r: f"{r['zip']}",
    ))
    cs.append(_mk(
        "sygus_code_sep", "sygus", "product id", 60, 152, _word_row,
        [lambda r: f"{r['w1']}_{r['d']}_{r['w2']}",
         lambda r: f"{r['w1']} {r['d']} {r['w2']}"],
        lambda r: f"{r['w1']}-{r['d']}-{r['w2']}",
    ))
    cs.append(_mk(
        "sygus_wrap_brackets", "sygus", "product id", 60, 153, _word_row,
        [lambda r: f"{r['w1']}:{r['d']}",
         lambda r: f"{r['w1']} {r['d']}"],
        lambda r: f"[{r['w1']}:{r['d']}]",
    ))
    assert len(cs) == 27, len(cs)
    return cs


def _flashfill_cases() -> List[Case]:
    cs: List[Case] = []
    N = _name_row
    # Table 4 (paper Example 6 / FlashFill Example 9) — padded to 10 rows.
    cs.append(_mk(
        "ff_ex9_names", "flashfill", "human name", 10, 201, N,
        [lambda r: f"Dr. {r['first']} {r['last']}",
         lambda r: f"{r['first']} {r['last']}, Sr."],
        lambda r: f"{r['last']}, {r['first'][0]}.",
    ))
    # Table 5 task 1 (FlashFill Example 11 analog): 10 short names.
    cs.append(_mk(
        "ff_ex11_names", "flashfill", "human name", 10, 202, N,
        [lambda r: f"{r['first']} {r['last']}"],
        lambda r: f"{r['last']}, {r['first'][0]}.",
    ))
    # FlashFill Example 13 analog: keyword-dependent output. "pic"/"doc"
    # prefixes share token shape, so no syntactic cluster separates them.
    def _cond_row(g: np.random.Generator) -> Row:
        kind = "picture" if g.random() < 0.5 else "project"
        return {"kind": kind, "w": sd.WORDS[int(g.integers(0, len(sd.WORDS)))],
                "d": sd.digits(g, 3)}

    cs.append(_mk(
        "ff_ex13_conditional", "flashfill", "product name", 12, 203, _cond_row,
        [lambda r: f"{r['kind']} {r['w']} {r['d']}"],
        lambda r: (
            f"IMG {r['w']}{r['d']}" if r["kind"] == "picture"
            else f"DOC {r['w']}{r['d']}"
        ),
        target_share=0.2,
    ))
    # log entries: extract the request path.
    def _log_row(g: np.random.Generator) -> Row:
        return {
            "ip": f"{int(g.integers(1,255))}.{int(g.integers(0,255))}."
                  f"{int(g.integers(0,255))}.{int(g.integers(1,255))}",
            "page": sd.WORDS[int(g.integers(0, len(sd.WORDS)))],
        }

    cs.append(_mk(
        "ff_log_path", "flashfill", "log entry", 10, 204, _log_row,
        [lambda r: f"{r['ip']} GET /{r['page']}.html"],
        lambda r: f"/{r['page']}.html",
    ))
    cs.append(_mk(
        "ff_date", "flashfill", "date", 10, 205, _date_row,
        [lambda r: f"{r['m']}/{r['d']}/{r['y']}"],
        lambda r: f"{r['y']}-{r['m']}-{r['d']}",
    ))
    def _dir_row(g: np.random.Generator) -> Row:
        return {"u": sd.WORDS[int(g.integers(0, len(sd.WORDS)))],
                "f": sd.WORDS[int(g.integers(0, len(sd.WORDS)))],
                "e": ["txt", "csv", "log"][int(g.integers(0, 3))]}

    cs.append(_mk(
        "ff_file_dir", "flashfill", "file directory", 10, 206, _dir_row,
        [lambda r: f"C:\\{r['u']}\\{r['f']}.{r['e']}"],
        lambda r: f"{r['f']}.{r['e']}",
    ))
    cs.append(_mk(
        "ff_url_host", "flashfill", "url", 10, 207, _dir_row,
        [lambda r: f"http://www.{r['u']}.com/{r['f']}"],
        lambda r: f"www.{r['u']}.com",
    ))
    cs.append(_mk(
        "ff_product", "flashfill", "product name", 10, 208, _word_row,
        [lambda r: f"{r['w1']} {r['d']} USD"],
        lambda r: f"{r['w1']}-{r['d']}",
    ))
    cs.append(_mk(
        "ff_phone", "flashfill", "phone number", 12, 209, _phone_row,
        [lambda r: f"({r['a']}) {r['b']}-{r['c']}",
         lambda r: f"{r['a']}.{r['b']}.{r['c']}",
         lambda r: f"{r['a']} {r['b']} {r['c']}"],
        lambda r: f"{r['a']}-{r['b']}-{r['c']}",
    ))
    # "McMillan": the camel-case last names never appear among clean rows,
    # so their target-pattern form is unrepresented (paper §7.4 failure).
    def _mc_row(g: np.random.Generator) -> Row:
        r = _name_row(g)
        if g.random() < 0.35:
            r["last"] = sd.CAMEL_LAST_NAMES[
                int(g.integers(0, len(sd.CAMEL_LAST_NAMES)))
            ]
        return r

    def _mc_clean_row(g: np.random.Generator) -> Row:
        return _name_row(g)  # exemplars drawn from plain names only

    cs.append(_mk(
        "ff_name_mcmillan", "flashfill", "human name", 14, 210, _mc_row,
        [lambda r: f"{r['first']} {r['last']}"],
        lambda r: f"{r['last']}, {r['first'][0]}.",
        exemplar_formats=[lambda r: (
            f"{r['last']}, {r['first'][0]}." if r["last"][1:].islower() else ""
        )],
    ))
    assert len(cs) == 10, len(cs)
    return cs


def _blinkfill_cases() -> List[Case]:
    cs: List[Case] = []
    # Table 3 (paper Example 5 / BlinkFill Example 3): CPT billing codes.
    def _cpt_row(g: np.random.Generator) -> Row:
        return {"d": sd.digits(g, int(g.integers(3, 6)))}

    cs.append(_mk(
        "bf_ex3_cpt", "blinkfill", "product id", 11, 301, _cpt_row,
        [lambda r: f"CPT-{r['d']}",
         lambda r: f"[CPT-{r['d']}",
         lambda r: f"CPT{r['d']}"],
        lambda r: f"[CPT-{r['d']}]",
        target_share=0.25,
    ))
    cs.append(_mk(
        "bf_city_country", "blinkfill", "city name and country", 11, 302,
        _addr_row,
        [lambda r: f"{r['city']} ({r['state']}) USA"],
        lambda r: f"{r['city']}, USA",
    ))
    cs.append(_mk(
        "bf_product_id", "blinkfill", "product id", 10, 303, _word_row,
        [lambda r: f"{r['d']}/{r['w1']}",
         lambda r: f"{r['d']} {r['w1']}"],
        lambda r: f"{r['w1']}#{r['d']}",
    ))
    cs.append(_mk(
        "bf_address", "blinkfill", "address", 11, 304, _addr_row,
        [lambda r: f"{r['num']} {r['street']} {r['kind']}."],
        lambda r: f"{r['num']} {r['street']} {r['kind']}",
    ))
    assert len(cs) == 4, len(cs)
    return cs


def _predprog_cases() -> List[Case]:
    cs: List[Case] = []
    # Table 5 task 2 (PredProg Example 3): extract the city from a full
    # address; cities are one- or two-word so outputs have two patterns.
    cs.append(_mk(
        "pp_ex3_address", "predprog", "address", 10, 401, _addr_row,
        [lambda r: f"{r['num']} {r['street']} {r['kind']}, {r['city']}, "
                   f"{r['state']} {r['zip']}"],
        lambda r: f"{r['city']}",
    ))
    cs.append(_mk(
        "pp_name", "predprog", "human name", 10, 402, _name_row,
        [lambda r: f"{r['last']}; {r['first']}"],
        lambda r: f"{r['first']} {r['last']}",
    ))
    cs.append(_mk(
        "pp_state", "predprog", "address", 10, 403, _addr_row,
        [lambda r: f"{r['city']}, {r['state']} {r['zip']}"],
        lambda r: f"{r['state']}",
    ))
    assert len(cs) == 3, len(cs)
    return cs


def _prose_cases() -> List[Case]:
    cs: List[Case] = []
    def _cn_row(g: np.random.Generator) -> Row:
        return {"country": sd.COUNTRIES[int(g.integers(0, len(sd.COUNTRIES)))],
                "code": sd.digits(g, 2)}

    cs.append(_mk(
        "prose_country_number", "prose", "country and number", 40, 501,
        _cn_row,
        [lambda r: f"{r['country']} ({r['code']})",
         lambda r: f"{r['country']} - {r['code']}"],
        lambda r: f"{r['code']}",
    ))
    def _email_row(g: np.random.Generator) -> Row:
        r = _name_row(g)
        return {"u": f"{r['first'].lower()}.{r['last'].lower()}",
                "dom": sd.WORDS[int(g.integers(0, len(sd.WORDS)))]}

    cs.append(_mk(
        "prose_email", "prose", "email", 40, 502, _email_row,
        [lambda r: f"{r['u']}@{r['dom']}.com"],
        lambda r: f"{r['u']}",
    ))
    # popl-13.ecr analog: "Name, Affiliation, Country" with mixed
    # affiliation shapes; extract the affiliation. Exemplars exist only
    # for the acronym shape, so the "Univ. of X" outputs have no
    # selectable target pattern — CLX's worst case (Appendix E calls it
    # "tremendous user effort").
    def _affil_row(g: np.random.Generator) -> Row:
        r = _name_row(g)
        if g.random() < 0.4:
            aff = sd.AFFILIATIONS[int(g.integers(0, len(sd.AFFILIATIONS)))]
        else:
            aff = f"Univ. of {sd.STREET_NAMES[int(g.integers(0, len(sd.STREET_NAMES)))]}"
        return {"first": r["first"], "last": r["last"], "aff": aff,
                "country": sd.COUNTRIES[int(g.integers(0, len(sd.COUNTRIES)))]}

    cs.append(_mk(
        "prose_popl13", "prose", "human name and affiliation", 38, 503,
        _affil_row,
        [lambda r: f"{r['first']} {r['last']}, {r['aff']}, {r['country']}"],
        lambda r: f"{r['aff']}",
        target_share=0.25,
        exemplar_formats=[lambda r: (
            r["aff"] if not r["aff"].startswith("Univ.") else ""
        )],
    ))
    assert len(cs) == 3, len(cs)
    return cs


def all_cases() -> List[Case]:
    """The full 47-case suite, deterministic across runs."""
    cs = (
        _sygus_cases()
        + _flashfill_cases()
        + _blinkfill_cases()
        + _predprog_cases()
        + _prose_cases()
    )
    assert len(cs) == 47, len(cs)
    assert len({c.name for c in cs}) == 47
    return cs


def case_by_name(name: str) -> Case:
    for c in all_cases():
        if c.name == name:
            return c
    raise KeyError(name)


#: The paper's two worked tables, verbatim (Tables 3 and 4).
TABLE3_RAW = ["CPT-00350", "[CPT-00340", "[CPT-11536]", "CPT115"]
TABLE3_EXPECTED = ["[CPT-00350]", "[CPT-00340]", "[CPT-11536]", "[CPT-115]"]

TABLE4_RAW = ["Dr. Eran Yahav", "Fisher, K.", "Bill Gates, Sr.", "Oege de Moor"]
TABLE4_EXPECTED = ["Yahav, E.", "Fisher, K.", "Gates, B.", "Moor, O."]
