"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.
"""
import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2557, n), unit="D"),
        }
    )
    return spark.createDataFrame(pdf)


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice([f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
        }
    )
    return spark.createDataFrame(pdf)


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    pdf = pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
        }
    )
    return spark.createDataFrame(pdf)


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )


# ===========================================================================
# CLX string-domain generators (paper reproduction).
#
# The paper evaluates on string columns (phone numbers, names, addresses,
# product ids, ...) from public benchmarks that are not available offline;
# these deterministic generators synthesize equivalent data (DESIGN.md §4).
# Every generator takes a numpy Generator (or seed) so inputs are
# reproducible and the DuckDB oracle sees identical data.
# ===========================================================================

FIRST_NAMES = [
    "John", "Mary", "James", "Linda", "Robert", "Susan", "David", "Karen",
    "Bill", "Nancy", "Frank", "Laura", "Peter", "Alice", "Henry", "Diane",
    "Oscar", "Grace", "Victor", "Helen", "Walter", "Julia", "Edward", "Rose",
]

LAST_NAMES = [
    "Smith", "Jones", "Brown", "Miller", "Wilson", "Moore", "Taylor",
    "Thomas", "Jackson", "White", "Harris", "Martin", "Garcia", "Clark",
    "Lewis", "Walker", "Hall", "Allen", "Young", "King", "Wright", "Scott",
]

#: Last names that break the "<U><L>+" shape — the paper's "McMillan"
#: failure analysis (§7.4) needs these.
CAMEL_LAST_NAMES = ["McMillan", "McDonald", "DeVries", "LaSalle"]

STREET_NAMES = [
    "Main", "Oak", "Pine", "Maple", "Cedar", "Elm", "Lake", "Hill",
    "Park", "River", "Sunset", "Church", "Spring", "Mill", "Front",
]

STREET_KINDS = ["St", "Ave", "Rd", "Blvd", "Dr", "Ln", "Way"]

CITIES = [
    "Ann Arbor", "San Diego", "Chicago", "Redmond", "Austin", "Boston",
    "Denver", "Seattle", "Portland", "Madison", "Atlanta", "Dallas",
]

STATES = ["MI", "CA", "IL", "WA", "TX", "MA", "CO", "OR", "WI", "GA", "NY"]

WORDS = [
    "alpha", "bravo", "delta", "eagle", "falcon", "garden", "harbor",
    "island", "jungle", "kernel", "lemon", "meadow", "needle", "ocean",
    "planet", "quartz", "ridge", "silver", "timber", "uplands", "valley",
]

UNIVERSITIES = [
    "University of Michigan", "University of California Berkeley",
    "Massachusetts Institute of Technology", "Stanford University",
    "Carnegie Mellon University", "University of Washington",
    "Georgia Institute of Technology", "University of Texas at Austin",
]

COUNTRIES = ["USA", "France", "Germany", "Canada", "Japan", "Brazil", "India"]

AFFILIATIONS = ["INRIA", "IBM", "MSR", "CNRS", "ETH", "MIT", "UCB"]

CAR_MAKES = ["Honda", "Toyota", "Ford", "Mazda", "Subaru", "Nissan", "Volvo"]
CAR_MODELS = ["Civic", "Camry", "Focus", "Accord", "Impreza", "Altima"]


def digits(g: np.random.Generator, n: int) -> str:
    """A string of ``n`` random digits with a non-zero leading digit."""
    first = str(g.integers(2, 10))
    rest = "".join(str(d) for d in g.integers(0, 10, n - 1))
    return first + rest


def phone_in_format(g: np.random.Generator, fmt: str) -> str:
    """A random US-style phone number rendered in ``fmt``.

    ``fmt`` uses ``A``/``B``/``C`` for the 3/3/4 digit groups, e.g.
    ``"(A) B-C"`` -> ``"(734) 645-8397"``; any other character is literal.
    """
    a, b, c = digits(g, 3), digits(g, 3), digits(g, 4)
    return fmt.replace("A", a).replace("B", b).replace("C", c)


#: Formats observed in the paper's Figure 1 / Times-Square column, most
#: common first. Index 0 is the §7.2 task's target "<D>3-<D>3-<D>4".
PHONE_FORMATS = [
    "A-B-C",
    "(A) B-C",
    "A.B.C",
    "(A)B-C",
    "A B C",
    "+1 A-B-C",
]


def phone_column(
    spark: SparkSession, *, n: int, n_formats: int = 4, seed: int = 7
) -> DataFrame:
    """A single-column DataFrame ``phone`` of ``n`` numbers drawn from the
    first ``n_formats`` formats — the §7.2 scaling workload at any size."""
    g = _rng(seed)
    fmts = PHONE_FORMATS[:n_formats]
    vals = [phone_in_format(g, fmts[int(g.integers(0, len(fmts)))]) for _ in range(n)]
    return spark.createDataFrame(pd.DataFrame({"phone": vals}))


def strings_df(spark: SparkSession, values, col: str = "s") -> DataFrame:
    """Wrap a Python list of strings as a one-column DataFrame."""
    return spark.createDataFrame(pd.DataFrame({col: list(values)}))
