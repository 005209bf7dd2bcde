"""End-to-end tests for the NJ operator: golden paper results, the
snapshot reference, invariants, and the DuckDB probability oracle."""
import pytest

from repro.core.negation_joins import negation_join
from repro.core.reference import reference_negation_join
from repro.core.theta import Theta
from repro.oracle import assert_equivalent
from repro.synth_data import random_tp_pdf, tp_workload_pdf
from repro.tp.model import validate_tp_pdf
from repro.tp.snapshot import expand_df
from util import norm, paper_a, paper_b, rows

THETA = Theta.of(("loc", "=", "loc"))


@pytest.fixture()
def ab(spark):
    return spark.createDataFrame(paper_a()), spark.createDataFrame(paper_b())


class TestPaperGolden:
    def test_anti_join_matches_fig3(self, ab):
        a, b = ab
        got = rows(negation_join(a, b, THETA, "anti"))
        assert got == norm(
            [
                ("Ann", "ZAK", "a1", 2, 4, 0.7),
                ("Ann", "ZAK", "a1 & ~b3", 4, 5, 0.21),
                ("Ann", "ZAK", "a1 & ~(b2 | b3)", 5, 6, 0.084),
                ("Ann", "ZAK", "a1 & ~b2", 6, 8, 0.28),
                ("Jim", "WEN", "a2", 7, 10, 0.8),
            ]
        )

    def test_left_outer_join_matches_fig1b(self, ab):
        a, b = ab
        got = rows(negation_join(a, b, THETA, "left"))
        assert got == norm(
            [
                ("Ann", "ZAK", None, None, "a1", 2, 4, 0.70),
                ("Ann", "ZAK", "hotel1", "ZAK", "a1 & b3", 4, 6, 0.49),
                ("Ann", "ZAK", "hotel2", "ZAK", "a1 & b2", 5, 8, 0.42),
                ("Ann", "ZAK", None, None, "a1 & ~b3", 4, 5, 0.21),
                ("Ann", "ZAK", None, None, "a1 & ~(b2 | b3)", 5, 6, 0.084),
                ("Ann", "ZAK", None, None, "a1 & ~b2", 6, 8, 0.28),
                ("Jim", "WEN", None, None, "a2", 7, 10, 0.80),
            ]
        )

    def test_right_outer_join_mirrors_left_of_swapped(self, ab):
        a, b = ab
        got = rows(
            negation_join(a, b, THETA, "right").select(
                "s_hotel", "s_loc", "r_name", "lineage", "ts", "te", "p"
            )
        )
        expected = rows(
            negation_join(b, a, THETA.swapped(), "left").select(
                "r_hotel", "r_loc", "s_name", "lineage", "ts", "te", "p"
            )
        )
        assert got == expected

    def test_full_outer_join(self, ab):
        a, b = ab
        got = rows(
            negation_join(a, b, THETA, "full").select(
                "r_name", "s_hotel", "lineage", "ts", "te", "p"
            )
        )
        assert got == norm(
            [
                ("Ann", None, "a1", 2, 4, 0.70),
                ("Ann", "hotel1", "a1 & b3", 4, 6, 0.49),
                ("Ann", "hotel2", "a1 & b2", 5, 8, 0.42),
                ("Ann", None, "a1 & ~b3", 4, 5, 0.21),
                ("Ann", None, "a1 & ~(b2 | b3)", 5, 6, 0.084),
                ("Ann", None, "a1 & ~b2", 6, 8, 0.28),
                ("Jim", None, "a2", 7, 10, 0.80),
                (None, "hotel3", "b1", 1, 4, 0.9),
                (None, "hotel1", "b3 & ~a1", 4, 6, 0.21),
                (None, "hotel2", "b2 & ~a1", 5, 8, 0.18),
            ]
        )

    def test_rejects_unknown_op(self, ab):
        a, b = ab
        with pytest.raises(ValueError):
            negation_join(a, b, THETA, "inner")


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("op", ["anti", "left", "right", "full"])
def test_matches_snapshot_reference(spark, seed, op):
    """NJ ≡ the brute-force per-time-point possible-worlds semantics."""
    r_pdf = random_tp_pdf(7, n_facts=3, t_max=25, seed=seed, lid_prefix="a")
    s_pdf = random_tp_pdf(7, n_facts=3, t_max=25, seed=seed + 100, lid_prefix="b")
    theta = Theta.equi("k")
    got = rows(negation_join(
        spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf), theta, op
    ))
    ref = reference_negation_join(r_pdf, s_pdf, theta, op)
    assert got == rows(ref)


@pytest.mark.parametrize("kind, n", [("webkit", 60), ("meteo", 60)])
def test_matches_reference_on_workloads(spark, kind, n):
    r_pdf, s_pdf, theta = tp_workload_pdf(kind, n, seed=11)
    got = rows(negation_join(
        spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf), theta, "left"
    ))
    assert got == rows(reference_negation_join(r_pdf, s_pdf, theta, "left"))


class TestOracle:
    """Per-(fact, time point) probabilities checked against DuckDB.

    The expected probability at each time point follows from tuple
    independence: P = p_r · Π(1 − p_s) over the valid θ-matching
    negative tuples (anti / null-padded rows), and P = p_r · p_s for
    matched rows — both expressible as plain SQL over time point
    expansions, evaluated by an independent engine.
    """

    def test_anti_join_probabilities(self, spark):
        r_pdf, s_pdf, theta = tp_workload_pdf("webkit", 80, seed=5)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        res = expand_df(
            negation_join(r, s, theta, "anti").select("file_path", "ts", "te", "p")
        )
        assert_equivalent(
            res,
            f"""
            WITH rt AS (SELECT *, unnest(range(ts, te)) AS t FROM r),
                 st AS (SELECT *, unnest(range(ts, te)) AS t FROM s)
            SELECT rt.file_path, rt.t AS t,
                   rt.p * coalesce(product(1.0 - st.p), 1.0) AS p
            FROM rt LEFT JOIN st
              ON {theta.sql('rt', 'st')} AND rt.t = st.t
            GROUP BY rt.file_path, rt.t, rt.p
            """,
            r=r_pdf,
            s=s_pdf,
        )

    def test_anti_join_probabilities_meteo(self, spark):
        r_pdf, s_pdf, theta = tp_workload_pdf("meteo", 60, seed=9)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        res = expand_df(
            negation_join(r, s, theta, "anti").select(
                "station_id", "value_id", "ts", "te", "p"
            )
        )
        assert_equivalent(
            res,
            f"""
            WITH rt AS (SELECT *, unnest(range(ts, te)) AS t FROM r),
                 st AS (SELECT *, unnest(range(ts, te)) AS t FROM s)
            SELECT rt.station_id, rt.value_id, rt.t AS t,
                   rt.p * coalesce(product(1.0 - st.p), 1.0) AS p
            FROM rt LEFT JOIN st
              ON {theta.sql('rt', 'st')} AND rt.t = st.t
            GROUP BY rt.station_id, rt.value_id, rt.t, rt.p
            """,
            r=r_pdf,
            s=s_pdf,
        )

    def test_left_join_matched_probabilities(self, spark):
        r_pdf, s_pdf, theta = tp_workload_pdf("webkit", 80, seed=5)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        left = negation_join(r, s, theta, "left")
        matched = expand_df(
            left.where(left["s_file_path"].isNotNull()).select(
                "r_file_path", "s_file_path", "ts", "te", "p"
            )
        )
        assert_equivalent(
            matched,
            f"""
            WITH rt AS (SELECT *, unnest(range(ts, te)) AS t FROM r),
                 st AS (SELECT *, unnest(range(ts, te)) AS t FROM s)
            SELECT rt.file_path AS r_file_path, st.file_path AS s_file_path,
                   rt.t AS t, rt.p * st.p AS p
            FROM rt JOIN st
              ON {theta.sql('rt', 'st')} AND rt.t = st.t
            """,
            r=r_pdf,
            s=s_pdf,
        )

    def test_left_join_null_side_equals_anti_probabilities(self, spark):
        r_pdf, s_pdf, theta = tp_workload_pdf("webkit", 80, seed=5)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        left = negation_join(r, s, theta, "left")
        null_side = rows(
            left.where(left["s_file_path"].isNull()).select(
                "r_file_path", "lineage", "ts", "te", "p"
            )
        )
        anti = rows(
            negation_join(r, s, theta, "anti").select(
                "file_path", "lineage", "ts", "te", "p"
            )
        )
        assert null_side == anti


class TestInvariants:
    @pytest.mark.parametrize("kind", ["webkit", "meteo"])
    def test_anti_output_is_valid_tp_relation(self, spark, kind):
        r_pdf, s_pdf, theta = tp_workload_pdf(kind, 50, seed=2)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        out = negation_join(r, s, theta, "anti").toPandas()
        # lineage is part of the output identity: duplicate-freeness
        # means no overlapping intervals for equal (fact, lineage)
        out["lid"] = [f"o{i}" for i in range(len(out))]
        validate_tp_pdf(out)

    def test_anti_tiles_positive_relation_exactly(self, spark):
        """Anti-join intervals per r tuple tile its original interval."""
        r_pdf, s_pdf, theta = tp_workload_pdf("webkit", 50, seed=4)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        out = negation_join(r, s, theta, "anti").toPandas()
        out["r_lid"] = out["lineage"].str.split(" &").str[0]
        covered = out.groupby("r_lid").apply(
            lambda g: sum(g["te"] - g["ts"]), include_groups=False
        )
        expect = dict(zip(r_pdf["lid"], r_pdf["te"] - r_pdf["ts"]))
        for lid, length in covered.items():
            assert expect[lid] == length

    def test_probabilities_in_unit_interval(self, spark):
        r_pdf, s_pdf, theta = tp_workload_pdf("meteo", 50, seed=2)
        r, s = spark.createDataFrame(r_pdf), spark.createDataFrame(s_pdf)
        out = negation_join(r, s, theta, "left").toPandas()
        assert ((out["p"] >= 0) & (out["p"] <= 1)).all()
        assert (out["ts"] < out["te"]).all()

    def test_empty_negative_relation_passes_positive_through(self, spark):
        r_pdf = random_tp_pdf(5, seed=1, lid_prefix="a")
        s_pdf = random_tp_pdf(5, seed=2, lid_prefix="b")
        s_pdf = s_pdf[s_pdf["k"] == "__nothing__"]  # empty
        r = spark.createDataFrame(r_pdf)
        s = spark.createDataFrame(
            s_pdf, schema="k string, lid string, ts long, te long, p double"
        )
        out = negation_join(r, s, Theta.equi("k"), "anti")
        got = rows(out.select("k", "lineage", "ts", "te", "p"))
        expected = rows(r_pdf.rename(columns={"lid": "lineage"})[
            ["k", "lineage", "ts", "te", "p"]
        ])
        assert got == expected
