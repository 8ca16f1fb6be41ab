"""Financial/time property decoration and selectivity calibration."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graphs.financial import (
    AMT_HI,
    AMT_LO,
    DATE_DAYS,
    calibrate_alpha,
    decorate_financial,
    decorate_time,
    time_threshold,
)
from repro.graphs.generators import dataset


@pytest.fixture(scope="module")
def g(spark):
    return decorate_time(
        decorate_financial(dataset(spark, "lj", scale="tiny"))
    ).cache()


def test_vertex_properties(g):
    accs = {r["acc"] for r in g.vertices.select("acc").distinct().collect()}
    assert accs == {"CQ", "SV"}
    n_cities = g.vertices.select("city").distinct().count()
    assert n_cities == g.meta["n_cities"] > 1


def test_edge_properties_in_range(g):
    row = g.edges.agg(
        F.min("amt").alias("alo"), F.max("amt").alias("ahi"),
        F.min("date").alias("dlo"), F.max("date").alias("dhi"),
        F.min("time").alias("tlo"),
    ).collect()[0]
    assert AMT_LO <= row["alo"] <= row["ahi"] <= AMT_HI
    assert 0 <= row["dlo"] <= row["dhi"] < DATE_DAYS
    assert row["tlo"] >= 0


def test_decoration_deterministic(spark):
    a = decorate_financial(dataset(spark, "brk", scale="tiny"), seed=3)
    b = decorate_financial(dataset(spark, "brk", scale="tiny"), seed=3)
    assert a.edges.toPandas().equals(b.edges.toPandas())
    c = decorate_financial(dataset(spark, "brk", scale="tiny"), seed=4)
    assert not a.edges.toPandas().equals(c.edges.toPandas())


def test_time_threshold_selectivity(g):
    tau = time_threshold(g, 0.05)
    frac = g.edges.where(F.col("time") > tau).count() / g.num_edges
    assert 0.02 <= frac <= 0.08


@pytest.mark.parametrize("target", [0.25, 0.05, 0.005])
def test_calibrate_alpha_hits_target(g, target):
    alpha = calibrate_alpha(g, target)
    pdf = g.edges.select("amt", "date").toPandas()
    rng = np.random.default_rng(99)
    i = rng.integers(0, len(pdf), 100_000)
    j = rng.integers(0, len(pdf), 100_000)
    amt, date = pdf["amt"].to_numpy(), pdf["date"].to_numpy()
    sel = np.mean(
        (date[i] < date[j]) & (amt[j] < amt[i]) & (amt[i] - amt[j] < alpha)
    )
    assert sel == pytest.approx(target, rel=0.35)


def test_alpha_monotone_in_target(g):
    assert calibrate_alpha(g, 0.25) > calibrate_alpha(g, 0.05) > calibrate_alpha(
        g, 0.005
    ) > 0
