"""Table 1: data-scale generation (row counts + generator throughput)."""
import pytest

from benchmarks._util import record
from repro import census
from repro.experiments import PAPER_TABLE1, SEED, SHRINK

SCALES = [1, 2, 5, 10, 40]


@pytest.mark.parametrize("scale", SCALES)
def test_table1_generate(benchmark, scale):
    db = benchmark.pedantic(
        lambda: census.generate(scale=scale, shrink=SHRINK, seed=SEED),
        rounds=1,
        iterations=1,
    )
    paper = PAPER_TABLE1.set_index("scale")
    row = {
        "scale": scale,
        "persons": len(db.persons),
        "housing": len(db.housing),
        "paper_persons": int(paper["persons"].get(scale, -1)),
        "paper_housing": int(paper["housing"].get(scale, -1)),
        "ratio": round(len(db.persons) / len(db.housing), 3),
    }
    record("table1", row, benchmark)
    assert row["housing"] == round(census.HOUSING_PER_SCALE * scale * SHRINK)
