"""Shared fixtures for the test suite.

The session-scoped ``spark`` fixture comes from the repo-root
conftest. Here we add small JSON-Lines datasets on disk (the engines
under test read files, like the paper's HDFS/S3 inputs) and engine
factories.
"""
from __future__ import annotations

import pytest

from repro import synth_data
from repro.core import Rumble, RumbleConfig

#: Unit-test dataset sizes (SF<=0.01-equivalent: ~2k objects, < 1 MB).
N_CONFUSION = 2_000
N_REDDIT = 2_000


@pytest.fixture(scope="session")
def confusion_path(tmp_path_factory) -> str:
    p = tmp_path_factory.mktemp("data") / "confusion.json"
    return synth_data.write_confusion(str(p), N_CONFUSION)


@pytest.fixture(scope="session")
def confusion_pdf():
    return synth_data.confusion_pandas(N_CONFUSION)


@pytest.fixture(scope="session")
def reddit_path(tmp_path_factory) -> str:
    p = tmp_path_factory.mktemp("data") / "reddit.json"
    return synth_data.write_reddit(str(p), N_REDDIT)


@pytest.fixture(scope="session")
def mess_path(tmp_path_factory) -> str:
    p = tmp_path_factory.mktemp("data") / "mess.json"
    return synth_data.write_jsonlines(str(p), synth_data.mess_rows())


@pytest.fixture()
def local_engine() -> Rumble:
    """A pure single-threaded engine (no Spark involvement)."""
    return Rumble(spark=None, config=RumbleConfig(force_local=True))


@pytest.fixture()
def rumble(spark) -> Rumble:
    """The full engine with Spark available."""
    return Rumble(spark)
