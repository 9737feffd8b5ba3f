"""Structured Streaming integration: stream-stream joins == batch engine."""
import pandas as pd
import pytest

from repro.cep.streaming import execute_order_plan_streaming, stage_stream
from repro.core.pattern import conj, seq
from repro.core.planner import plan_simple
from repro.oracle import assert_equivalent
from repro.streams.estimation import estimate
from repro.streams.stock import StreamConfig, stock_events_pdf
from tests.cep_sql import pattern_sql

CFG = StreamConfig(n_symbols=5, duration=360.0, window=60.0, seed=41)


@pytest.fixture(scope="module")
def events_pdf():
    return stock_events_pdf(CFG)


@pytest.fixture(scope="module")
def staged(events_pdf, tmp_path_factory):
    d = tmp_path_factory.mktemp("stream_input")
    stage_stream(events_pdf, str(d), n_slices=5)
    return str(d)


def _canon(pdf):
    cols = sorted(pdf.columns)
    return pdf[cols].sort_values(cols).reset_index(drop=True)


class TestStreaming:
    def test_sequence_matches_oracle(self, spark, events_pdf, staged, stats=None):
        st = estimate(events_pdf, CFG.duration, seed=0)
        p = seq(("S00", "S01", "S02"), (), CFG.window)
        pp = plan_simple(p, st.rates_for(p.types), "DP-LD")
        got_pdf = execute_order_plan_streaming(spark, pp, staged)
        got = spark.createDataFrame(got_pdf) if len(got_pdf) else None
        if got is None:
            # Degenerate stream — oracle must agree it is empty.
            import duckdb

            con = duckdb.connect()
            con.register("ev", events_pdf)
            assert len(con.execute(pattern_sql(p)).fetchdf()) == 0
            con.close()
            return
        assert_equivalent(got, pattern_sql(p), ev=events_pdf)

    def test_reordered_plan_same_result(self, spark, events_pdf, staged):
        """The optimized join ordering changes the dataflow, not the answer."""
        st = estimate(events_pdf, CFG.duration, seed=0)
        p = seq(("S00", "S03", "S04"), (), CFG.window)
        triv = plan_simple(p, st.rates_for(p.types), "TRIVIAL")
        opt = plan_simple(p, st.rates_for(p.types), "EFREQ")
        a = execute_order_plan_streaming(spark, triv, staged)
        b = execute_order_plan_streaming(spark, opt, staged)
        pd.testing.assert_frame_equal(_canon(a), _canon(b))

    def test_conjunction(self, spark, events_pdf, staged):
        st = estimate(events_pdf, CFG.duration, seed=0)
        p = conj(("S01", "S02"), (), CFG.window)
        pp = plan_simple(p, st.rates_for(p.types), "TRIVIAL")
        got_pdf = execute_order_plan_streaming(spark, pp, staged)
        import duckdb

        con = duckdb.connect()
        con.register("ev", events_pdf)
        ref = con.execute(pattern_sql(p)).fetchdf()
        con.close()
        pd.testing.assert_frame_equal(
            _canon(got_pdf), _canon(ref), check_dtype=False
        )

    def test_negation_rejected(self, spark, events_pdf, staged):
        st = estimate(events_pdf, CFG.duration, seed=0)
        p = seq(("S00", "S01", "S02"), (), CFG.window, negated=(1,))
        pp = plan_simple(p, st.rates_for(p.types), "TRIVIAL")
        with pytest.raises(ValueError):
            execute_order_plan_streaming(spark, pp, staged)
