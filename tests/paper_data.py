"""Table I of the paper, transcribed verbatim (36 five-minute slots,
10:00–12:55), plus helpers to build readings/symbol frames from it.

Used by the worked-example tests: the paper derives D_SEQ (Table III),
the HPG of Fig. 4, the MI example I(K;T)=0.29 and the correlation graph
of Fig. 5 from exactly this data.
"""
import pandas as pd

# One group of 9 slots per sequence window (10:00-10:40, 10:45-11:25,
# 11:30-12:10, 12:15-12:55); 1 = On, 0 = Off.
# fmt: off
TABLE_I = {
    "K": "111100011 000000111 000011100 110011100".replace(" ", ""),
    "T": "011100011 001100111 000011100 110001110".replace(" ", ""),
    "M": "000011100 111011000 110110011 001110011".replace(" ", ""),
    "C": "000011100 110111000 110110011 001110011".replace(" ", ""),
    "I": "000000000 110000011 000000000 110001100".replace(" ", ""),
    "B": "000000011 000000000 110000000 110000011".replace(" ", ""),
}
# fmt: on

N_SLOTS = 36
SEQ_LEN = 9  # 4 sequences of 9 slots = 10:00-10:40, 10:45-11:25, ...


def _check() -> None:
    for var, s in TABLE_I.items():
        assert len(s) == N_SLOTS, (var, len(s))


_check()


def symbols_pandas() -> pd.DataFrame:
    """Long-format symbolic database (var, t, symbol)."""
    rows = [
        (var, t, "On" if ch == "1" else "Off")
        for var, s in TABLE_I.items()
        for t, ch in enumerate(s)
    ]
    return pd.DataFrame(rows, columns=["var", "t", "symbol"])


def readings_pandas() -> pd.DataFrame:
    """Numeric readings whose 0.5-threshold symbolization is Table I."""
    rows = [
        (var, t, 1.0 if ch == "1" else 0.0)
        for var, s in TABLE_I.items()
        for t, ch in enumerate(s)
    ]
    return pd.DataFrame(rows, columns=["var", "t", "value"])
