"""Privacy evaluation: frequency attacks and disclosure metrics."""
from repro.privacy.attack import AttackResult, bf_pattern_col, frequency_attack
from repro.privacy.metrics import EncodingPrivacy, encoding_privacy

__all__ = [
    "AttackResult",
    "EncodingPrivacy",
    "bf_pattern_col",
    "encoding_privacy",
    "frequency_attack",
]
