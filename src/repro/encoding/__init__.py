"""Privacy encodings: q-grams, phonetic, SLK, Bloom filters, LSH keys, hardening."""
from repro.encoding.bloom import bf_size, bloom_encode, bloom_positions, with_clk
from repro.encoding.hardening import blip, blip_positions, flip_probability
from repro.encoding.hlsh import hlsh_collision_probability, hlsh_keys, sample_positions
from repro.encoding.minhash import band_keys, lsh_collision_probability, minhash_signatures
from repro.encoding.numeric import expected_dice, neighbourhood_tokens
from repro.encoding.phonetic import nysiis, nysiis_py, soundex
from repro.encoding.qgrams import normalize, qgrams, record_tokens, tagged_qgrams
from repro.encoding.slk import hmac_sha256, slk581, slk581_hashed

__all__ = [
    "band_keys", "bf_size", "blip", "blip_positions", "bloom_encode",
    "bloom_positions", "expected_dice", "flip_probability",
    "hlsh_collision_probability", "hlsh_keys", "hmac_sha256",
    "lsh_collision_probability", "minhash_signatures", "neighbourhood_tokens",
    "normalize", "nysiis", "nysiis_py", "qgrams", "record_tokens",
    "sample_positions", "slk581", "slk581_hashed", "soundex", "tagged_qgrams",
    "with_clk",
]
