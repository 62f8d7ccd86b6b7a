"""DNA sequence substrate: 2-bit codecs, k-mer integer IDs, reverse
complements, canonical forms and edit distance (paper §III / §IV-A)."""

from repro.dna.codec import (  # noqa: F401
    FLIP_BIT,
    NULL_ID,
    NT2BITS,
    BITS2NT,
    canonical,
    canonical_int,
    decode_kmer,
    encode_kmer,
    encode_kmers_batch,
    flip,
    is_contig_id,
    is_flipped,
    make_contig_id,
    rc_int,
    rc_int_batch,
    revcomp,
    unflip,
)
from repro.dna.seq import edit_distance, gc_fraction  # noqa: F401
