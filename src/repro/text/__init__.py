"""Text substrates: tokenisation, bilingual hash embeddings (BERT
stand-in for SENS), and MinHash-LSH (datasketch stand-in for STNS)."""
