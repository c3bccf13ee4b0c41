package repro.embed

import repro.util.{Rng, VecOps}

/** Deterministic token → vector hash embeddings.
  *
  * A token's vector is a unit Gaussian sample seeded by `hash(salt ++ token)`;
  * two models with different salts therefore have unrelated spaces, just as
  * two separately pre-trained transformers do. See DESIGN.md §2 for why this
  * substitutes for GPU-hosted pre-trained models.
  */
object Hashing {

  /** Unit Gaussian vector for (salt, key); deterministic. */
  def hashVec(key: String, salt: Long, dim: Int): Array[Double] = {
    val rng = new Rng(Rng.mix(salt, Rng.hashString(key)))
    val v = Array.fill(dim)(rng.nextGaussian())
    VecOps.normalize(v)
  }

  /** Character n-grams of a token with boundary markers (FastText-style). */
  def charNgrams(token: String, minN: Int = 3, maxN: Int = 5): Vector[String] = {
    val padded = s"<$token>"
    val out = Vector.newBuilder[String]
    var n = minN
    while (n <= maxN) {
      var i = 0
      while (i + n <= padded.length) { out += padded.substring(i, i + n); i += 1 }
      n += 1
    }
    val grams = out.result()
    if (grams.isEmpty) Vector(padded) else grams
  }

  /** Mean of n-gram hash vectors — tokens sharing surface prefixes embed close. */
  def ngramVec(token: String, salt: Long, dim: Int): Array[Double] = {
    val grams = charNgrams(token)
    VecOps.normalize(VecOps.mean(grams.map(g => hashVec(g, salt, dim))))
  }
}
