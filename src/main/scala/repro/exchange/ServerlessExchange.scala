package repro.exchange

/** Request totals of one exchange execution, as measured on [[MemS3]]. */
final case class RequestCounts(gets: Long, puts: Long, lists: Long)

/** Final per-worker data plus the measured request complexity. */
final case class ExchangeResult(data: Vector[Array[Long]], requests: RequestCounts)

/** Executable implementations of the paper's S3-based exchange operators
  * (Algorithms 1 and 2, generalized to k levels, with and without write
  * combining — Section 4.4), running against [[MemS3]].
  *
  * Workers form a k-dimensional grid with side length s = P^(1/k). In round
  * i each worker exchanges data within the group of workers that agree with
  * it on every coordinate except dimension i, routing each record to the
  * worker whose dimension-i coordinate matches that of the record's target
  * partition. After k rounds every record sits on the worker owning its
  * partition. k = 1 with s = P degenerates to BasicExchange.
  *
  * Write combining replaces the s per-partition objects of a round with one
  * object per sender whose partition offsets are encoded in the object
  * *name*; receivers LIST the group's prefix and issue ranged GETs
  * (Section 4.4.3, the cheaper offsets-in-name variant).
  */
object ServerlessExchange {

  /** Hash partitioning of a record key onto P partitions. */
  def partitionOf(key: Long, p: Int): Int = (((key % p) + p) % p).toInt

  /** Integer k-th root if exact, else None. */
  def exactRoot(p: Int, k: Int): Option[Int] = {
    require(p >= 1 && k >= 1)
    val s = math.round(math.pow(p.toDouble, 1.0 / k)).toInt
    Iterator(s - 1, s, s + 1).find(c => c >= 1 && BigInt(c).pow(k) == BigInt(p))
  }

  /** Run a k-level exchange. `input(w)` is worker w's local records; the
    * result's `data(w)` holds every record whose partition is w.
    *
    * @param levels          number of exchange levels k (P must be a perfect
    *                        k-th power for k > 1)
    * @param writeCombining  combine each sender's partitions into one object
    * @param numBuckets      buckets to spread objects over (rate-limit trick)
    */
  def run(
      input: Vector[Array[Long]],
      levels: Int,
      writeCombining: Boolean,
      numBuckets: Int = 10,
      s3: MemS3 = new MemS3,
  ): ExchangeResult = {
    val p = input.size
    require(p >= 1, "need at least one worker")
    require(levels >= 1, "need at least one level")
    val s = if (levels == 1) p
            else exactRoot(p, levels).getOrElse(
              throw new IllegalArgumentException(s"P=$p is not a perfect $levels-th power"))

    var state = input
    var shift = 1L
    for (round <- 1 to levels) {
      val coordOf = (id: Int) => ((id / shift) % s).toInt
      val groupOf = (id: Int) => id - coordOf(id) * shift.toInt // canonical representative

      // ---- write phase -------------------------------------------------
      for (w <- 0 until p) {
        val parts = Array.fill(s)(Vector.newBuilder[Long])
        state(w).foreach { rec =>
          parts(coordOf(partitionOf(rec, p))) += rec
        }
        val gid = groupOf(w)
        if (writeCombining) {
          val arrays  = parts.map(_.result().toArray)
          val offsets = arrays.scanLeft(0)(_ + _.length)
          val name    = s"r$round/g$gid/snd-$w-off-${offsets.mkString("_")}"
          s3.put(s"b${gid % numBuckets}", name, arrays.flatten)
        } else {
          for (v <- 0 until s) {
            val receiver = gid + v * shift.toInt
            s3.put(s"b${receiver % numBuckets}",
              s"r$round/snd-$w/rcv-$receiver", parts(v).result().toArray)
          }
        }
      }

      // ---- read phase --------------------------------------------------
      // Offset vectors are encoded in object names; every receiver in a
      // group parses the same names, so cache the parse (a pure driver-side
      // computation — request counts are unaffected).
      val offsetCache = scala.collection.mutable.HashMap.empty[String, Array[Int]]
      val next = Vector.tabulate(p) { w =>
        val gid = groupOf(w)
        val myCoord = coordOf(w)
        if (writeCombining) {
          val names = s3.list(s"b${gid % numBuckets}", s"r$round/g$gid/snd-")
          names.iterator.flatMap { name =>
            val off = offsetCache.getOrElseUpdate(name,
              name.substring(name.indexOf("-off-") + 5).split('_').map(_.toInt))
            val sender = name.substring(name.indexOf("snd-") + 4, name.indexOf("-off-")).toInt
            require(sender >= 0 && sender < p, s"bad sender in $name")
            s3.getRange(s"b${gid % numBuckets}", name, off(myCoord), off(myCoord + 1))
              .getOrElse(Array.empty[Long])
          }.toArray
        } else {
          (0 until s).iterator.flatMap { v =>
            val sender = gid + v * shift.toInt
            s3.get(s"b${w % numBuckets}", s"r$round/snd-$sender/rcv-$w")
              .getOrElse(throw new IllegalStateException(s"missing file from $sender to $w"))
          }.toArray
        }
      }
      state = next
      shift *= s
    }

    ExchangeResult(state,
      RequestCounts(s3.getCount.get(), s3.putCount.get(), s3.listCount.get()))
  }

  /** Ground truth: records grouped by their hash partition. */
  def expectedPlacement(input: Vector[Array[Long]], p: Int): Vector[Vector[Long]] = {
    val all = input.flatten
    Vector.tabulate(p)(w => all.filter(partitionOf(_, p) == w).sorted)
  }
}
